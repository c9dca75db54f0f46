"""From-scratch numpy ML substrate (no sklearn/xgboost offline).

Implements the model families the paper evaluates for COMPREDICT (§V) and
the access predictor (§IV-C): decision trees, random forests, gradient
boosted trees, a linear model, and a small MLP, plus the reported metrics.
"""
from repro.ml.metrics import mae, mape, r2, f1_score, confusion_matrix  # noqa: F401
from repro.ml.tree import DecisionTreeRegressor, DecisionTreeClassifier  # noqa: F401
from repro.ml.forest import RandomForestRegressor, RandomForestClassifier  # noqa: F401
from repro.ml.gbt import GradientBoostedTreesRegressor  # noqa: F401
from repro.ml.linear import RidgeRegressor  # noqa: F401
from repro.ml.mlp import MLPRegressor  # noqa: F401
