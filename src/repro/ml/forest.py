"""Random forests (bagging + per-split feature sub-sampling) on the CART trees.

The paper's best model for both the access predictor (§IV-C, F1 > 0.96) and
COMPREDICT (§V, Tables V–VI).
"""
from __future__ import annotations

import numpy as np

from repro.ml.tree import DecisionTreeClassifier, DecisionTreeRegressor


class _BaseForest:
    def __init__(
        self,
        n_estimators: int = 100,
        *,
        max_depth: int = 12,
        min_samples_leaf: int = 1,
        max_features: int | float | None = "sqrt",
        random_state: int = 0,
    ):
        self.n_estimators = n_estimators
        self.max_depth = max_depth
        self.min_samples_leaf = min_samples_leaf
        self.max_features = max_features
        self.random_state = random_state
        self.trees_: list = []

    def _resolve_max_features(self, d: int):
        if self.max_features == "sqrt":
            return max(1, int(np.sqrt(d)))
        return self.max_features

    def _bootstrap(self, rng: np.random.Generator, n: int) -> np.ndarray:
        return rng.integers(0, n, size=n)


class RandomForestRegressor(_BaseForest):
    """Mean-of-trees regressor."""

    def fit(self, X, y) -> "RandomForestRegressor":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y, dtype=float).ravel()
        rng = np.random.default_rng(self.random_state)
        mf = self._resolve_max_features(X.shape[1])
        self.trees_ = []
        for i in range(self.n_estimators):
            idx = self._bootstrap(rng, len(y))
            t = DecisionTreeRegressor(
                max_depth=self.max_depth,
                min_samples_leaf=self.min_samples_leaf,
                max_features=mf,
                random_state=self.random_state * 7919 + i,
            ).fit(X[idx], y[idx])
            self.trees_.append(t)
        return self

    def predict(self, X) -> np.ndarray:
        X = np.asarray(X, dtype=float)
        return np.mean([t.predict(X) for t in self.trees_], axis=0)


class RandomForestClassifier(_BaseForest):
    """Probability-averaging classifier."""

    def fit(self, X, y) -> "RandomForestClassifier":
        X = np.asarray(X, dtype=float)
        y = np.asarray(y)
        self.classes_ = np.unique(y)
        rng = np.random.default_rng(self.random_state)
        mf = self._resolve_max_features(X.shape[1])
        self.trees_ = []
        for i in range(self.n_estimators):
            idx = self._bootstrap(rng, len(y))
            # Resample until the bootstrap contains every class so that
            # per-tree probability vectors align with self.classes_.
            tries = 0
            while len(np.unique(y[idx])) < len(self.classes_) and tries < 50:
                idx = self._bootstrap(rng, len(y))
                tries += 1
            t = DecisionTreeClassifier(
                max_depth=self.max_depth,
                min_samples_leaf=self.min_samples_leaf,
                max_features=mf,
                random_state=self.random_state * 7919 + i,
            ).fit(X[idx], y[idx])
            self.trees_.append(t)
        return self

    def predict_proba(self, X) -> np.ndarray:
        X = np.asarray(X, dtype=float)
        probs = np.zeros((len(X), len(self.classes_)))
        for t in self.trees_:
            p = t.predict_proba(X)
            # Map tree-local class order onto the forest's class order.
            col = {c: j for j, c in enumerate(t.classes_)}
            for j, c in enumerate(self.classes_):
                if c in col:
                    probs[:, j] += p[:, col[c]]
        return probs / len(self.trees_)

    def predict(self, X) -> np.ndarray:
        return self.classes_[np.argmax(self.predict_proba(X), axis=1)]
