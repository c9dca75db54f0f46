"""COMPREDICT (§V): predict compression ratio & decompression speed.

Feature: per-datatype **weighted entropy**
``H(P, d) = -Σ_s len(s) · pr(s) · log pr(s)`` over the string renderings of
all values in columns of datatype class ``d`` (int / float / object /
datetime), capturing how much repetition a codec can exploit. Computed two
ways — a Spark aggregation for large partitions and a vectorised pandas
path for query-result samples — tested for equality.

Training data: **query-result samples** (the paper's key finding is that
random row samples misrepresent what is actually read) labelled with ground
truth from :mod:`repro.storage.codecs`. Models from :mod:`repro.ml`.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Iterable

import numpy as np
import pandas as pd
from pandas.api import types as ptypes
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.ml import (
    GradientBoostedTreesRegressor,
    MLPRegressor,
    RandomForestRegressor,
    RidgeRegressor,
    mae,
    mape,
    r2,
)
from repro.storage import codecs

#: Fixed datatype classes so feature vectors have a constant layout.
DTYPE_CLASSES = ("int", "float", "object", "datetime")
ENTROPY_FEATURES = tuple(f"H_{d}" for d in DTYPE_CLASSES)
SIZE_FEATURES = ("size_mb", "n_rows")


def dtype_class(dtype) -> str:
    """Map a pandas/Spark dtype to the paper's datatype buckets."""
    if ptypes.is_datetime64_any_dtype(dtype):
        return "datetime"
    if ptypes.is_bool_dtype(dtype):
        return "int"
    if ptypes.is_integer_dtype(dtype):
        return "int"
    if ptypes.is_float_dtype(dtype):
        return "float"
    return "object"


def _entropy_of_counts(values: pd.Series, counts: np.ndarray) -> float:
    pr = counts / counts.sum()
    lens = values.astype(str).str.len().to_numpy()
    return float(-(lens * pr * np.log(pr)).sum())


def weighted_entropy_pandas(pdf: pd.DataFrame) -> dict[str, float]:
    """H(P, d) for each datatype class present; absent classes get 0."""
    feats = {f: 0.0 for f in ENTROPY_FEATURES}
    by_class: dict[str, list[pd.Series]] = {}
    for col in pdf.columns:
        cls = dtype_class(pdf[col].dtype)
        if cls == "datetime":
            # Match the Spark path's 'yyyy-MM-dd HH:mm:ss' rendering.
            rendered = pdf[col].dt.strftime("%Y-%m-%d %H:%M:%S")
        else:
            rendered = pdf[col].astype(str)
        by_class.setdefault(cls, []).append(rendered)
    for d, cols in by_class.items():
        pooled = pd.concat(cols, ignore_index=True)
        vc = pooled.value_counts()
        feats[f"H_{d}"] = _entropy_of_counts(vc.index.to_series(), vc.to_numpy())
    return feats


_SPARK_CLASS = {
    T.IntegerType: "int",
    T.LongType: "int",
    T.ShortType: "int",
    T.ByteType: "int",
    T.BooleanType: "int",
    T.FloatType: "float",
    T.DoubleType: "float",
    T.TimestampType: "datetime",
    T.DateType: "datetime",
}


def weighted_entropy_spark(df: DataFrame) -> dict[str, float]:
    """Distributed H(P, d): per class, stack columns (cast to string), count
    values, and aggregate ``-Σ len·pr·log pr`` with Catalyst expressions.

    Datetime columns are rendered via pandas-compatible str() casts so the
    two paths agree byte-for-byte (tested).
    """
    feats = {f: 0.0 for f in ENTROPY_FEATURES}
    by_class: dict[str, list[str]] = {}
    for f_ in df.schema.fields:
        cls = _SPARK_CLASS.get(type(f_.dataType), "object")
        if isinstance(f_.dataType, T.DecimalType):
            cls = "float"
        by_class.setdefault(cls, []).append(f_.name)
    for d, cols in by_class.items():
        stacked = None
        for c in cols:
            if d == "datetime":
                # pandas str() of datetime64 gives 'YYYY-MM-DD HH:MM:SS'.
                col = F.date_format(F.col(c), "yyyy-MM-dd HH:mm:ss")
            elif d == "float":
                # pandas str() of float: repr with trailing .0 etc. Cast via
                # double -> string matches for round values produced here.
                col = F.col(c).cast("string")
            else:
                col = F.col(c).cast("string")
            part = df.select(col.alias("v"))
            stacked = part if stacked is None else stacked.unionByName(part)
        counts = stacked.groupBy("v").agg(F.count("*").alias("c"))
        row = (
            counts.withColumn("total", F.sum("c").over(Window_all()))
            .withColumn("pr", F.col("c") / F.col("total"))
            .agg(
                (-F.sum(F.length("v") * F.col("pr") * F.log(F.col("pr")))).alias("H")
            )
            .collect()[0]
        )
        feats[f"H_{d}"] = float(row["H"] or 0.0)
    return feats


def Window_all():
    """An unpartitioned window (single total) — tiny result sets only."""
    from pyspark.sql.window import Window

    return Window.partitionBy(F.lit(1))


# --------------------------------------------------------------------------
# Samples
# --------------------------------------------------------------------------
def random_row_samples(
    pdf: pd.DataFrame, *, n_samples: int, seed: int = 0, min_frac: float = 0.02
) -> list[pd.DataFrame]:
    """The baseline the paper criticises: uniformly random row subsets."""
    g = np.random.default_rng(seed)
    out = []
    for _ in range(n_samples):
        frac = g.uniform(min_frac, 1.0)
        n = max(1, int(len(pdf) * frac))
        out.append(pdf.iloc[g.choice(len(pdf), size=n, replace=False)].reset_index(drop=True))
    return out


@dataclass
class SampleRecord:
    """One training example: a sample partition + features + ground truth."""

    features: dict[str, float]
    size_mb: float
    n_rows: int
    truth: dict[str, codecs.CompressionMeasurement]


def featurize_sample(
    pdf: pd.DataFrame,
    schemes: Iterable[str],
    *,
    repeats: int = 2,
) -> SampleRecord:
    """Compute weighted-entropy features + ground-truth labels for a sample."""
    feats = weighted_entropy_pandas(pdf)
    raw = codecs.csv_bytes(pdf)
    return SampleRecord(
        features=feats,
        size_mb=len(raw) / 2**20,
        n_rows=len(pdf),
        truth={s: codecs.measure(pdf, s, repeats=repeats) for s in schemes},
    )


def build_dataset(records: list[SampleRecord], schemes: Iterable[str]) -> pd.DataFrame:
    """Flatten SampleRecords into a model-ready frame.

    Columns: entropy features, size features, and per scheme
    ``ratio_<scheme>`` / ``dsec_<scheme>`` (decompression sec/GB) targets.
    """
    rows = []
    for r in records:
        row = dict(r.features)
        row["size_mb"] = r.size_mb
        row["n_rows"] = r.n_rows
        for s in schemes:
            m = r.truth[s]
            row[f"ratio_{s}"] = m.ratio
            row[f"dsec_{s}"] = m.decomp_sec_per_gb
        rows.append(row)
    return pd.DataFrame(rows)


# --------------------------------------------------------------------------
# Models & evaluation
# --------------------------------------------------------------------------
class AveragingModel:
    """The naive baseline: always predict the training mean."""

    def fit(self, X, y):
        self.mean_ = float(np.mean(y))
        return self

    def predict(self, X):
        return np.full(len(X), self.mean_)


#: Paper-model name -> constructor, with documented substitutions (DESIGN.md).
MODEL_FACTORIES: dict[str, Callable[[], object]] = {
    "Averaging": AveragingModel,
    "XGBoost": lambda: GradientBoostedTreesRegressor(
        n_estimators=200, learning_rate=0.1, max_depth=3, random_state=0
    ),
    "Neural Network": lambda: MLPRegressor(hidden=(64, 32), epochs=400, random_state=0),
    "SVR": lambda: RidgeRegressor(alpha=1.0),
    "Random Forest": lambda: RandomForestRegressor(
        n_estimators=60, max_depth=12, max_features=None, min_samples_leaf=1,
        random_state=0,
    ),
}


def train_eval(
    dataset: pd.DataFrame,
    *,
    target: str,
    features: tuple[str, ...],
    model_factory: Callable[[], object],
    test_frac: float = 0.3,
    seed: int = 0,
) -> dict[str, float]:
    """Shuffled train/test split, fit, and the paper's metrics (MAE/MAPE/R²)."""
    g = np.random.default_rng(seed)
    idx = g.permutation(len(dataset))
    n_test = max(1, int(len(dataset) * test_frac))
    test, train = idx[:n_test], idx[n_test:]
    X = dataset[list(features)].to_numpy(dtype=float)
    y = dataset[target].to_numpy(dtype=float)
    model = model_factory().fit(X[train], y[train])
    pred = model.predict(X[test])
    return {
        "MAE": mae(y[test], pred),
        "MAPE": mape(y[test], pred),
        "R2": r2(y[test], pred),
    }


def predictions_frame(
    dataset: pd.DataFrame,
    partition_ids: list[str],
    schemes: Iterable[str],
    *,
    features: tuple[str, ...] = ENTROPY_FEATURES + ("size_mb",),
    model_factory: Callable[[], object] = MODEL_FACTORIES["Random Forest"],
    train_dataset: pd.DataFrame | None = None,
) -> pd.DataFrame:
    """Fit one model per (scheme, target) and emit OPTASSIGN's predictions
    table: (pid, scheme, ratio, decomp_sec_per_gb) for every row in
    ``dataset`` (aligned with ``partition_ids``)."""
    train = train_dataset if train_dataset is not None else dataset
    X_tr = train[list(features)].to_numpy(dtype=float)
    X = dataset[list(features)].to_numpy(dtype=float)
    rows = []
    for s in schemes:
        rm = model_factory().fit(X_tr, train[f"ratio_{s}"].to_numpy(dtype=float))
        dm = model_factory().fit(X_tr, train[f"dsec_{s}"].to_numpy(dtype=float))
        ratios = np.maximum(rm.predict(X), 1e-6)
        dsecs = np.maximum(dm.predict(X), 0.0)
        for pid, ratio, dsec in zip(partition_ids, ratios, dsecs):
            rows.append(
                {"pid": pid, "scheme": s, "ratio": float(ratio),
                 "decomp_sec_per_gb": float(dsec)}
            )
    return pd.DataFrame(rows)
