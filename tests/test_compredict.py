"""COMPREDICT: weighted-entropy features (pandas + Spark), samples, models."""
import numpy as np
import pandas as pd
import pytest

from repro.core import compredict as cp


@pytest.fixture(scope="module")
def frame():
    g = np.random.default_rng(0)
    return pd.DataFrame(
        {
            "i": g.integers(0, 9, 300),
            "x": (g.integers(0, 4, 300) * 0.25),
            "s": g.choice(["aa", "bbbb", "cccccc"], 300),
            "t": pd.to_datetime("2020-01-01")
            + pd.to_timedelta(g.integers(0, 5, 300), unit="D"),
        }
    )


class TestDtypeClasses:
    @pytest.mark.parametrize(
        "values,cls",
        [
            (pd.Series([1, 2], dtype="int64"), "int"),
            (pd.Series([1.5]), "float"),
            (pd.Series(["a"]), "object"),
            (pd.Series(pd.to_datetime(["2020-01-01"])), "datetime"),
            (pd.Series([True, False]), "int"),
        ],
    )
    def test_mapping(self, values, cls):
        assert cp.dtype_class(values.dtype) == cls


class TestWeightedEntropy:
    def test_feature_layout_fixed(self, frame):
        feats = cp.weighted_entropy_pandas(frame)
        assert set(feats) == set(cp.ENTROPY_FEATURES)

    def test_absent_class_zero(self):
        feats = cp.weighted_entropy_pandas(pd.DataFrame({"a": [1, 2, 3]}))
        assert feats["H_object"] == 0.0
        assert feats["H_int"] > 0.0

    def test_constant_column_zero_entropy(self):
        feats = cp.weighted_entropy_pandas(pd.DataFrame({"s": ["xx"] * 50}))
        assert feats["H_object"] == pytest.approx(0.0)

    def test_definition_by_hand(self):
        """H(P,d) = -Σ len(s)·pr(s)·log pr(s) on a 2-value column."""
        pdf = pd.DataFrame({"s": ["ab"] * 3 + ["cdef"] * 1})
        feats = cp.weighted_entropy_pandas(pdf)
        expected = -(2 * 0.75 * np.log(0.75) + 4 * 0.25 * np.log(0.25))
        assert feats["H_object"] == pytest.approx(expected)

    def test_more_repetition_lower_entropy(self):
        uniform = pd.DataFrame({"s": [f"v{i:04d}" for i in range(256)]})
        skewed = pd.DataFrame({"s": ["v0000"] * 255 + ["v0001"]})
        hu = cp.weighted_entropy_pandas(uniform)["H_object"]
        hs = cp.weighted_entropy_pandas(skewed)["H_object"]
        assert hs < hu

    def test_pools_columns_of_same_class(self):
        a = cp.weighted_entropy_pandas(pd.DataFrame({"x": ["a", "b"], "y": ["a", "b"]}))
        b = cp.weighted_entropy_pandas(pd.DataFrame({"x": ["a", "b", "a", "b"]}))
        assert a["H_object"] == pytest.approx(b["H_object"])

    def test_spark_matches_pandas(self, spark, frame):
        got = cp.weighted_entropy_spark(spark.createDataFrame(frame))
        want = cp.weighted_entropy_pandas(frame)
        for k in cp.ENTROPY_FEATURES:
            assert got[k] == pytest.approx(want[k], rel=1e-9), k


class TestSamples:
    def test_random_samples_deterministic(self, frame):
        a = cp.random_row_samples(frame, n_samples=4, seed=1)
        b = cp.random_row_samples(frame, n_samples=4, seed=1)
        assert all(x.equals(y) for x, y in zip(a, b))

    def test_random_samples_sizes(self, frame):
        samples = cp.random_row_samples(frame, n_samples=10, seed=0)
        assert all(1 <= len(s) <= len(frame) for s in samples)

    def test_featurize_sample(self, frame):
        rec = cp.featurize_sample(frame, ("csv+gzip",), repeats=1)
        assert rec.n_rows == len(frame)
        assert rec.size_mb > 0
        assert "csv+gzip" in rec.truth

    def test_build_dataset_columns(self, frame):
        recs = [cp.featurize_sample(frame.head(n), ("csv+gzip", "csv+snappy"), repeats=1)
                for n in (50, 100)]
        ds = cp.build_dataset(recs, ("csv+gzip", "csv+snappy"))
        assert len(ds) == 2
        for col in ("ratio_csv+gzip", "dsec_csv+gzip", "ratio_csv+snappy",
                    "size_mb", "n_rows", *cp.ENTROPY_FEATURES):
            assert col in ds.columns


class TestTrainEval:
    @pytest.fixture(scope="class")
    def dataset(self, frame):
        g = np.random.default_rng(1)
        recs = []
        for _ in range(30):
            n = int(g.integers(40, 300))
            recs.append(cp.featurize_sample(frame.head(n), ("csv+gzip",), repeats=1))
        return cp.build_dataset(recs, ("csv+gzip",))

    def test_models_beat_averaging(self, dataset):
        feats = cp.ENTROPY_FEATURES + ("size_mb",)
        base = cp.train_eval(
            dataset, target="ratio_csv+gzip", features=feats,
            model_factory=cp.MODEL_FACTORIES["Averaging"],
        )
        rf = cp.train_eval(
            dataset, target="ratio_csv+gzip", features=feats,
            model_factory=cp.MODEL_FACTORIES["Random Forest"],
        )
        assert rf["MAE"] <= base["MAE"]

    def test_metrics_keys(self, dataset):
        out = cp.train_eval(
            dataset, target="ratio_csv+gzip",
            features=cp.ENTROPY_FEATURES,
            model_factory=cp.MODEL_FACTORIES["SVR"],
        )
        assert set(out) == {"MAE", "MAPE", "R2"}

    def test_predictions_frame_schema(self, dataset):
        pids = [f"p{i}" for i in range(len(dataset))]
        preds = cp.predictions_frame(dataset, pids, ("csv+gzip",))
        assert set(preds.columns) == {"pid", "scheme", "ratio", "decomp_sec_per_gb"}
        assert len(preds) == len(dataset)
        assert (preds["ratio"] > 0).all()
        assert (preds["decomp_sec_per_gb"] >= 0).all()
