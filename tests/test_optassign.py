"""OPTASSIGN: Spark job vs numpy twin vs exact ILP (Theorem 3), capacity repair."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import cost_model as cm
from repro.core import optassign as oa
from repro.core.ilp import PartitionSpec, SchemePrediction, solve_optassign_exact


def _parts(n, seed=0, with_extras=False):
    g = np.random.default_rng(seed)
    df = pd.DataFrame(
        {
            "pid": [f"p{i}" for i in range(n)],
            "span_gb": g.uniform(0.5, 20, n).round(3),
            "accesses": g.integers(0, 200, n).astype(float),
        }
    )
    if with_extras:
        df["latency_threshold"] = np.where(g.random(n) < 0.3, 1.0, np.inf)
        df["current_tier"] = np.where(g.random(n) < 0.5, "hot", None)
    return df


def _preds(pids, seed=0):
    g = np.random.default_rng(seed)
    rows = []
    for pid in pids:
        for s, base in [("parquet+gzip", 3.0), ("parquet+snappy", 2.0)]:
            rows.append(
                {
                    "pid": pid,
                    "scheme": s,
                    "ratio": base + g.random(),
                    "decomp_sec_per_gb": g.uniform(0.5, 5.0),
                }
            )
    return pd.DataFrame(rows)


def _to_specs(parts, preds):
    specs, pred_map = [], {}
    for r in parts.itertuples(index=False):
        specs.append(
            PartitionSpec(
                r.pid,
                r.span_gb,
                r.accesses,
                getattr(r, "latency_threshold", float("inf")),
                getattr(r, "current_tier", None),
            )
        )
    if preds is not None:
        for r in preds.itertuples(index=False):
            pred_map.setdefault(r.pid, []).append(
                SchemePrediction(r.scheme, r.ratio, r.decomp_sec_per_gb)
            )
    return specs, pred_map


class TestGreedyVsExact:
    """Theorem 3: with no capacity bounds the greedy is optimal."""

    @pytest.mark.parametrize("seed", range(6))
    def test_numpy_greedy_matches_exact(self, seed):
        parts = _parts(6, seed=seed, with_extras=True)
        preds = _preds(parts["pid"], seed=seed)
        tiers = cm.make_tiers()
        got = oa.greedy_assign_numpy(parts, preds, tiers, months=3.0)
        specs, pred_map = _to_specs(parts, preds)
        _, exact_cost = solve_optassign_exact(specs, tiers, pred_map, months=3.0)
        assert got["weighted_cost"].sum() == pytest.approx(exact_cost, rel=1e-9)

    @given(st.integers(0, 10_000), st.floats(1.0, 12.0))
    @settings(max_examples=20, deadline=None)
    def test_greedy_optimal_property(self, seed, months):
        parts = _parts(5, seed=seed)
        preds = _preds(parts["pid"], seed=seed)
        tiers = cm.make_tiers()
        got = oa.greedy_assign_numpy(parts, preds, tiers, months=months)
        specs, pred_map = _to_specs(parts, preds)
        _, exact_cost = solve_optassign_exact(specs, tiers, pred_map, months=months)
        assert got["weighted_cost"].sum() == pytest.approx(exact_cost, rel=1e-9)


class TestCandidates:
    def test_latency_constraint_applied(self):
        parts = pd.DataFrame(
            {"pid": ["p"], "span_gb": [1.0], "accesses": [0.0],
             "latency_threshold": [1.0]}
        )
        cand = oa.candidate_frame_numpy(parts, None, cm.make_tiers(), months=12.0)
        assert "archive" not in set(cand["tier"])

    def test_archive_residency_short_horizon(self):
        parts = pd.DataFrame({"pid": ["p"], "span_gb": [1.0], "accesses": [0.0]})
        cand = oa.candidate_frame_numpy(parts, None, cm.make_tiers(), months=2.0)
        assert "archive" not in set(cand["tier"])
        cand6 = oa.candidate_frame_numpy(parts, None, cm.make_tiers(), months=6.0)
        assert "archive" in set(cand6["tier"])

    def test_fixed_scheme_restricts(self):
        parts = pd.DataFrame(
            {"pid": ["p"], "span_gb": [1.0], "accesses": [0.0],
             "fixed_scheme": ["parquet+gzip"]}
        )
        preds = pd.DataFrame(
            [{"pid": "p", "scheme": "parquet+gzip", "ratio": 2.0,
              "decomp_sec_per_gb": 0.1},
             {"pid": "p", "scheme": "csv+gzip", "ratio": 3.0,
              "decomp_sec_per_gb": 0.1}]
        )
        cand = oa.candidate_frame_numpy(parts, preds, cm.make_tiers(("hot",)), months=1.0)
        assert set(cand["scheme"]) == {"parquet+gzip"}

    def test_transfer_cost_zero_on_same_tier(self):
        parts = pd.DataFrame(
            {"pid": ["p"], "span_gb": [2.0], "accesses": [0.0],
             "current_tier": ["hot"]}
        )
        cand = oa.candidate_frame_numpy(parts, None, cm.make_tiers(), months=1.0)
        hot = cand[cand["tier"] == "hot"].iloc[0]
        cool = cand[cand["tier"] == "cool"].iloc[0]
        assert hot["transfer_cost"] == 0.0
        assert cool["transfer_cost"] == pytest.approx(
            (cm.READ_COST["hot"] + cm.WRITE_COST["cool"]) * 2.0
        )

    def test_infeasible_partition_raises(self):
        parts = pd.DataFrame(
            {"pid": ["p"], "span_gb": [1.0], "accesses": [0.0],
             "latency_threshold": [0.0001]}
        )
        with pytest.raises(ValueError):
            oa.greedy_assign_numpy(parts, None, cm.make_tiers(), months=1.0)


class TestSparkJob:
    """The DataFrame implementation agrees with the numpy twin row-for-row."""

    @pytest.mark.parametrize("seed", [0, 1])
    def test_spark_matches_numpy(self, spark, seed):
        parts = _parts(12, seed=seed)
        preds = _preds(parts["pid"], seed=seed)
        tiers = cm.make_tiers()
        want = oa.greedy_assign_numpy(parts, preds, tiers, months=4.0)
        got = (
            oa.greedy_assign(
                spark,
                spark.createDataFrame(parts),
                spark.createDataFrame(preds),
                tiers,
                months=4.0,
            )
            .toPandas()
            .sort_values("pid", ignore_index=True)
        )
        want = want.sort_values("pid", ignore_index=True)
        assert got["tier"].tolist() == want["tier"].tolist()
        assert got["scheme"].tolist() == want["scheme"].tolist()
        np.testing.assert_allclose(got["weighted_cost"], want["weighted_cost"])

    def test_spark_k0_tiering_only(self, spark):
        parts = _parts(5, seed=3)
        tiers = cm.make_tiers(("hot", "cool"))
        got = oa.greedy_assign(
            spark, spark.createDataFrame(parts), None, tiers, months=2.0
        ).toPandas()
        assert set(got["scheme"]) == {"none"}
        assert len(got) == 5


class TestCapacityRepair:
    def test_respects_capacity(self):
        parts = pd.DataFrame(
            {
                "pid": [f"p{i}" for i in range(6)],
                "span_gb": [10.0] * 6,
                "accesses": [1000.0] * 6,
            }
        )
        tiers = [
            cm.Tier("premium", 15.0, 0.004659, 0.009318, 0.0053, capacity_gb=20.0),
            cm.Tier("hot", 2.08, 0.01331, 0.02662, 0.0614, capacity_gb=30.0),
            cm.Tier("cool", 1.52, 0.0333, 0.0666, 0.0614, capacity_gb=float("inf")),
        ]
        got = oa.assign_with_capacity(parts, None, tiers, months=1.0)
        usage = got.groupby("tier")["stored_gb"].sum()
        assert usage.get("premium", 0.0) <= 20.0 + 1e-9
        assert usage.get("hot", 0.0) <= 30.0 + 1e-9
        assert len(got) == 6

    def test_noop_when_capacity_loose(self):
        parts = _parts(6, seed=5)
        tiers = cm.make_tiers()
        free = oa.greedy_assign_numpy(parts, None, tiers, months=2.0)
        capped = oa.assign_with_capacity(parts, None, tiers, months=2.0)
        pd.testing.assert_frame_equal(
            free.sort_values("pid", ignore_index=True),
            capped.sort_values("pid", ignore_index=True),
        )

    def test_matches_exact_on_small_instance(self):
        """Repair finds the optimum here (one eviction needed)."""
        parts = pd.DataFrame(
            {
                "pid": ["a", "b"],
                "span_gb": [10.0, 10.0],
                "accesses": [500.0, 100.0],
            }
        )
        tiers = [
            cm.Tier("premium", 15.0, 0.004659, 0.009318, 0.0053, capacity_gb=10.0),
            cm.Tier("cool", 1.52, 0.0333, 0.0666, 0.0614, capacity_gb=float("inf")),
        ]
        got = oa.assign_with_capacity(parts, None, tiers, months=1.0)
        specs, _ = _to_specs(parts, None)
        exact, exact_cost = solve_optassign_exact(specs, tiers, {}, months=1.0)
        assert got["weighted_cost"].sum() == pytest.approx(exact_cost, rel=1e-9)

    def test_unrepairable_raises(self):
        parts = pd.DataFrame({"pid": ["p"], "span_gb": [100.0], "accesses": [0.0]})
        tiers = [cm.Tier("hot", 2.08, 0.013, 0.026, 0.06, capacity_gb=1.0)]
        with pytest.raises(ValueError):
            oa.assign_with_capacity(parts, None, tiers, months=1.0)
