"""Hungarian matching and the equal-size special case (Theorem 2)."""
import itertools
import math

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import cost_model as cm
from repro.core.ilp import PartitionSpec, solve_optassign_exact
from repro.core.matching import (
    InfeasibleMatching,
    assign_equal_partitions,
    min_cost_matching,
)


def _brute_force(cost: np.ndarray) -> float:
    n, m = cost.shape
    best = math.inf
    for perm in itertools.permutations(range(m), n):
        tot = sum(cost[i, j] for i, j in enumerate(perm))
        best = min(best, tot)
    return best


class TestMinCostMatching:
    def test_identity_instance(self):
        cost = np.array([[1.0, 10.0], [10.0, 1.0]])
        col, tot = min_cost_matching(cost)
        assert list(col) == [0, 1]
        assert tot == 2.0

    def test_antidiagonal(self):
        cost = np.array([[10.0, 1.0], [1.0, 10.0]])
        col, tot = min_cost_matching(cost)
        assert list(col) == [1, 0]
        assert tot == 2.0

    def test_rectangular_uses_cheapest_columns(self):
        cost = np.array([[5.0, 1.0, 9.0]])
        col, tot = min_cost_matching(cost)
        assert list(col) == [1]
        assert tot == 1.0

    def test_forbidden_edges_respected(self):
        cost = np.array([[math.inf, 2.0], [3.0, math.inf]])
        col, tot = min_cost_matching(cost)
        assert list(col) == [1, 0]
        assert tot == 5.0

    def test_infeasible_raises(self):
        cost = np.array([[math.inf, math.inf], [1.0, 1.0]])
        with pytest.raises(InfeasibleMatching):
            min_cost_matching(cost)

    def test_rows_exceed_columns_rejected(self):
        with pytest.raises(ValueError):
            min_cost_matching(np.zeros((3, 2)))

    @given(
        st.integers(2, 5),
        st.integers(0, 3),
        st.integers(0, 10_000),
    )
    @settings(max_examples=40, deadline=None)
    def test_matches_brute_force(self, n, extra, seed):
        g = np.random.default_rng(seed)
        cost = g.random((n, n + extra)) * 10
        _, tot = min_cost_matching(cost)
        assert tot == pytest.approx(_brute_force(cost))

    def test_duplicate_weights_still_optimal(self):
        cost = np.ones((3, 3))
        _, tot = min_cost_matching(cost)
        assert tot == 3.0


class TestTheorem2:
    """Equal-size / no-compression assignment == exact ILP optimum."""

    def _exact(self, n, span, accesses, thresholds, tiers, months):
        parts = [
            PartitionSpec(f"p{i}", span, accesses[i], thresholds[i])
            for i in range(n)
        ]
        assign, cost = solve_optassign_exact(
            parts, tiers, {}, months=months,
            weights=cm.CostWeights(), enforce_archive_residency=False,
        )
        return cost

    @pytest.mark.parametrize("seed", range(5))
    def test_matches_exact_ilp(self, seed):
        g = np.random.default_rng(seed)
        n, span, months = 5, 2.0, 3.0
        accesses = list(g.integers(0, 50, n).astype(float))
        thresholds = [float("inf")] * n
        # Capacities sized so each tier holds a few (but not all) partitions.
        tiers = cm.make_tiers(("premium", "hot", "cool"), total_gb=4 * n * span)
        got_tiers, got = assign_equal_partitions(
            n_partitions=n, span_gb=span, accesses=accesses,
            latency_thresholds=thresholds, tiers=tiers, months=months,
        )
        assert len(got_tiers) == n
        assert got == pytest.approx(
            self._exact(n, span, accesses, thresholds, tiers, months), rel=1e-9
        )

    def test_latency_threshold_excludes_slow_tiers(self):
        tiers = cm.make_tiers(("hot", "archive"))
        got_tiers, _ = assign_equal_partitions(
            n_partitions=2, span_gb=1.0, accesses=[0.0, 0.0],
            latency_thresholds=[1.0, 1.0], tiers=tiers, months=12.0,
        )
        assert got_tiers == ["hot", "hot"]  # archive TTFB 3600 > 1s

    def test_capacity_limits_copies(self):
        """Z_l copies per tier bound assignments to that tier."""
        tiers = [
            cm.Tier("hot", 2.08, 0.01331, 0.02662, 0.06, capacity_gb=2.0),
            cm.Tier("cool", 1.52, 0.0333, 0.0666, 0.06, capacity_gb=float("inf")),
        ]
        got_tiers, _ = assign_equal_partitions(
            n_partitions=4, span_gb=1.0, accesses=[100.0] * 4,
            latency_thresholds=[float("inf")] * 4, tiers=tiers, months=1.0,
        )
        # All want hot (heavy reads), but only 2 copies exist.
        assert got_tiers.count("hot") == 2
        assert got_tiers.count("cool") == 2

    def test_total_capacity_too_small_raises(self):
        tiers = [cm.Tier("hot", 2.08, 0.01331, 0.02662, 0.06, capacity_gb=1.0)]
        with pytest.raises(InfeasibleMatching):
            assign_equal_partitions(
                n_partitions=3, span_gb=1.0, accesses=[0.0] * 3,
                latency_thresholds=[float("inf")] * 3, tiers=tiers, months=1.0,
            )

    def test_input_length_validated(self):
        with pytest.raises(ValueError):
            assign_equal_partitions(
                n_partitions=2, span_gb=1.0, accesses=[1.0],
                latency_thresholds=[1.0], tiers=cm.make_tiers(), months=1.0,
            )
