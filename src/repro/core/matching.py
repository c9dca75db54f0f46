"""Min-weight bipartite matching — the equal-size / no-compression special
case of OPTASSIGN (§IV-B.1, Theorem 2).

Implements the Hungarian method with potentials and shortest augmenting
paths (Jonker–Volgenant formulation), O(n²m) for an n x m cost matrix with
n <= m. ``float('inf')`` entries are forbidden edges (latency-infeasible
tier copies); an instance with no feasible perfect matching on the rows
raises ``InfeasibleMatching``.
"""
from __future__ import annotations

import math

import numpy as np

from repro.core import cost_model as cm


class InfeasibleMatching(ValueError):
    """No perfect matching exists on the row side (all rows must be placed)."""


def min_cost_matching(cost: np.ndarray) -> tuple[np.ndarray, float]:
    """Solve min-cost assignment for ``cost`` of shape (n, m), n <= m.

    Returns ``(col_of_row, total_cost)`` where ``col_of_row[i]`` is the
    column assigned to row ``i``.
    """
    cost = np.asarray(cost, dtype=float)
    n, m = cost.shape
    if n > m:
        raise ValueError("need n <= m (add tier copies / pad columns)")
    INF = math.inf
    u = np.zeros(n + 1)
    v = np.zeros(m + 1)
    p = np.zeros(m + 1, dtype=int)  # p[j] = row matched to column j (1-based)
    way = np.zeros(m + 1, dtype=int)
    for i in range(1, n + 1):
        p[0] = i
        j0 = 0
        minv = np.full(m + 1, INF)
        used = np.zeros(m + 1, dtype=bool)
        while True:
            used[j0] = True
            i0 = p[j0]
            delta, j1 = INF, -1
            for j in range(1, m + 1):
                if used[j]:
                    continue
                cur = cost[i0 - 1, j - 1] - u[i0] - v[j]
                if cur < minv[j]:
                    minv[j] = cur
                    way[j] = j0
                if minv[j] < delta:
                    delta = minv[j]
                    j1 = j
            if not math.isfinite(delta):
                raise InfeasibleMatching(
                    f"row {i - 1} cannot be matched (all remaining edges forbidden)"
                )
            for j in range(m + 1):
                if used[j]:
                    u[p[j]] += delta
                    v[j] -= delta
                else:
                    minv[j] -= delta
            j0 = j1
            if p[j0] == 0:
                break
        while j0 != 0:
            j1 = way[j0]
            p[j0] = p[j1]
            j0 = j1
    col_of_row = np.full(n, -1, dtype=int)
    total = 0.0
    for j in range(1, m + 1):
        if p[j] != 0:
            col_of_row[p[j] - 1] = j - 1
            total += cost[p[j] - 1, j - 1]
    return col_of_row, total


def assign_equal_partitions(
    *,
    n_partitions: int,
    span_gb: float,
    accesses: list[float],
    latency_thresholds: list[float],
    tiers: list[cm.Tier],
    months: float,
    weights: cm.CostWeights = cm.CostWeights(),
) -> tuple[list[str], float]:
    """Theorem-2 construction: Z_l copies per tier, edge iff latency feasible,
    weight = storage + expected read (+ write of new data), solved by
    min-weight matching. Returns (tier per partition, total cost).
    """
    if not (len(accesses) == len(latency_thresholds) == n_partitions):
        raise ValueError("accesses/latency_thresholds must have n_partitions entries")
    copies: list[str] = []
    for t in tiers:
        z = t.capacity_gb / span_gb if span_gb > 0 else float("inf")
        z = n_partitions if math.isinf(z) else min(n_partitions, int(z))
        copies.extend([t.name] * z)
    if len(copies) < n_partitions:
        raise InfeasibleMatching("total capacity below the number of partitions")
    tier_by_name = {t.name: t for t in tiers}
    costm = np.full((n_partitions, len(copies)), math.inf)
    for i in range(n_partitions):
        for j, tname in enumerate(copies):
            t = tier_by_name[tname]
            if not cm.latency_feasible(
                span_gb=span_gb,
                tier=t,
                decomp_sec_per_gb=0.0,
                latency_threshold=latency_thresholds[i],
            ):
                continue
            a = cm.assignment_cost(
                span_gb=span_gb,
                accesses=accesses[i],
                months=months,
                tier=t,
                current_tier=None,
            )
            costm[i, j] = a.weighted(weights)
    col, total = min_cost_matching(costm)
    return [copies[j] for j in col], total
