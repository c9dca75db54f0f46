"""G-PART (§VI-A, Algorithm 1): greedy access-aware partition merging.

Initial partitions (query families = file sets) are nodes of a graph whose
edges carry the *fractional overlap* ``w = Ov(u, v) / Sp(u ∪ v)``. G-PART
repeatedly merges the max-weight edge's endpoints (max-heap), subject to
the access-comparability feasibility constraint and a soft span cap
``S_thresh``; merged nodes below the cap re-enter the heap with recomputed
edges. The heap-greedy is inherently sequential and runs on the driver over
partition *metadata*; the pairwise overlap graph for large inputs is built
distributively (:func:`overlap_edges_spark`).
"""
from __future__ import annotations

import heapq
import itertools
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.ilp import FilePart, merge_feasible, span_of


@dataclass
class MergedPartition:
    """A final partition: union of one or more initial partitions."""

    pid: str
    members: tuple[str, ...]
    files: frozenset[str]
    span: float
    rho: float


def _fractional_overlap(
    a: FilePart | MergedPartition,
    b: FilePart | MergedPartition,
    file_sizes: dict[str, float],
) -> float:
    union = a.files | b.files
    sp_u = span_of(frozenset(union), file_sizes)
    if sp_u == 0:
        return 0.0
    ov = (
        span_of(a.files, file_sizes)
        + span_of(b.files, file_sizes)
        - sp_u
    )
    return ov / sp_u


def _as_merged(p: FilePart, file_sizes: dict[str, float]) -> MergedPartition:
    return MergedPartition(
        pid=p.pid,
        members=(p.pid,),
        files=p.files,
        span=span_of(p.files, file_sizes),
        rho=p.rho,
    )


def _feasible(a: MergedPartition, b: MergedPartition, rho_c: float, rho_abs: float) -> bool:
    return merge_feasible(
        FilePart(a.pid, a.files, a.rho),
        FilePart(b.pid, b.files, b.rho),
        rho_c=rho_c,
        rho_abs=rho_abs,
    )


def gpart(
    parts: list[FilePart],
    file_sizes: dict[str, float],
    *,
    s_thresh: float = float("inf"),
    rho_c: float = 3.0,
    rho_abs: float = 0.0,
) -> list[MergedPartition]:
    """Algorithm 1. Deterministic: ties in overlap break on (pid, pid)."""
    nodes: dict[str, MergedPartition] = {
        p.pid: _as_merged(p, file_sizes) for p in parts
    }
    if len(nodes) != len(parts):
        raise ValueError("duplicate partition ids")
    heap: list[tuple[float, str, str]] = []  # (-overlap, pid_a, pid_b)
    for a, b in itertools.combinations(nodes.values(), 2):
        if not _feasible(a, b, rho_c, rho_abs):
            continue
        w = _fractional_overlap(a, b, file_sizes)
        if w > 0:
            heapq.heappush(heap, (-w, a.pid, b.pid))
    counter = itertools.count()
    while heap:
        _, pa, pb = heapq.heappop(heap)
        if pa not in nodes or pb not in nodes:
            continue  # a stale edge to an already-merged node
        a, b = nodes.pop(pa), nodes.pop(pb)
        m = MergedPartition(
            pid=f"m{next(counter)}:{min(pa, pb)}",
            members=tuple(sorted(a.members + b.members)),
            files=a.files | b.files,
            span=span_of(a.files | b.files, file_sizes),
            rho=a.rho + b.rho,
        )
        nodes[m.pid] = m
        if m.span >= s_thresh:
            continue  # soft span cap: frozen, no further merging
        for other in nodes.values():
            if other.pid == m.pid:
                continue
            if not _feasible(m, other, rho_c, rho_abs):
                continue
            w = _fractional_overlap(m, other, file_sizes)
            if w > 0:
                heapq.heappush(heap, (-w, m.pid, other.pid))
    return sorted(nodes.values(), key=lambda x: x.members)


def merge_all(parts: list[FilePart], file_sizes: dict[str, float]) -> MergedPartition:
    """The 'merge everything' extreme of Fig 7's trade-off."""
    files = frozenset().union(*(p.files for p in parts)) if parts else frozenset()
    return MergedPartition(
        pid="all",
        members=tuple(sorted(p.pid for p in parts)),
        files=files,
        span=span_of(files, file_sizes),
        rho=sum(p.rho for p in parts),
    )


def duplication(merges: list[MergedPartition], file_sizes: dict[str, float]) -> float:
    """Fig 7's duplication metric: 1 - |distinct records| / |total records|."""
    total = sum(m.span for m in merges)
    if total == 0:
        return 0.0
    distinct = span_of(frozenset().union(*(m.files for m in merges)), file_sizes)
    return 1.0 - distinct / total


def read_cost(merges: list[MergedPartition]) -> float:
    """Expected read cost Σ Sp(M)·ρ(M) (the MERGE PARTITIONS budget metric)."""
    return sum(m.span * m.rho for m in merges)


# --------------------------------------------------------------------------
# Distributed overlap-graph construction
# --------------------------------------------------------------------------
def overlap_edges_spark(
    spark: SparkSession,
    part_files: DataFrame,
    file_sizes: DataFrame,
) -> DataFrame:
    """Pairwise overlap sizes via a Spark self-join.

    ``part_files``: (pid, file) — one row per file per initial partition.
    ``file_sizes``: (file, size_gb).
    Returns (pid_a, pid_b, overlap_gb) with pid_a < pid_b and overlap > 0.
    """
    pf = part_files.join(file_sizes, "file")
    a = pf.select(
        F.col("pid").alias("pid_a"), "file", F.col("size_gb").alias("sz")
    )
    b = pf.select(F.col("pid").alias("pid_b"), "file")
    return (
        a.join(b, "file")
        .where(F.col("pid_a") < F.col("pid_b"))
        .groupBy("pid_a", "pid_b")
        .agg(F.sum("sz").alias("overlap_gb"))
        .where(F.col("overlap_gb") > 0)
    )


def overlap_edges_python(
    parts: list[FilePart], file_sizes: dict[str, float]
) -> pd.DataFrame:
    """Driver-side twin of :func:`overlap_edges_spark` (tested for equality)."""
    rows = []
    for a, b in itertools.combinations(sorted(parts, key=lambda p: p.pid), 2):
        common = a.files & b.files
        if common:
            rows.append(
                {
                    "pid_a": a.pid,
                    "pid_b": b.pid,
                    "overlap_gb": span_of(frozenset(common), file_sizes),
                }
            )
    return pd.DataFrame(rows, columns=["pid_a", "pid_b", "overlap_gb"])
