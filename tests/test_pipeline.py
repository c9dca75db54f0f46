"""The unified SCOPe pipeline: partition construction, policy grid, and the
end-to-end tiered-write integration."""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data as sd
from repro.core import cost_model as cm
from repro.core import pipeline as pl
from repro.experiments import common
from repro.storage.tiers import TieredStore
from repro.workload import queries as wq


@pytest.fixture(scope="module")
def setup():
    tables = common.enterprise_table_files(sf=0.002, n_files=10, seed=0)
    queries = wq.gen_zipf_workload(
        tables, n_queries=200, seed=0, sort_cols=sd.ENTERPRISE_SORT_COL
    )
    return tables, queries


class TestPartitionConstruction:
    def test_unpartitioned_one_per_table(self, setup):
        tables, queries = setup
        parts = pl.unpartitioned(tables, queries, max_rows=500)
        assert len(parts) == len(tables)
        assert sum(p.rho for p in parts) == len(queries)
        for p in parts:
            assert p.span_gb == pytest.approx(tables[p.table].size_gb)

    def test_gpart_partitions_cover_all_files(self, setup):
        tables, queries = setup
        parts = pl.gpart_partitions(tables, queries, max_rows=500)
        covered = set().union(*(set(p.files) for p in parts))
        all_files = {f.file_id for tf in tables.values() for f in tf.files}
        assert covered == all_files

    def test_gpart_rho_conserved(self, setup):
        tables, queries = setup
        parts = pl.gpart_partitions(tables, queries, max_rows=500)
        assert sum(p.rho for p in parts) == len(queries)

    def test_partition_samples_nonempty(self, setup):
        tables, queries = setup
        for p in pl.gpart_partitions(tables, queries, max_rows=500):
            assert len(p.sample) > 0
            assert len(p.sample) <= 500

    def test_partitions_single_table(self, setup):
        """G-PART never merges across tables (zero overlap)."""
        tables, queries = setup
        for p in pl.gpart_partitions(tables, queries, max_rows=100):
            tbls = {f.split("/")[0] for f in p.files}
            assert tbls == {p.table}


class TestMeasureAndPolicies:
    @pytest.fixture(scope="class")
    def parts_preds(self, setup):
        tables, queries = setup
        parts = pl.unpartitioned(tables, queries, max_rows=800)
        preds = pl.measure_partitions(parts, ("parquet+gzip", "csv+gzip"))
        return parts, preds

    def test_measure_schema(self, parts_preds):
        _, preds = parts_preds
        assert set(preds.columns) == {"pid", "scheme", "ratio", "decomp_sec_per_gb"}
        assert (preds["ratio"] > 0).all()

    def test_run_policy_premium_only(self, parts_preds):
        parts, _ = parts_preds
        r = pl.run_policy(
            name="Default", baseline="-", partitions=parts, predictions=None,
            tier_names=("premium",), months=5.5,
        )
        assert r.tiering_scheme == [len(parts), 0, 0]
        assert r.decomp_cost == 0.0
        assert r.read_latency_s == pytest.approx(cm.TTFB["premium"])
        assert r.total_cost == pytest.approx(
            r.storage_cost + r.read_cost + r.decomp_cost
        )

    def test_compression_lowers_storage(self, parts_preds):
        parts, preds = parts_preds
        plain = pl.run_policy(
            name="d", baseline="-", partitions=parts, predictions=None,
            tier_names=("premium",), months=5.5,
        )
        comp = pl.run_policy(
            name="a", baseline="Ares", partitions=parts, predictions=preds,
            tier_names=("premium",), months=5.5,
        )
        assert comp.storage_cost < plain.storage_cost

    def test_capacity_respected(self, parts_preds):
        parts, _ = parts_preds
        total = sum(p.span_gb for p in parts)
        r = pl.run_policy(
            name="h", baseline="Hermes", partitions=parts, predictions=None,
            tier_names=("premium", "hot", "cool"), months=5.5,
            capacity_total_gb=total,
        )
        usage = r.assignment.groupby("tier")["stored_gb"].sum()
        assert usage.get("premium", 0.0) <= cm.CAPACITY_FRACTION["premium"] * total + 1e-9
        assert usage.get("hot", 0.0) <= cm.CAPACITY_FRACTION["hot"] * total + 1e-9

    def test_latency_focused_minimises_latency(self, parts_preds):
        parts, preds = parts_preds
        lat = pl.run_policy(
            name="l", baseline="HCompress", partitions=parts, predictions=preds,
            tier_names=("premium", "hot", "cool"), months=5.5, latency_focused=True,
        )
        cost = pl.run_policy(
            name="c", baseline="-", partitions=parts, predictions=preds,
            tier_names=("premium", "hot", "cool"), months=5.5,
        )
        assert lat.read_latency_s + lat.decomp_latency_ms / 1000 <= (
            cost.read_latency_s + cost.decomp_latency_ms / 1000 + 1e-12
        )
        # With no capacity pressure the latency optimum is premium + none.
        assert lat.decomp_latency_ms == pytest.approx(0.0)


class TestPolicyTable:
    @pytest.fixture(scope="class")
    def grid(self, setup):
        tables, queries = setup
        return pl.scope_policy_table(tables, queries, max_rows=500, query_repeat=5.0)

    def test_eleven_rows(self, grid):
        table, results = grid
        assert len(table) == 11
        assert len(results) == 11

    def test_columns_match_paper(self, grid):
        table, _ = grid
        for col in ("Policy", "P", "T", "C", "Storage", "Decomp", "Read",
                    "Total", "TTFB(s)", "DecompLat(ms)", "Tiering"):
            assert col in table.columns

    def test_scope_total_beats_default(self, grid):
        """The paper's headline: SCOPe(total) wins by a large factor."""
        _, results = grid
        assert results["scope_total"].total_cost < 0.5 * results["default"].total_cost

    def test_nocap_is_cheapest_or_tied(self, grid):
        """Theorem 3: removing capacity constraints can only help the objective."""
        _, results = grid
        assert (
            results["scope_nocap"].total_cost
            <= results["scope_total"].total_cost + 1e-6
        )

    def test_partitioning_reduces_read_cost(self, grid):
        _, results = grid
        assert results["part_premium"].read_cost < results["default"].read_cost

    def test_flags(self, grid):
        _, results = grid
        assert not results["default"].partitioned
        assert results["scope_total"].partitioned
        assert results["ares"].compressed and not results["ares"].tiered
        assert results["hermes"].tiered and not results["hermes"].compressed


class TestTieredWriteIntegration:
    def test_assignment_written_through_store(self, setup, tmp_path):
        """End-to-end: OPTASSIGN's choices drive physical tiered writes."""
        tables, queries = setup
        parts = pl.gpart_partitions(tables, queries, max_rows=300)
        preds = pl.measure_partitions(parts, ("parquet+gzip",))
        r = pl.run_policy(
            name="scope", baseline="-", partitions=parts, predictions=preds,
            tier_names=("premium", "hot", "cool"), months=5.5, partitioned=True,
        )
        store = TieredStore(tmp_path / "lake")
        by_pid = {p.pid: p for p in parts}
        for row in r.assignment.itertuples(index=False):
            store.put(row.pid, by_pid[row.pid].sample, tier=row.tier, scheme=row.scheme)
        assert len(store.catalog) == len(parts)
        # Every object is physically on its assigned tier and decodable.
        some = r.assignment.iloc[0]
        assert (store.root / some.tier / some.pid).exists()
        back = store.get(some.pid)
        assert len(back) == len(by_pid[some.pid].sample)
        assert store.meter.write > 0 and store.meter.read > 0
