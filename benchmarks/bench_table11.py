"""Table XI bench: the 11-policy SCOPe grid on TPC-H at 1 TB logical."""
from benchmarks._bench_utils import record
from repro.experiments import table11


def test_table11(benchmark, results_dir):
    tbl, results = benchmark.pedantic(table11.run, rounds=1, iterations=1)
    record(results_dir, "table11", table11.PAPER, tbl)
    assert len(tbl) == 11
    assert results["scope_total"].total_cost < 0.2 * results["default"].total_cost
    # 1 TB totals are ~10x the 100 GB totals (costs are linear in GB).
    assert results["default"].total_cost > 50_000
