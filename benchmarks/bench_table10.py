"""Table X bench: the 11-policy SCOPe grid on TPC-H at 100 GB logical."""
from benchmarks._bench_utils import record
from repro.experiments import table10


def test_table10(benchmark, results_dir):
    tbl, results = benchmark.pedantic(table10.run, rounds=1, iterations=1)
    record(results_dir, "table10", table10.PAPER, tbl)
    assert len(tbl) == 11
    assert results["scope_total"].total_cost < 0.2 * results["default"].total_cost
    assert results["part_premium"].read_cost < results["default"].read_cost
    assert results["scope_nocap"].total_cost <= results["scope_total"].total_cost + 1e-6
