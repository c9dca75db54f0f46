"""Table IX bench: the 11-policy SCOPe grid on Enterprise Data II."""
from benchmarks._bench_utils import record
from repro.experiments import table09


def test_table09(benchmark, results_dir):
    tbl, results = benchmark.pedantic(table09.run, rounds=1, iterations=1)
    record(results_dir, "table09", table09.PAPER, tbl)
    assert len(tbl) == 11
    assert results["scope_total"].total_cost < 0.5 * results["default"].total_cost
    assert results["part_premium"].read_cost < results["default"].read_cost
