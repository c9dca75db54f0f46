"""Table II bench: % cost benefit for 4 customer accounts (2 & 6 months)."""
from benchmarks._bench_utils import record
from repro.experiments import table02


def test_table02(benchmark, results_dir):
    out = benchmark.pedantic(table02.run, rounds=1, iterations=1)
    record(results_dir, "table02", table02.PAPER, out)
    assert len(out) == 4
    assert (out["2 mos"] > 0).all()
    assert (out["6 mos"] > out["2 mos"]).all()
