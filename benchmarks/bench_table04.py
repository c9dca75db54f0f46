"""Table IV bench: OPTASSIGN vs intuitive tiering baselines."""
from benchmarks._bench_utils import record
from repro.experiments import table04


def test_table04(benchmark, results_dir):
    out = benchmark.pedantic(table04.run, rounds=1, iterations=1)
    record(results_dir, "table04", table04.PAPER, out)
    assert len(out) == 10
    arch = out[out["Model"] == "OptAssign (Hot, Cool, Archive)"]["Benefit %"].iloc[0]
    assert arch == out["Benefit %"].max()
