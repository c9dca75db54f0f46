"""Benchmark-local fixtures: result sink + shared COMPREDICT datasets.

Every bench writes the table it produced (paper rows next to measured rows)
to ``benchmarks/results/tableNN.txt`` so the numbers survive the run; the
pytest-benchmark timing covers the experiment's core computation.
"""
from __future__ import annotations

import pathlib

import pytest

RESULTS = pathlib.Path(__file__).parent / "results"


@pytest.fixture(scope="session")
def results_dir() -> pathlib.Path:
    RESULTS.mkdir(exist_ok=True)
    return RESULTS


@pytest.fixture(scope="session")
def compredict_datasets():
    """Shared across bench_table06/07/08 — the expensive part is labelling."""
    from repro.experiments import table06

    uniform = table06.build_dataset(
        sf=0.02, n_per_template=8, max_rows=2500, seed=0, repeats=2
    )
    large = table06.build_dataset(
        sf=0.05, n_per_template=8, max_rows=2500, seed=0, repeats=2
    )
    skew = table06.build_dataset(
        sf=0.02, n_per_template=8, max_rows=2500, seed=1, repeats=2, skew=3.0
    )
    return {"uniform": uniform, "large": large, "skew": skew}
