"""Table VII: compression-ratio prediction on the larger-SF TPC-H ('100GB')
and the Zipf-skewed variant ('TPC-H Skew', skew factor 3), for gzip and
parquet+gzip across models."""
from __future__ import annotations

import pandas as pd

from repro.core import compredict as cp
from repro.experiments import common, table06

#: Paper Table VII (subset of cells; Averaging has no R² by construction).
PAPER = pd.DataFrame(
    [
        ("TPC-H 100GB", "Averaging", "gzip", 0.083, 2.378, None),
        ("TPC-H 100GB", "Random Forest", "gzip", 0.078, 2.151, 0.969),
        ("TPC-H 100GB", "Random Forest", "parquet + gzip", 0.134, 3.369, 0.966),
        ("TPC-H Skew", "Averaging", "gzip", 0.120, 4.915, None),
        ("TPC-H Skew", "Averaging", "parquet + gzip", 0.601, 32.491, None),
        ("TPC-H Skew", "Random Forest", "gzip", 0.093, 3.005, 0.988),
        ("TPC-H Skew", "XGBoost", "gzip", 0.066, 2.467, 0.992),
    ],
    columns=["Dataset", "Model", "Scheme", "MAE", "MAPE", "R2"],
)

SCHEMES = {"gzip": "csv+gzip", "parquet + gzip": "parquet+gzip"}


def run(
    *,
    sf_large: float = 0.05,
    sf_skew: float = 0.02,
    skew: float = 3.0,
    n_per_template: int = 10,
    max_rows: int = 3000,
    seed: int = 0,
    repeats: int = 2,
    datasets: dict[str, pd.DataFrame] | None = None,
) -> pd.DataFrame:
    """Two blocks: larger uniform SF ('100GB' stand-in) and Zipf skew 3."""
    if datasets is None:
        datasets = {
            "TPC-H 100GB": table06.build_dataset(
                sf=sf_large, n_per_template=n_per_template, max_rows=max_rows,
                seed=seed, repeats=repeats,
            ),
            "TPC-H Skew": table06.build_dataset(
                sf=sf_skew, n_per_template=n_per_template, max_rows=max_rows,
                seed=seed + 1, repeats=repeats, skew=skew,
            ),
        }
    blocks = []
    for name, data in datasets.items():
        grid = common.metrics_grid(
            data,
            models=cp.MODEL_FACTORIES,
            schemes=SCHEMES,
            target_prefix="ratio",
            features=cp.ENTROPY_FEATURES + ("size_mb",),
        )
        grid.insert(0, "Dataset", name)
        blocks.append(grid)
    return pd.concat(blocks, ignore_index=True)
