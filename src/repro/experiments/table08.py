"""Table VIII: decompression-speed (sec/GB) prediction — same grid as
Table VII but on the ``dsec_*`` targets."""
from __future__ import annotations

import pandas as pd

from repro.core import compredict as cp
from repro.experiments import common, table06, table07

#: Paper Table VIII (subset of cells).
PAPER = pd.DataFrame(
    [
        ("TPC-H 100GB", "Averaging", "gzip", 0.679, 3.732, None),
        ("TPC-H 100GB", "Random Forest", "gzip", 0.292, 1.601, 0.98),
        ("TPC-H 100GB", "Random Forest", "parquet + gzip", 1.165, 9.698, 0.799),
        ("TPC-H Skew", "Averaging", "gzip", 7.037, 29.979, None),
        ("TPC-H Skew", "Random Forest", "gzip", 1.141, 4.910, 0.922),
        ("TPC-H Skew", "Random Forest", "parquet + gzip", 5.194, 7.983, 0.915),
    ],
    columns=["Dataset", "Model", "Scheme", "MAE", "MAPE", "R2"],
)


def run(
    *,
    datasets: dict[str, pd.DataFrame] | None = None,
    **dataset_kw,
) -> pd.DataFrame:
    if datasets is None:
        kw = dict(
            sf_large=dataset_kw.pop("sf_large", 0.05),
            sf_skew=dataset_kw.pop("sf_skew", 0.02),
            skew=dataset_kw.pop("skew", 3.0),
        )
        datasets = {
            "TPC-H 100GB": table06.build_dataset(sf=kw["sf_large"], **dataset_kw),
            "TPC-H Skew": table06.build_dataset(
                sf=kw["sf_skew"], skew=kw["skew"], **dataset_kw
            ),
        }
    blocks = []
    for name, data in datasets.items():
        grid = common.metrics_grid(
            data,
            models=cp.MODEL_FACTORIES,
            schemes=table07.SCHEMES,
            target_prefix="dsec",
            features=cp.ENTROPY_FEATURES + ("size_mb",),
        )
        grid.insert(0, "Dataset", name)
        blocks.append(grid)
    return pd.concat(blocks, ignore_index=True)
