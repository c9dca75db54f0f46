"""OPTASSIGN as a standalone Spark job: assign tiers + schemes to synthetic
partitions with the Theorem-3 greedy (DataFrame implementation)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit friendliness

import numpy as np
import pandas as pd

from _common import get_spark
from repro.core import cost_model as cm
from repro.core.optassign import greedy_assign


def main(n: int = 200, months: float = 6.0, seed: int = 0) -> None:
    spark = get_spark("optassign")
    g = np.random.default_rng(seed)
    parts = pd.DataFrame(
        {
            "pid": [f"p{i}" for i in range(n)],
            "span_gb": g.uniform(0.1, 500, n).round(2),
            "accesses": g.integers(0, 1000, n).astype(float),
        }
    )
    preds = pd.DataFrame(
        [
            {"pid": f"p{i}", "scheme": "parquet+gzip",
             "ratio": float(g.uniform(1.5, 4)), "decomp_sec_per_gb": float(g.uniform(1, 8))}
            for i in range(n)
        ]
    )
    out = greedy_assign(
        spark, spark.createDataFrame(parts), spark.createDataFrame(preds),
        cm.make_tiers(), months=months,
    ).toPandas()
    print(out.groupby(["tier", "scheme"]).size().to_string())
    print(f"total weighted cost: {out['weighted_cost'].sum():.1f} cents")
    spark.stop()


if __name__ == "__main__":
    main()
