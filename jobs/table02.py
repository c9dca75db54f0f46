"""spark-submit entrypoint reproducing Table 2 — prints paper vs measured."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit friendliness

from _common import get_spark, show
from repro.experiments import table02


def main() -> None:
    spark = get_spark("table02")
    out = table02.run()
    ours = out[0] if isinstance(out, tuple) else out
    if hasattr(table02, "PAPER"):
        show("Table 2", table02.PAPER, ours)
    spark.stop()


if __name__ == "__main__":
    main()
