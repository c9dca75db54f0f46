"""spark-submit entrypoint reproducing Table 7 — prints paper vs measured."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit friendliness

from _common import get_spark, show
from repro.experiments import table07


def main() -> None:
    spark = get_spark("table07")
    out = table07.run()
    ours = out[0] if isinstance(out, tuple) else out
    if hasattr(table07, "PAPER"):
        show("Table 7", table07.PAPER, ours)
    spark.stop()


if __name__ == "__main__":
    main()
