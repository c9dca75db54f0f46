"""spark-submit entrypoint reproducing Table 11 — prints paper vs measured."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit friendliness

from _common import get_spark, show
from repro.experiments import table11


def main() -> None:
    spark = get_spark("table11")
    out = table11.run()
    ours = out[0] if isinstance(out, tuple) else out
    if hasattr(table11, "PAPER"):
        show("Table 11", table11.PAPER, ours)
    spark.stop()


if __name__ == "__main__":
    main()
