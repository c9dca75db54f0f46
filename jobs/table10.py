"""spark-submit entrypoint reproducing Table 10 — prints paper vs measured."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit friendliness

from _common import get_spark, show
from repro.experiments import table10


def main() -> None:
    spark = get_spark("table10")
    out = table10.run()
    ours = out[0] if isinstance(out, tuple) else out
    if hasattr(table10, "PAPER"):
        show("Table 10", table10.PAPER, ours)
    spark.stop()


if __name__ == "__main__":
    main()
