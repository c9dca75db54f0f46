"""spark-submit entrypoint reproducing Table 5 — prints paper vs measured."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit friendliness

from _common import get_spark, show
from repro.experiments import table05


def main() -> None:
    spark = get_spark("table05")
    out = table05.run()
    ours = out[0] if isinstance(out, tuple) else out
    if hasattr(table05, "PAPER"):
        show("Table 5", table05.PAPER, ours)
    spark.stop()


if __name__ == "__main__":
    main()
