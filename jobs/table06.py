"""spark-submit entrypoint reproducing Table 6 — prints paper vs measured."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit friendliness

from _common import get_spark, show
from repro.experiments import table06


def main() -> None:
    spark = get_spark("table06")
    out = table06.run()
    ours = out[0] if isinstance(out, tuple) else out
    if hasattr(table06, "PAPER"):
        show("Table 6", table06.PAPER, ours)
    spark.stop()


if __name__ == "__main__":
    main()
