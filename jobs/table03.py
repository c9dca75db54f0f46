"""spark-submit entrypoint reproducing Table 3 — prints paper vs measured."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))  # spark-submit friendliness

from _common import get_spark, show
from repro.experiments import table03


def main() -> None:
    spark = get_spark("table03")
    res = table03.run()
    show("Table 3 (confusion matrix)", table03.PAPER, res["confusion"])
    print(f"F1 hot={res['f1_hot']:.4f} cool={res['f1_cool']:.4f} "
          f"(paper reports F1 > {table03.PAPER_F1})")
    spark.stop()


if __name__ == "__main__":
    main()
