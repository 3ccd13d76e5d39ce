"""Table 1 - insertion-only space & approximation vs c (Thm 3.2).

spark-submit entrypoint; see DESIGN.md table index and EXPERIMENTS.md.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.tables import table1


def main() -> None:
    spark = get_spark("table1_insertion_only")
    emit("Table 1 - insertion-only space & approximation vs c (Thm 3.2)", table1(spark))
    spark.stop()


if __name__ == "__main__":
    main()
