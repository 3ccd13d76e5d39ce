"""Table 3 - insertion-deletion space & strategies vs c (Thm 5.4).

spark-submit entrypoint; see DESIGN.md table index and EXPERIMENTS.md.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.tables import table3


def main() -> None:
    spark = get_spark("table3_insertion_deletion")
    emit("Table 3 - insertion-deletion space & strategies vs c (Thm 5.4)", table3(spark))
    spark.stop()


if __name__ == "__main__":
    main()
