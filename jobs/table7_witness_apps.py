"""Table 7 - frequent elements with witnesses: applications.

spark-submit entrypoint; see DESIGN.md table index and EXPERIMENTS.md.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.tables import table7


def main() -> None:
    spark = get_spark("table7_witness_apps")
    emit("Table 7 - frequent elements with witnesses: applications", table7(spark))
    spark.stop()


if __name__ == "__main__":
    main()
