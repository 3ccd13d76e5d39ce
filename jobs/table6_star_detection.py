"""Table 6 - Star Detection (Cors 3.3/5.5).

spark-submit entrypoint; see DESIGN.md table index and EXPERIMENTS.md.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.tables import table6


def main() -> None:
    spark = get_spark("table6_star_detection")
    emit("Table 6 - Star Detection (Cors 3.3/5.5)", table6(spark))
    spark.stop()


if __name__ == "__main__":
    main()
