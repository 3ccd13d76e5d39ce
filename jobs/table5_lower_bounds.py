"""Table 5 - lower-bound reductions run constructively (Thms 4.1/4.8/6.4).

spark-submit entrypoint; see DESIGN.md table index and EXPERIMENTS.md.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.tables import table5


def main() -> None:
    spark = get_spark("table5_lower_bounds")
    emit("Table 5 - lower-bound reductions run constructively (Thms 4.1/4.8/6.4)", table5(spark))
    spark.stop()


if __name__ == "__main__":
    main()
