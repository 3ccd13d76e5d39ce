"""Table 4 - l0-sampler quality (substrate of Alg. 3).

spark-submit entrypoint; see DESIGN.md table index and EXPERIMENTS.md.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.tables import table4


def main() -> None:
    spark = get_spark("table4_l0_sampler")
    emit("Table 4 - l0-sampler quality (substrate of Alg. 3)", table4(spark))
    spark.stop()


if __name__ == "__main__":
    main()
