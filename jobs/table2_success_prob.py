"""Table 2 - success probability vs the 1-1/n bound (Lemma 3.1/Thm 3.2).

spark-submit entrypoint; see DESIGN.md table index and EXPERIMENTS.md.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.tables import table2


def main() -> None:
    spark = get_spark("table2_success_prob")
    emit("Table 2 - success probability vs the 1-1/n bound (Lemma 3.1/Thm 3.2)", table2(spark))
    spark.stop()


if __name__ == "__main__":
    main()
