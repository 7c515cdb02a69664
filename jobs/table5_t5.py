"""Regenerate Table 5: MODis methods on the T5 link-regression task.

    spark-submit jobs/table5_t5.py [scale]
"""
import sys

from _session import get_spark

from repro.experiments.common import format_table
from repro.experiments.table5 import T5_MEASURES, run_table5


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark()
    rows = run_table5(spark, scale=scale)
    print("Table 5 — T5: link regression (LightGCN-lite)")
    print(format_table(rows, T5_MEASURES))
    spark.stop()


if __name__ == "__main__":
    main()
