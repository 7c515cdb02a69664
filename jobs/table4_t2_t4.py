"""Regenerate Table 4: the 10-method comparison on T2 (house) and
T4 (mental).

    spark-submit jobs/table4_t2_t4.py [scale_t2] [scale_t4]
"""
import sys

from _session import get_spark

from repro.experiments.common import format_table
from repro.experiments.table4 import T2_MEASURES, T4_MEASURES, run_table4


def main() -> None:
    s2 = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    s4 = float(sys.argv[2]) if len(sys.argv) > 2 else 1.0
    spark = get_spark()
    out = run_table4(spark, scale_t2=s2, scale_t4=s4)
    print("Table 4 — T2: House")
    print(format_table(out["T2_house"], T2_MEASURES))
    print()
    print("Table 4 — T4: Mental")
    print(format_table(out["T4_mental"], T4_MEASURES))
    spark.stop()


if __name__ == "__main__":
    main()
