"""Regenerate Table 6 (appendix): the 10-method comparison on
T1 (movie) and T3 (avocado).

    spark-submit jobs/table6_t1_t3.py [scale_t1] [scale_t3]
"""
import sys

from _session import get_spark

from repro.experiments.common import format_table
from repro.experiments.table6 import T1_MEASURES, T3_MEASURES, run_table6


def main() -> None:
    s1 = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    s3 = float(sys.argv[2]) if len(sys.argv) > 2 else 1.0
    spark = get_spark()
    out = run_table6(spark, scale_t1=s1, scale_t3=s3)
    print("Table 6 — T1: Movie")
    print(format_table(out["T1_movie"], T1_MEASURES))
    print()
    print("Table 6 — T3: Avocado")
    print(format_table(out["T3_avocado"], T3_MEASURES))
    spark.stop()


if __name__ == "__main__":
    main()
