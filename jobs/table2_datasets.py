"""Regenerate Table 2: characteristics of the (stand-in) dataset lakes.

    spark-submit jobs/table2_datasets.py  [scale]
"""
import sys

from _session import get_spark

from repro.experiments.table2 import run_table2


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark()
    print("Table 2 — lake characteristics (#tables, #columns, #rows)")
    for name, (t, c, r) in run_table2(spark, scale=scale).items():
        print(f"{name}\t{t}\t{c}\t{r}")
    spark.stop()


if __name__ == "__main__":
    main()
