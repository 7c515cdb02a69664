"""Table 2: characteristics of the dataset lakes.

The paper's Table 2 lists (#tables, #columns, #rows) for its three
crawled lakes (Kaggle / OpenData / HF). We report the same shape for
the synthetic lakes standing in for them (DESIGN.md substitutions):
the Kaggle stand-in backs T1/T4 (+ the T5 graphs), OpenData backs T2,
HF backs T3.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.lake.graph import graph_lake
from repro.lake.tasks import avocado_lake, house_lake, mental_lake, movie_lake


def run_table2(spark: SparkSession, scale: float = 1.0) -> dict[str, tuple]:
    """(#tables, #columns, #rows) per stand-in lake."""
    lakes = {
        "Kaggle(-like: T1 movie + T4 mental + T5 graphs)": [
            movie_lake(spark, scale)[0],
            mental_lake(spark, scale)[0],
            graph_lake(spark, scale)[0],
        ],
        "OpenData(-like: T2 house)": [house_lake(spark, scale)[0]],
        "HF(-like: T3 avocado)": [avocado_lake(spark, scale)[0]],
    }
    out = {}
    for name, group in lakes.items():
        t = c = r = 0
        for lake in group:
            ti, ci, ri = lake.characteristics()
            t, c, r = t + ti, c + ci, r + ri
        out[name] = (t, c, r)
    return out
