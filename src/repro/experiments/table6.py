"""Table 6 (appendix): the 10-method comparison on T1 and T3.

T1 (movie / GB regression) selects by regression tolerance-accuracy;
T3 (avocado / linear regression) selects by MSE (minimize).
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.experiments.common import MethodRow
from repro.experiments.table4 import run_comparison
from repro.lake.tasks import avocado_lake, movie_lake


def run_table6(
    spark: SparkSession,
    *,
    scale_t1: float = 1.0,
    scale_t3: float = 1.0,
    search_kw: dict | None = None,
) -> dict[str, list[MethodRow]]:
    skw = {"N": 400, "eps": 0.1, "max_level": 6, **(search_kw or {})}
    return {
        "T1_movie": run_comparison(
            spark,
            movie_lake,
            scale=scale_t1,
            select_key="acc",
            maximize=True,
            metam_utility="p_Acc",
            search_kw=skw,
        ),
        "T3_avocado": run_comparison(
            spark,
            avocado_lake,
            scale=scale_t3,
            select_key="mse",
            maximize=False,
            metam_utility="p_MSE",
            search_kw=skw,
        ),
    }


T1_MEASURES = [
    ("p_Acc", "acc"),
    ("p_Train", "train_time"),
    ("p_Fsc", "fisher"),
    ("p_MI", "mi"),
]
T3_MEASURES = [
    ("MSE", "mse"),
    ("MAE", "mae"),
    ("Training Time", "train_time"),
]
