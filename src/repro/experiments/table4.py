"""Tables 4 & 6 engine: the 10-method multi-objective comparison.

Methods (paper §6 "Algorithms"): Original (the universal input table),
METAM, METAM-MO, Starmie, SkSFM, H2O, and the four MODis algorithms.
Table 4 reports T2 (house / RandomForest) and T4 (mental /
LightGBM-lite); Table 6 (appendix) reports T1 (movie / GB regression)
and T3 (avocado / linear regression) through the same engine.
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import SparkSession

from repro.baselines import h2o_fs, metam, metam_mo, sksfm, starmie
from repro.core.runner import SearchContext
from repro.experiments.common import (
    MethodRow,
    evaluate_output,
    run_modis,
    timed_call,
)
from repro.lake.tasks import house_lake, mental_lake


def run_comparison(
    spark: SparkSession,
    lake_fn: Callable,
    *,
    scale: float = 1.0,
    select_key: str,
    maximize: bool,
    metam_utility: str,
    search_kw: dict | None = None,
    max_k: int = 12,
    n_seed: int = 12,
    seed: int = 0,
    methods: tuple[str, ...] = (
        "Original",
        "METAM",
        "METAM-MO",
        "Starmie",
        "SkSFM",
        "H2O",
        "ApxMODis",
        "NOBiMODis",
        "BiMODis",
        "DivMODis",
    ),
) -> list[MethodRow]:
    lake, task, measures = lake_fn(spark, scale=scale)
    ctx = SearchContext.build(
        spark, lake, task, measures, max_k=max_k, n_seed=n_seed, seed=seed
    )
    skw = dict(search_kw or {})
    rows: list[MethodRow] = []
    for m in methods:
        if m == "Original":
            pv = ctx.true_eval(ctx.layout.full_bits())
            out = ctx.materialize(ctx.layout.full_bits())
            rows.append(
                MethodRow("Original", dict(pv.raw), len(out), len(out.columns), 0.0)
            )
        elif m == "METAM":
            out, wall = timed_call(
                metam, lake, task, measures, utility_measure=metam_utility
            )
            rows.append(evaluate_output("METAM", out, task, wall))
        elif m == "METAM-MO":
            out, wall = timed_call(metam_mo, lake, task, measures)
            rows.append(evaluate_output("METAM-MO", out, task, wall))
        elif m == "Starmie":
            out, wall = timed_call(starmie, lake, task)
            rows.append(evaluate_output("Starmie", out, task, wall))
        elif m == "SkSFM":
            out, wall = timed_call(sksfm, ctx.universal_pdf, task)
            rows.append(evaluate_output("SkSFM", out, task, wall))
        elif m == "H2O":
            out, wall = timed_call(h2o_fs, ctx.universal_pdf, task)
            rows.append(evaluate_output("H2O", out, task, wall))
        else:
            rows.append(
                run_modis(
                    ctx,
                    m,
                    select_key=select_key,
                    maximize=maximize,
                    search_kw=skw,
                )
            )
    return rows


def run_table4(
    spark: SparkSession,
    *,
    scale_t2: float = 1.0,
    scale_t4: float = 1.0,
    search_kw: dict | None = None,
) -> dict[str, list[MethodRow]]:
    skw = {"N": 400, "eps": 0.1, "max_level": 6, **(search_kw or {})}
    return {
        "T2_house": run_comparison(
            spark,
            house_lake,
            scale=scale_t2,
            select_key="f1",
            maximize=True,
            metam_utility="p_F1",
            search_kw=skw,
        ),
        "T4_mental": run_comparison(
            spark,
            mental_lake,
            scale=scale_t4,
            select_key="acc",
            maximize=True,
            metam_utility="p_Acc",
            search_kw=skw,
        ),
    }


# The measure rows each task's table prints (label, raw key).
T2_MEASURES = [
    ("p_F1", "f1"),
    ("p_Acc", "acc"),
    ("p_Train", "train_time"),
    ("p_Fsc", "fisher"),
    ("p_MI", "mi"),
]
T4_MEASURES = [
    ("p_Acc", "acc"),
    ("p_Pc", "precision"),
    ("p_Rc", "recall"),
    ("p_F1", "f1"),
    ("p_AUC", "auc"),
    ("p_Train", "train_time"),
]
