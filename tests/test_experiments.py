"""Experiment harnesses: table runners produce the paper's row/column
structure at test scale."""
import pytest

from repro.experiments.common import MethodRow, format_table, run_modis
from repro.experiments.table2 import run_table2
from repro.experiments.table4 import T2_MEASURES, run_comparison
from repro.experiments.table5 import T5_MEASURES, run_table5
from repro.lake.tasks import house_lake


def test_table2_structure(spark):
    out = run_table2(spark, scale=0.05)
    assert len(out) == 3
    for name, (t, c, r) in out.items():
        assert t >= 1 and c > 0 and r > 0


def test_run_modis_reports_true_measures(house_ctx):
    row = run_modis(
        house_ctx,
        "BiMODis",
        select_key="f1",
        maximize=True,
        search_kw={"N": 60, "eps": 0.2, "max_level": 3},
    )
    assert isinstance(row, MethodRow)
    assert 0 <= row.raw["f1"] <= 1
    assert row.n_rows > 0 and row.n_cols >= 2
    assert "skyline_size" in row.extra


def test_run_comparison_subset(spark):
    rows = run_comparison(
        spark,
        house_lake,
        scale=0.25,
        select_key="f1",
        maximize=True,
        metam_utility="p_F1",
        search_kw={"N": 60, "eps": 0.2, "max_level": 3},
        n_seed=4,
        methods=("Original", "SkSFM", "BiMODis"),
    )
    assert [r.method for r in rows] == ["Original", "SkSFM", "BiMODis"]
    for r in rows:
        assert "acc" in r.raw


def test_format_table_layout():
    rows = [
        MethodRow("A", {"f1": 0.5, "acc": 0.6}, 10, 3, 1.0),
        MethodRow("B", {"f1": 0.7}, 20, 4, 2.0),
    ]
    txt = format_table(rows, [("p_F1", "f1"), ("p_Acc", "acc")])
    lines = txt.splitlines()
    assert lines[0].split("\t") == ["measure", "A", "B"]
    assert "0.5000" in lines[1] and "0.7000" in lines[1]
    assert "/" in lines[2]  # missing measure rendered as '/'
    assert "(10, 3)" in lines[3]


def test_table5_structure(spark):
    rows = run_table5(
        spark,
        scale=0.5,
        search_kw={"N": 50, "eps": 0.2, "max_level": 3},
        n_seed=4,
    )
    assert [r.method for r in rows] == [
        "Original",
        "ApxMODis",
        "NOBiMODis",
        "BiMODis",
        "DivMODis",
    ]
    for r in rows:
        for _, key in T5_MEASURES:
            assert key in r.raw


def test_t2_measure_catalogue_keys():
    keys = [k for _, k in T2_MEASURES]
    assert keys == ["f1", "acc", "train_time", "fisher", "mi"]
