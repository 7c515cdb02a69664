"""Benchmark + reproduction of Table 6 (appendix: T1 movie, T3 avocado)."""
from repro.experiments.common import format_table
from repro.experiments.table4 import run_comparison
from repro.experiments.table6 import T1_MEASURES, T3_MEASURES
from repro.lake.tasks import avocado_lake, movie_lake

PAPER_T1 = """paper T1 (Acc / Train / Fsc / MI):
  Original  0.8560 1.4775 0.0824 0.0538  (3264, 10)
  METAM     0.8743 1.6276 0.0497 0.0344  (3264, 11)
  Starmie   0.8606 1.2643 0.1286 0.1072  (3264, 23)
  SkSFM     0.8285 0.6028 0.7392 0.3921  (3264, 3)
  H2O       0.8545 0.9692 0.3110 0.1759  (3264, 8)
  ApxMODis  0.9291 0.9947 0.6011 0.4178  (2958, 9)
  NOBiMODis 0.9874 0.8766 0.7202 0.3377  (1980, 12)
  BiMODis   0.9755 0.8027 0.9240 0.3839  (1835, 11)
  DivMODis  0.9427 0.8803 0.8010 0.4165  (2176, 10)"""

PAPER_T3 = """paper T3 (MSE / MAE / Train):
  Original  0.0428 0.1561 0.0280  (9999, 11)
  METAM     0.0392 0.1497 0.0178  (9999, 12)
  Starmie   0.0362 0.1453 0.0436  (9999, 12)
  SkSFM     0.0509 0.1737 0.0086  (9999, 3)
  H2O       0.0442 0.1592 0.0156  (9999, 5)
  ApxMODis  0.0298 0.1279 0.0065  (1589, 10)
  NOBiMODis 0.0228 0.1153 0.0033  (817, 5)
  BiMODis   0.0275 0.1232 0.0044  (1310, 9)
  DivMODis  0.0275 0.1232 0.0044  (1310, 9)"""

SEARCH_KW = {"N": 400, "eps": 0.1, "max_level": 6}


def test_table6_t1(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: run_comparison(
            spark,
            movie_lake,
            scale=1.0,
            select_key="acc",
            maximize=True,
            metam_utility="p_Acc",
            search_kw=SEARCH_KW,
        ),
        rounds=1,
        iterations=1,
    )
    print("\n=== Table 6 / T1: Movie ===")
    print(PAPER_T1)
    print("ours:")
    print(format_table(rows, T1_MEASURES))
    by = {r.method: r for r in rows}
    best = max(
        by[m].raw["acc"]
        for m in ("ApxMODis", "NOBiMODis", "BiMODis", "DivMODis")
    )
    assert best > by["Original"].raw["acc"]


def test_table6_t3(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: run_comparison(
            spark,
            avocado_lake,
            scale=0.5,
            select_key="mse",
            maximize=False,
            metam_utility="p_MSE",
            search_kw=SEARCH_KW,
        ),
        rounds=1,
        iterations=1,
    )
    print("\n=== Table 6 / T3: Avocado (scale 0.5 of our lake) ===")
    print(PAPER_T3)
    print("ours:")
    print(format_table(rows, T3_MEASURES))
    by = {r.method: r for r in rows}
    best_mse = min(
        by[m].raw["mse"]
        for m in ("ApxMODis", "NOBiMODis", "BiMODis", "DivMODis")
    )
    assert best_mse < by["Original"].raw["mse"]
