"""Benchmark + reproduction of Table 4 (T2 house, T4 mental).

Paper references (Table 4): MODis methods dominate all baselines on
F1/accuracy while also cutting training cost; SkSFM is cheapest but
least accurate; Starmie/METAM augment at a training-cost price.
"""
from repro.experiments.common import format_table
from repro.experiments.table4 import T2_MEASURES, T4_MEASURES, run_comparison
from repro.lake.tasks import house_lake, mental_lake

PAPER_T2 = """paper T2 (F1 / Acc / Train / Fsc / MI):
  Original  0.8288 0.8305 0.2000 0.0928 0.1260   (1178, 27)
  METAM     0.8510 0.8322 0.2100 0.0889 0.1109   (1178, 28)
  Starmie   0.8351 0.8331 0.2100 0.0149 0.0243   (1178, 32)
  SkSFM     0.7825 0.7826 0.2000 0.2472 0.2970   (1178, 4)
  H2O       0.8333 0.8305 0.2000 0.0691 0.1054   (1178, 15)
  ApxMODis  0.9044 0.9050 0.1533 0.2268 0.2039   (835, 17)
  NOBiMODis 0.9125 0.9121 0.1519 0.2610 0.2018   (797, 17)
  BiMODis   0.9125 0.9121 0.1519 0.2610 0.2018   (797, 17)
  DivMODis  0.8732 0.8729 0.2128 0.2223 0.3164   (1129, 5)"""

PAPER_T4 = """paper T4 (Acc / Pc / Rc / F1 / AUC / Train):
  Original  0.9222 0.7940 0.7722 0.7829 0.9618 0.4098  (1e5, 14)
  METAM     0.9468 0.7991 0.7846 0.7918 0.9757 0.3198  (1e5, 15)
  Starmie   0.9505 0.8106 0.8030 0.8068 0.9784 0.3333  (1e5, 16)
  SkSFM     0.8839 0.6577 0.7523 0.7018 0.9326 0.2359  (1e5, 8)
  H2O       0.9236 0.7892 0.7879 0.7885 0.9615 0.2530  (1e5, 8)
  ApxMODis  0.9532 0.8577 0.8097 0.8330 0.9792 0.3327  (128332, 16)
  NOBiMODis 0.9471 0.8454 0.8092 0.8269 0.9755 0.2818  (116048, 16)
  BiMODis   0.9525 0.8549 0.8075 0.8305 0.9789 0.3201  (128332, 17)
  DivMODis  0.9471 0.8454 0.8092 0.8269 0.9755 0.2818  (116048, 16)"""

SEARCH_KW = {"N": 400, "eps": 0.1, "max_level": 6}


def test_table4_t2(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: run_comparison(
            spark,
            house_lake,
            scale=1.0,
            select_key="f1",
            maximize=True,
            metam_utility="p_F1",
            search_kw=SEARCH_KW,
        ),
        rounds=1,
        iterations=1,
    )
    print("\n=== Table 4 / T2: House ===")
    print(PAPER_T2)
    print("ours:")
    print(format_table(rows, T2_MEASURES))
    by = {r.method: r for r in rows}
    best_modis_f1 = max(
        by[m].raw["f1"]
        for m in ("ApxMODis", "NOBiMODis", "BiMODis", "DivMODis")
    )
    assert best_modis_f1 > by["Original"].raw["f1"]


def test_table4_t4(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: run_comparison(
            spark,
            mental_lake,
            scale=0.5,
            select_key="acc",
            maximize=True,
            metam_utility="p_Acc",
            search_kw=SEARCH_KW,
        ),
        rounds=1,
        iterations=1,
    )
    print("\n=== Table 4 / T4: Mental (scale 0.5 of our lake) ===")
    print(PAPER_T4)
    print("ours:")
    print(format_table(rows, T4_MEASURES))
    by = {r.method: r for r in rows}
    best_modis_acc = max(
        by[m].raw["acc"]
        for m in ("ApxMODis", "NOBiMODis", "BiMODis", "DivMODis")
    )
    assert best_modis_acc > by["Original"].raw["acc"]
