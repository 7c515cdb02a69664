"""Benchmark + reproduction of Table 5 (T5 link regression)."""
from repro.experiments.common import format_table
from repro.experiments.table5 import T5_MEASURES, run_table5

PAPER_T5 = """paper T5 (Pc5 / Pc10 / Rc5 / Rc10 / Nc5 / Nc10):
  Original  0.7200 0.6600 0.1863 0.3217 0.6923 0.6646  (7925, 0)
  ApxMODis  0.8200 0.8100 0.2072 0.3866 0.7935 0.7976  (5826, 30)
  NOBiMODis 0.8000 0.8000 0.2022 0.3816 0.7875 0.7891  (1966, 6)
  BiMODis   0.8200 0.8200 0.2072 0.3977 0.7924 0.8033  (2869, 4)
  DivMODis  0.8000 0.8000 0.2022 0.3816 0.7875 0.7891  (1966, 6)"""


def test_table5(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: run_table5(
            spark,
            scale=1.0,
            search_kw={"N": 250, "eps": 0.1, "max_level": 6},
        ),
        rounds=1,
        iterations=1,
    )
    print("\n=== Table 5 / T5: link regression ===")
    print(PAPER_T5)
    print("ours:")
    print(format_table(rows, T5_MEASURES))
    by = {r.method: r for r in rows}
    best_pc5 = max(
        by[m].raw["pc5"]
        for m in ("ApxMODis", "NOBiMODis", "BiMODis", "DivMODis")
    )
    assert best_pc5 >= by["Original"].raw["pc5"]
