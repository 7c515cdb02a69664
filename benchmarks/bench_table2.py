"""Benchmark + reproduction of Table 2 (lake characteristics)."""
from repro.experiments.table2 import run_table2

PAPER = {
    "Kaggle": (1943, 33573, 7_317_000),
    "OpenData": (2457, 71416, 33_296_000),
    "HF": (255, 1395, 10_207_000),
}


def test_table2(benchmark, spark):
    out = benchmark.pedantic(
        lambda: run_table2(spark, scale=1.0), rounds=1, iterations=1
    )
    print("\n=== Table 2: lake characteristics (#tables, #cols, #rows) ===")
    print(f"paper: {PAPER}")
    for name, triple in out.items():
        print(f"ours : {name} -> {triple}")
    assert all(r > 0 for _, _, r in out.values())
