"""Exp-3 scalability sweep (Fig. 10c/d shape): discovery time while
growing the search space via |adom| (k-means literal count on a
continuous attribute, the paper's range-query knob) and via |A|
(attribute count, by comparing lakes with fewer/more sources).
"""
import pytest

from repro.core.apx import apx_modis
from repro.core.bi import bi_modis
from repro.core.runner import SearchContext
from repro.lake.tasks import house_lake, movie_lake


def test_scalability_vary_adom(benchmark, spark):
    lake, task, measures = house_lake(spark, scale=0.5)

    def sweep():
        out = {}
        for k in (3, 6, 12):
            ctx = SearchContext.build(
                spark,
                lake,
                task,
                measures,
                max_k=k,
                force_cluster=("b_info0",),
                n_seed=6,
                seed=0,
            )
            out[k] = {
                "units": ctx.layout.n_units,
                "ApxMODis": apx_modis(ctx, N=250, eps=0.2, max_level=5).wall_time,
                "BiMODis": bi_modis(ctx, N=250, eps=0.2, max_level=5).wall_time,
            }
        return out

    out = benchmark.pedantic(sweep, rounds=1, iterations=1)
    print("\n=== Scalability vs |adom| (T2, seconds) ===")
    print("paper (Fig 10d shape): time grows with |adom|; BiMODis scales best")
    for k, row in out.items():
        print(
            f"|adom(b_info0)|={k} (units={row['units']}): "
            f"ApxMODis={row['ApxMODis']:.2f} BiMODis={row['BiMODis']:.2f}"
        )
    assert out[12]["units"] > out[3]["units"]


def test_scalability_vary_attrs(benchmark, spark):
    def sweep():
        out = {}
        for name, lake_fn in (("T1(11 cols)", movie_lake), ("T2(17 cols)", house_lake)):
            lake, task, measures = lake_fn(spark, scale=0.5)
            ctx = SearchContext.build(
                spark, lake, task, measures, max_k=8, n_seed=6, seed=0
            )
            out[name] = {
                "units": ctx.layout.n_units,
                "BiMODis": bi_modis(ctx, N=250, eps=0.2, max_level=5).wall_time,
            }
        return out

    out = benchmark.pedantic(sweep, rounds=1, iterations=1)
    print("\n=== Scalability vs |A| (seconds) ===")
    for name, row in out.items():
        print(f"{name}: units={row['units']} BiMODis={row['BiMODis']:.2f}")
    ks = list(out)
    assert out[ks[1]]["units"] >= out[ks[0]]["units"]
