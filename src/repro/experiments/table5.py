"""Table 5: MODis methods on T5 (bipartite link regression).

The paper compares Original vs the four MODis algorithms on ranking
measures P@5/10, R@5/10, NDCG@5/10, selecting the skyline member with
the best p_Pc5. No external baselines appear in this table.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.core.runner import SearchContext
from repro.experiments.common import MethodRow, run_modis
from repro.lake.graph import graph_lake


def run_table5(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    search_kw: dict | None = None,
    n_seed: int = 10,
    seed: int = 0,
) -> list[MethodRow]:
    lake, task, measures = graph_lake(spark, scale=scale)
    ctx = SearchContext.build(
        spark, lake, task, measures, max_k=12, n_seed=n_seed, seed=seed
    )
    skw = {"N": 200, "eps": 0.1, "max_level": 6, **(search_kw or {})}
    rows: list[MethodRow] = []
    pv = ctx.true_eval(ctx.layout.full_bits())
    out = ctx.materialize(ctx.layout.full_bits())
    rows.append(
        MethodRow("Original", dict(pv.raw), len(out), len(out.columns), 0.0)
    )
    for m in ("ApxMODis", "NOBiMODis", "BiMODis", "DivMODis"):
        rows.append(
            run_modis(ctx, m, select_key="pc5", maximize=True, search_kw=skw)
        )
    return rows


T5_MEASURES = [
    ("p_Pc5", "pc5"),
    ("p_Pc10", "pc10"),
    ("p_Rc5", "rc5"),
    ("p_Rc10", "rc10"),
    ("p_Nc5", "nc5"),
    ("p_Nc10", "nc10"),
]
