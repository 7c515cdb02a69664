"""Starmie-lite: joinable-table search by column-content similarity.

Starmie [12] learns contextualized column embeddings with contrastive
learning to find unionable/joinable tables. Offline we replace the
embedding with the signal the embedding approximates: column value
containment (Jaccard over distinct values). Source tables whose best
column-containment against the base table exceeds a threshold are
joined in — like Starmie, this is model-oblivious, so it tends to pull
in every joinable table (more columns, higher training cost, modest
accuracy change), which is exactly the trade-off the paper's Tables 4/6
show for it.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame

from repro.lake.tasks import Lake
from repro.tasks import TabularTask


def _containment(a: pd.Series, b: pd.Series, sample: int = 2000) -> float:
    av = set(a.dropna().head(sample).tolist())
    bv = set(b.dropna().head(sample).tolist())
    if not av or not bv:
        return 0.0
    return len(av & bv) / min(len(av), len(bv))


def starmie(
    lake: Lake,
    task: TabularTask,
    *,
    threshold: float = 0.5,
) -> pd.DataFrame:
    """Join every source whose best column containment ≥ threshold."""
    base_pdf = lake.base.toPandas()
    current: DataFrame = lake.base
    for _name, src in lake.sources.items():
        src_pdf = src.toPandas()
        sim = max(
            (
                _containment(base_pdf[bc], src_pdf[sc])
                for bc in base_pdf.columns
                for sc in src_pdf.columns
            ),
            default=0.0,
        )
        if sim >= threshold:
            current = current.join(src, on=lake.key, how="left_outer")
    return current.toPandas()
