"""Universal table construction (paper §5.1).

"The start state is initialized with a 'universal' dataset D_U, which
carries the universal schema R_U, and is populated by joining all the
tables (with outer join to preserve all the values besides common
attributes, by default)."

This is a genuine Spark multi-way outer join over the lake's key — the
distributed-dataflow piece of the reproduction. The companion
``collect_universal`` brings D_U to the driver once, for literal
derivation and the search-time pandas fast path (property-tested
equivalent to the Spark materializer in tests/test_state.py).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame

from repro.lake.tasks import Lake


def build_universal(lake: Lake) -> DataFrame:
    """Multi-way full outer join of all lake tables on the lake key.

    Lakes with heterogeneous join keys (T5) supply their own pre-joined
    ``lake.universal`` view, built with Spark joins in the lake factory.
    """
    if lake.universal is not None:
        return lake.universal
    df = lake.base
    for src in lake.sources.values():
        df = df.join(src, on=lake.key, how="full_outer")
    return df


def collect_universal(lake: Lake) -> pd.DataFrame:
    """D_U as pandas, sorted by key for deterministic downstream use."""
    pdf = build_universal(lake).toPandas()
    return pdf.sort_values(lake.key).reset_index(drop=True)
