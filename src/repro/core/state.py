"""FST states and their materialization (paper §3).

A state s = (D_s, R_s, adom_s) is uniquely encoded by its bitmap over
the :class:`~repro.core.literals.UnitLayout` (paper §5.1 auxiliary
structure). Materializing a state is a select (schema bits) plus a
filter (value-cluster bits) over the universal table:

- :func:`materialize_spark` — the canonical Spark DataFrame path:
  ``D_U.select(...).filter(...)`` over a cluster-annotated D_U;
- :func:`materialize_pandas` — the search-time fast path over the
  collected D_U; tests assert row-level equivalence of the two and of
  the DuckDB SQL translation (the operators are SPJ-expressible, §3).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.literals import Bits, UnitLayout

CLUSTER_PREFIX = "__cl_"


def annotate_clusters_spark(
    spark: SparkSession, universal_pdf: pd.DataFrame, layout: UnitLayout
) -> DataFrame:
    """D_U with one ``__cl_<attr>`` label column per clustered attribute.

    Cluster labels come from the layout's (deterministic) k-means
    assignment; attaching them as columns makes every literal an
    equality predicate, so Reduct/Augment become plain Catalyst
    ``filter``/``select`` operations downstream.
    """
    pdf = universal_pdf.copy()
    for a in layout.attrs:
        if layout.val_units[a]:
            lab = layout.row_clusters[a].astype("float64")
            lab[lab < 0] = np.nan  # null value -> null cluster
            pdf[CLUSTER_PREFIX + a] = lab
    return spark.createDataFrame(pdf)


def cluster_filter_condition(layout: UnitLayout, bits: Bits):
    """Spark Column predicate implementing the bitmap's row retention."""
    cond = F.lit(True)
    for a in layout.attrs:
        if bits[layout.col_unit[a]] == 0 or not layout.val_units[a]:
            continue
        active = [j for j, u in enumerate(layout.val_units[a]) if bits[u] == 1]
        if len(active) == len(layout.val_units[a]):
            continue
        c = F.col(CLUSTER_PREFIX + a)
        cond = cond & (c.isNull() | c.isin([float(j) for j in active]))
    return cond


def materialize_spark(
    annotated: DataFrame, layout: UnitLayout, bits: Bits, *, keep: list[str]
) -> DataFrame:
    """Select retained columns and filter retained clusters (Spark)."""
    cols = keep + layout.active_columns(bits)
    return annotated.filter(cluster_filter_condition(layout, bits)).select(*cols)


def materialize_pandas(
    universal_pdf: pd.DataFrame, layout: UnitLayout, bits: Bits, *, keep: list[str]
) -> pd.DataFrame:
    """Equivalent pandas fast path used inside the search loop."""
    mask = layout.row_mask(bits)
    cols = keep + layout.active_columns(bits)
    return universal_pdf.loc[mask, cols]


def cluster_sql_condition(layout: UnitLayout, bits: Bits) -> str:
    """The same retention predicate as SQL (for the DuckDB oracle)."""
    clauses = []
    for a in layout.attrs:
        if bits[layout.col_unit[a]] == 0 or not layout.val_units[a]:
            continue
        active = [j for j, u in enumerate(layout.val_units[a]) if bits[u] == 1]
        if len(active) == len(layout.val_units[a]):
            continue
        col = f'"{CLUSTER_PREFIX + a}"'
        vals = ", ".join(str(float(j)) for j in active) or "NULL"
        clauses.append(f"({col} IS NULL OR {col} IN ({vals}))")
    return " AND ".join(clauses) if clauses else "TRUE"
