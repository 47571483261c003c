"""Outer union of aligned tables into unionable tuples (Sec. 3.3).

A Spark DataFrame job: each unionable table is projected onto the query
schema using the column alignment (missing query columns null-padded),
provenance columns are attached, and the projections are unioned by
name. The result is the set of *unionable tuples* that flows into
embedding and diversification.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.align import Alignment

SRC_COL = "_src_table"
UID_COL = "_tuple_uid"


def project_to_query_schema(
    spark: SparkSession,
    table,
    query_headers: list[str],
    alignment: Alignment,
) -> DataFrame:
    """One table → query schema. Each query header takes the value of the
    table column aligned to it (the constraint guarantees at most one
    such column per table) or null."""
    by_query = {
        qcol: col
        for (tname, col), qcol in alignment.mapping.items()
        if tname == table.name
    }
    pdf = table.df.astype(str).copy()
    # Deterministic row uid assigned before the data enters Spark, so the
    # Spark and pandas paths produce identical provenance.
    pdf[UID_COL] = [f"{table.name}#{i}" for i in range(len(pdf))]
    sdf = spark.createDataFrame(pdf)
    cols = []
    for h in query_headers:
        src = by_query.get(h)
        cols.append(F.col(src).cast("string").alias(h) if src else F.lit(None).cast("string").alias(h))
    cols.append(F.lit(table.name).alias(SRC_COL))
    cols.append(F.col(UID_COL))
    return sdf.select(cols)


def outer_union(
    spark: SparkSession,
    query,
    tables,
    alignment: Alignment,
) -> DataFrame:
    """Union every aligned table under the query's schema, with
    provenance (``_src_table``, ``_tuple_uid``)."""
    query_headers = list(query.df.columns)
    out: DataFrame | None = None
    for t in tables:
        part = project_to_query_schema(spark, t, query_headers, alignment)
        out = part if out is None else out.unionByName(part)
    if out is None:
        raise ValueError("no tables to union")
    return out


def unionable_tuples_pandas(
    query, tables, alignment: Alignment
) -> pd.DataFrame:
    """Driver-side equivalent of :func:`outer_union` (used by tests to
    cross-check the Spark job, and by small-benchmark paths)."""
    query_headers = list(query.df.columns)
    frames = []
    for t in tables:
        by_query = {
            qcol: col
            for (tname, col), qcol in alignment.mapping.items()
            if tname == t.name
        }
        data = {}
        for h in query_headers:
            src = by_query.get(h)
            data[h] = t.df[src].astype(str).tolist() if src else [None] * len(t.df)
        pdf = pd.DataFrame(data)
        pdf[SRC_COL] = t.name
        pdf[UID_COL] = [f"{t.name}#{i}" for i in range(len(t.df))]
        frames.append(pdf)
    return pd.concat(frames, ignore_index=True)
