"""Table union search baselines over the Parquet lake.

- ``starmie_table_scores``: Starmie-style search — column-level
  embeddings with table context, maximum-weight bipartite matching
  between query and candidate columns, score = matched similarity mass.
- ``d3l_table_scores``: D3L-style — aggregates a value-overlap signal
  (Jaccard of cell sets per matched column pair) with the embedding
  signal.
- ``starmie_tuple_topk_spark``: the Table 3 adaptation — every lake
  tuple is indexed as its own single-tuple table and the top-k most
  *similar* tuples are returned; similarity-driven search is exactly
  what drags near-duplicates of the query to the top.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.cluster import max_weight_matching
from repro.cluster.distance import cosine_distance_matrix, l2_normalize
from repro.core.serialize import serialize_table
from repro.core.union import SRC_COL, UID_COL
from repro.embed.models import make_model
from repro.embed.spark_embed import embed_dataframe
from repro.lake.benchmark import Benchmark, LakeTable
from repro.tokenize import IdfWeights


def _column_embeddings(table: LakeTable, model, idf, table_context: float):
    cols = list(table.df.columns)
    E = model.embed_table_columns(
        [[str(v) for v in table.df[c].tolist()] for c in cols],
        idf,
        table_context=table_context,
    )
    return cols, E


def starmie_table_scores(
    query: LakeTable,
    lake: list[LakeTable],
    idf: IdfWeights,
    *,
    table_context: float = 0.5,
) -> list[tuple[str, float]]:
    """Score every lake table by bipartite-matched column similarity,
    highest first."""
    model = make_model("starmie", idf)
    q_cols, Eq = _column_embeddings(query, model, idf, table_context)
    out = []
    for t in lake:
        t_cols, Et = _column_embeddings(t, model, idf, table_context)
        sim = 1.0 - cosine_distance_matrix(Eq, Et)
        matching = max_weight_matching(sim)
        score = sum(sim[qi, ti] for qi, ti in matching) / max(len(q_cols), len(t_cols))
        out.append((t.name, float(score)))
    return sorted(out, key=lambda x: (-x[1], x[0]))


def _value_overlap(a: pd.Series, b: pd.Series) -> float:
    sa, sb = set(a.astype(str)), set(b.astype(str))
    if not sa or not sb:
        return 0.0
    return len(sa & sb) / len(sa | sb)


def d3l_table_scores(
    query: LakeTable,
    lake: list[LakeTable],
    idf: IdfWeights,
) -> list[tuple[str, float]]:
    """D3L-style aggregated signals: per best-matching column pair, the
    mean of value-overlap Jaccard and embedding cosine similarity."""
    model = make_model("roberta", idf)
    q_cols, Eq = _column_embeddings(query, model, idf, 0.0)
    out = []
    for t in lake:
        t_cols, Et = _column_embeddings(t, model, idf, 0.0)
        sim = 1.0 - cosine_distance_matrix(Eq, Et)
        matching = max_weight_matching(sim)
        if not matching:
            out.append((t.name, 0.0))
            continue
        signals = []
        for qi, ti in matching:
            ov = _value_overlap(query.df[q_cols[qi]], t.df[t_cols[ti]])
            signals.append(0.5 * ov + 0.5 * float(sim[qi, ti]))
        out.append((t.name, float(np.mean(signals) * len(matching) / max(len(q_cols), len(t_cols)))))
    return sorted(out, key=lambda x: (-x[1], x[0]))


def top_n_tables(scores: list[tuple[str, float]], n: int) -> list[str]:
    return [name for name, _ in scores[:n]]


def lake_tuples_df(
    spark: SparkSession, tables: list[LakeTable]
) -> DataFrame:
    """All lake tuples serialized with their own headers, with
    provenance — the per-tuple 'index' the Table 3 Starmie variant
    searches over."""
    frames = []
    for t in tables:
        ser = serialize_table(t.df)
        frames.append(
            pd.DataFrame(
                {
                    SRC_COL: t.name,
                    UID_COL: [f"{t.name}#{i}" for i in range(len(ser))],
                    "serialized": ser,
                }
            )
        )
    return spark.createDataFrame(pd.concat(frames, ignore_index=True))


def starmie_tuple_topk_spark(
    spark: SparkSession,
    query: LakeTable,
    tables: list[LakeTable],
    k: int,
    model,
) -> pd.DataFrame:
    """Top-k lake tuples by embedding similarity to the query table's
    centroid (each tuple indexed as its own table). Returns a pandas
    frame with provenance, similarity, and the embedding."""
    tuples_df = lake_tuples_df(spark, tables)
    embedded = embed_dataframe(tuples_df, "serialized", model)
    q_emb = model.embed_texts(serialize_table(query.df))
    centroid = l2_normalize(q_emb.mean(axis=0, keepdims=True))[0]
    bc = spark.sparkContext.broadcast(centroid)

    @F.pandas_udf("double")
    def _sim(emb: pd.Series) -> pd.Series:
        E = l2_normalize(np.stack(emb.to_list()))
        return pd.Series(E @ bc.value)

    scored = embedded.withColumn("similarity", _sim(F.col("embedding")))
    top = (
        scored.orderBy(F.desc("similarity"), F.asc(UID_COL))
        .limit(k)
        .toPandas()
    )
    return top
