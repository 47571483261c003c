"""Algorithm 1 — the end-to-end DUST pipeline as a Spark dataflow.

SearchTables -> AlignColumns -> outer-union -> EmbedTuples ->
DiversifyTuples. Each stage is a DataFrame transformation; the tuple
encoder is broadcast and applied with mapInPandas.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.types import StringType, StructField, StructType

from repro.core.align import Alignment, corpus_idf, holistic_alignment
from repro.core.diversify import EMB_COL, dust_diversify_spark
from repro.core.serialize import serialize_row, serialize_table
from repro.core.union import outer_union
from repro.embed.spark_embed import embed_dataframe
from repro.lake.benchmark import Benchmark, LakeTable
from repro.lake.search import starmie_table_scores, top_n_tables


@dataclass
class DustResult:
    selected: pd.DataFrame  # k rows: query schema + provenance + scores
    selected_embeddings: np.ndarray
    query_embeddings: np.ndarray
    alignment: Alignment
    searched_tables: list[str]


def serialize_tuples_df(df: DataFrame, headers: list[str], out_col: str = "serialized") -> DataFrame:
    """Append the Sec. 4 serialization of each row over ``headers``."""
    # Build a fresh StructType — StructType.add mutates in place, which
    # would corrupt the input DataFrame's cached schema.
    schema = StructType(df.schema.fields + [StructField(out_col, StringType())])

    def _ser(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            out = pdf.copy()
            out[out_col] = [
                serialize_row(row, headers) for _, row in pdf.iterrows()
            ]
            yield out

    return df.mapInPandas(_ser, schema=schema)


def run_dust(
    spark: SparkSession,
    bench: Benchmark,
    query_name: str,
    k: int,
    tuple_model,
    *,
    search: str = "starmie",
    top_n: int = 10,
    p: int = 2,
    s: int = 2500,
    align_model: str = "roberta",
) -> DustResult:
    """Full DUST for one query table of a benchmark.

    ``search``: 'starmie' runs the union-search baseline to discover
    tables; 'ground_truth' uses the benchmark's labeled unionable set
    (how the paper isolates diversification quality from search quality).
    """
    query = bench.table(query_name)
    if search == "ground_truth":
        names = bench.unionable[query_name][:top_n]
    elif search == "starmie":
        idf = corpus_idf([query] + bench.lake)
        scores = starmie_table_scores(query, bench.lake, idf)
        names = top_n_tables(scores, top_n)
    else:
        raise ValueError(f"unknown search {search!r}")
    tables = [bench.table(n) for n in names]

    alignment = holistic_alignment(query, tables, model_name=align_model)
    unioned = outer_union(spark, query, tables, alignment)
    headers = list(query.df.columns)
    serialized = serialize_tuples_df(unioned, headers)
    embedded = embed_dataframe(serialized, "serialized", tuple_model, out_col=EMB_COL)

    q_emb = tuple_model.embed_texts(serialize_table(query.df))
    top = dust_diversify_spark(embedded, q_emb, k, p=p, s=s).toPandas()
    sel_emb = (
        np.stack(top[EMB_COL].to_list()) if len(top) else np.zeros((0, q_emb.shape[1]))
    )
    return DustResult(top, sel_emb, q_emb, alignment, names)
