"""Distributed embedding: a mapInPandas stage over tuple DataFrames.

The model (zoo model or fine-tuned DUST encoder) is broadcast to the
executors; each Arrow batch is embedded vectorized in numpy. The output
column is ``array<double>`` so downstream Spark stages (pruning window,
re-rank aggregation) can keep working in the DataFrame API.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import ArrayType, DoubleType, StructField, StructType


def embed_dataframe(
    df: DataFrame,
    text_col: str,
    model,
    out_col: str = "embedding",
) -> DataFrame:
    """Append ``out_col: array<double>`` = model.embed_texts(df[text_col]).

    ``model`` is any object with ``embed_texts(list[str]) -> np.ndarray``
    (zoo models and :class:`FineTunedModel` both qualify).
    """
    spark = df.sparkSession
    bc = spark.sparkContext.broadcast(model)
    schema = StructType(
        df.schema.fields + [StructField(out_col, ArrayType(DoubleType()), False)]
    )

    def _embed(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        m = bc.value
        for pdf in batches:
            if len(pdf) == 0:
                yield pdf.assign(**{out_col: pd.Series([], dtype=object)})
                continue
            E = m.embed_texts(pdf[text_col].astype(str).tolist())
            out = pdf.copy()
            out[out_col] = list(E.astype(float))
            yield out

    return df.mapInPandas(_embed, schema=schema)
