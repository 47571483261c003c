"""Parquet persistence for benchmark lakes.

The lake lives on disk exactly as a data lake would: one Parquet
directory per table plus a JSON catalog carrying the generation ground
truth (base table, column map, unionability). Writes use pyarrow
directly (hundreds of tiny tables — a Spark write per table would be all
overhead); reads go through ``spark.read.parquet`` so downstream stages
are ordinary DataFrame jobs.
"""
from __future__ import annotations

import json
import os

import pandas as pd
import pyarrow as pa
import pyarrow.parquet as pq
from pyspark.sql import DataFrame, SparkSession

from repro.lake.benchmark import Benchmark, LakeTable

_CATALOG = "catalog.json"


def _table_dir(root: str, name: str) -> str:
    return os.path.join(root, "tables", name)


def write_lake(bench: Benchmark, root: str) -> None:
    """Persist every query and lake table of a benchmark under ``root``."""
    os.makedirs(os.path.join(root, "tables"), exist_ok=True)
    entries = []
    for role, tables in (("query", bench.queries), ("lake", bench.lake)):
        for t in tables:
            d = _table_dir(root, t.name)
            os.makedirs(d, exist_ok=True)
            pq.write_table(
                pa.Table.from_pandas(t.df.astype(str), preserve_index=False),
                os.path.join(d, "part-0.parquet"),
            )
            entries.append(
                {
                    "name": t.name,
                    "role": role,
                    "base_id": t.base_id,
                    "col_map": t.col_map,
                    "row_ids": t.row_ids,
                }
            )
    with open(os.path.join(root, _CATALOG), "w") as f:
        json.dump(
            {
                "benchmark": bench.name,
                "unionable": bench.unionable,
                "tables": entries,
            },
            f,
        )


def read_catalog(root: str) -> dict:
    with open(os.path.join(root, _CATALOG)) as f:
        return json.load(f)


def read_table_spark(spark: SparkSession, root: str, name: str) -> DataFrame:
    return spark.read.parquet(_table_dir(root, name))


def read_table_pandas(root: str, name: str) -> pd.DataFrame:
    return pq.read_table(_table_dir(root, name)).to_pandas()


def load_benchmark(root: str) -> Benchmark:
    """Round-trip a persisted lake back into a :class:`Benchmark`."""
    cat = read_catalog(root)
    queries, lake = [], []
    for e in cat["tables"]:
        t = LakeTable(
            e["name"],
            read_table_pandas(root, e["name"]),
            e["base_id"],
            {k: int(v) for k, v in e["col_map"].items()},
            [int(r) for r in e["row_ids"]],
        )
        (queries if e["role"] == "query" else lake).append(t)
    return Benchmark(cat["benchmark"], queries, lake, cat["unionable"])
