"""Fig 8 (data): IMDB case study — novel values added per query column.

Methods (Sec. 6.6): D3L and Starmie (bag-union top tables by rank, SQL
LIMIT k), their duplicate-free variants D3L-D / Starmie-D (set union of
top tables, then LIMIT k), and DUST. For each k we count, per query
column, how many values the selected tuples add that the query table
does not already contain.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.align import corpus_idf, holistic_alignment
from repro.core.pipeline import run_dust
from repro.core.union import unionable_tuples_pandas
from repro.exp.common import get_benchmark, get_dust_model
from repro.lake.search import d3l_table_scores, starmie_table_scores, top_n_tables


def novel_value_counts(query_df: pd.DataFrame, selected: pd.DataFrame) -> dict[str, int]:
    """Per query column: count of distinct values in ``selected`` that
    the query table does not contain (null-ish values excluded)."""
    out = {}
    for c in query_df.columns:
        have = set(query_df[c].astype(str))
        if c not in selected.columns:
            out[c] = 0
            continue
        vals = {
            str(v)
            for v in selected[c].tolist()
            if v is not None and str(v) not in ("None", "nan", "")
        }
        out[c] = len(vals - have)
    return out


def _baseline_selection(
    bench, query, ranked_tables: list[str], k: int, *, dedupe: bool
) -> pd.DataFrame:
    """Bag-union (or set-union, for the -D variants) the top tables by
    rank until >= k tuples, then SQL-LIMIT-k (take the first k).

    The -D variants take the *set* union of the top tables (duplicated
    tuples across/within tables excluded, Sec. 6.6) — they still carry
    tuples that duplicate *query* rows, which is exactly the residual
    redundancy the case study measures DUST against."""
    query_cols = list(query.df.columns)
    frames: list[pd.DataFrame] = []
    total = 0
    seen: set[tuple] = set()
    for name in ranked_tables:
        t = bench.table(name)
        alignment = holistic_alignment(query, [t])
        part = unionable_tuples_pandas(query, [t], alignment)
        if dedupe:
            keys = part[query_cols].astype(str).apply(tuple, axis=1)
            part = part[~keys.isin(seen)]
            seen.update(keys)
        frames.append(part)
        total += len(part)
        if total >= k:
            break
    if not frames:
        return pd.DataFrame(columns=query_cols)
    union = pd.concat(frames, ignore_index=True)
    if dedupe:
        union = union.drop_duplicates(subset=query_cols, keep="first")
    return union.head(k)


def run_fig8(
    spark: SparkSession,
    cache_dir: str | None = None,
    *,
    k_values=(20, 40, 60, 80, 100),
    top_n_tables_searched: int = 10,
) -> pd.DataFrame:
    bench = get_benchmark("imdb", cache_dir)
    query = bench.queries[0]
    model = get_dust_model("roberta", cache_dir)
    idf = corpus_idf([query] + bench.lake)
    starmie_rank = top_n_tables(
        starmie_table_scores(query, bench.lake, idf), top_n_tables_searched
    )
    d3l_rank = top_n_tables(
        d3l_table_scores(query, bench.lake, idf), top_n_tables_searched
    )
    rows = []
    for k in k_values:
        selections = {
            "D3L": _baseline_selection(bench, query, d3l_rank, k, dedupe=False),
            "D3L-D": _baseline_selection(bench, query, d3l_rank, k, dedupe=True),
            "Starmie": _baseline_selection(bench, query, starmie_rank, k, dedupe=False),
            "Starmie-D": _baseline_selection(bench, query, starmie_rank, k, dedupe=True),
        }
        res = run_dust(
            spark, bench, query.name, k, model, search="starmie",
            top_n=top_n_tables_searched, s=2500,
        )
        selections["DUST"] = res.selected
        for method, sel in selections.items():
            counts = novel_value_counts(query.df, sel)
            for col, n_novel in counts.items():
                rows.append(
                    {"k": k, "method": method, "column": col, "novel_values": n_novel}
                )
    return pd.DataFrame(rows)
