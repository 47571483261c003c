"""Table 3: DUST end-to-end vs table-search techniques.

Per query: k tuples from (a) Starmie adapted to tuple search (every
lake tuple indexed as its own table, top-k by similarity), (b) the
simulated LLM (UGEN-V1 only — the prompt does not fit for SANTOS-sized
query tables, same exclusion as the paper), and (c) DUST's full
pipeline (search -> align -> embed -> diversify). All outputs are
embedded with the DUST encoder for scoring (Sec. 6.5.1) and compared on
Average / Min diversity win counts.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.align import corpus_idf
from repro.core.metrics import average_diversity, min_diversity
from repro.core.pipeline import run_dust
from repro.core.serialize import serialize_table
from repro.embed.models import make_model
from repro.exp.common import (
    K_SANTOS,
    K_UGEN,
    S_PRUNE,
    get_benchmark,
    get_dust_model,
)
from repro.lake.search import starmie_tuple_topk_spark
from repro.sim.llm import LLMTokenLimitError, llm_generate_tuples

METHODS = ("Starmie", "LLM", "DUST")


def run_table3(
    spark: SparkSession,
    cache_dir: str | None = None,
    *,
    benchmarks: dict[str, int] | None = None,
    max_queries: int | None = None,
    top_n_tables: int = 8,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    if benchmarks is None:
        benchmarks = {"santos": K_SANTOS, "ugen_v1": K_UGEN}
    dust_model = get_dust_model("roberta", cache_dir)
    per_query_rows = []
    for bname, k in benchmarks.items():
        bench = get_benchmark(bname, cache_dir)
        # Starmie's contrastive encoder is corpus-aware; its analog gets
        # idf fitted on the benchmark's tables (DESIGN.md §2).
        starmie_model = make_model(
            "starmie", corpus_idf(bench.queries + bench.lake)
        )
        queries = bench.queries[:max_queries] if max_queries else bench.queries
        for q in queries:
            Qe = dust_model.embed_texts(serialize_table(q.df))
            row = {"benchmark": bname, "query": q.name, "k": k}

            # Starmie: per-tuple index, top-k most similar, then score
            # with DUST embeddings of the returned serializations.
            top = starmie_tuple_topk_spark(spark, q, bench.lake, k, starmie_model)
            Ts = dust_model.embed_texts(top["serialized"].tolist())
            row["Starmie_avg"] = average_diversity(Qe, Ts)
            row["Starmie_min"] = min_diversity(Qe, Ts)

            # LLM: generated tuples, serialized over the query schema.
            try:
                gen = llm_generate_tuples(q, k)
                Tl = dust_model.embed_texts(serialize_table(gen))
                row["LLM_avg"] = average_diversity(Qe, Tl)
                row["LLM_min"] = min_diversity(Qe, Tl)
            except LLMTokenLimitError:
                row["LLM_avg"] = None
                row["LLM_min"] = None

            # DUST end-to-end.
            res = run_dust(
                spark,
                bench,
                q.name,
                k,
                dust_model,
                search="starmie",
                top_n=top_n_tables,
                s=S_PRUNE,
            )
            row["DUST_avg"] = average_diversity(Qe, res.selected_embeddings)
            row["DUST_min"] = min_diversity(Qe, res.selected_embeddings)
            per_query_rows.append(row)
    per_query = pd.DataFrame(per_query_rows)

    summary_rows = []
    for bname in benchmarks:
        sub = per_query[per_query["benchmark"] == bname]
        for m in METHODS:
            have = sub[sub[f"{m}_avg"].notna()]
            if have.empty:
                continue

            def wins(metric: str) -> int:
                n = 0
                for _, r in sub.iterrows():
                    vals = {
                        mm: r[f"{mm}_{metric}"]
                        for mm in METHODS
                        if pd.notna(r.get(f"{mm}_{metric}"))
                    }
                    if m in vals and np.isclose(vals[m], max(vals.values())):
                        n += 1
                return n

            summary_rows.append(
                {
                    "benchmark": bname,
                    "method": m,
                    "n_best_average": wins("avg"),
                    "n_best_min": wins("min"),
                    "n_queries": len(sub),
                }
            )
    return pd.DataFrame(summary_rows), per_query
