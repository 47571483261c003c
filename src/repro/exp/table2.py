"""Table 2: tuple-diversification effectiveness and efficiency.

For every query of SANTOS-lite (k=100) and UGEN-V1-lite (k=30): embed
the unionable tuples (ground-truth unionable tables -> holistic
alignment -> DUST encoder), apply the shared pruning step (Sec. A.2.3:
pruning is applied for all baselines), then run GMC, GNE (UGEN only —
it does not scale), CLT and DUST on the same candidate set. Report the
number of queries each method wins on Average / Min diversity (ties
credited to all) and the mean per-query diversification time.

All methods run driver-side numpy so the timing comparison is purely
algorithmic, as in the paper (their single server); DUST's distributed
path is exercised by the pipeline/Table 3 experiments and the tests.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.align import holistic_alignment
from repro.core.baselines import clt_select, gmc_select, gne_select, random_select
from repro.core.diversify import (
    cluster_medoid_candidates,
    prune_scores_pandas,
    rerank_topk_local,
)
from repro.core.metrics import average_diversity, min_diversity
from repro.core.serialize import serialize_table
from repro.core.union import unionable_tuples_pandas
from repro.exp.common import (
    K_SANTOS,
    K_UGEN,
    P_CANDIDATES,
    S_PRUNE,
    get_benchmark,
    get_dust_model,
    timer,
)

EMB = "embedding"


def embedded_query_tuples(bench, query_name: str, model, *, max_tables: int | None = None):
    """(query embeddings, lake-tuple embeddings, table ids) for a query:
    the input DUST's diversification stage sees."""
    query = bench.table(query_name)
    tables = bench.unionable_tables(query_name)
    if max_tables:
        tables = tables[:max_tables]
    alignment = holistic_alignment(query, tables)
    tuples = unionable_tuples_pandas(query, tables, alignment)
    headers = list(query.df.columns)
    from repro.core.serialize import serialize_row

    texts = [serialize_row(row, headers) for _, row in tuples.iterrows()]
    T = model.embed_texts(texts)
    Q = model.embed_texts(serialize_table(query.df))
    table_ids = pd.factorize(tuples["_src_table"])[0]
    return Q, T, np.asarray(table_ids), tuples


def prune_shared(T: np.ndarray, table_ids: np.ndarray, s: int) -> np.ndarray:
    """The shared pruning step: per-table distance-from-mean ranking,
    global top-s. Returns kept indices."""
    scores = np.empty(len(T))
    for tid in np.unique(table_ids):
        m = table_ids == tid
        scores[m] = prune_scores_pandas(pd.DataFrame({EMB: list(T[m])}))
    return np.argsort(-scores, kind="stable")[: min(s, len(T))]


def dust_select(T: np.ndarray, Q: np.ndarray, k: int, *, p: int = P_CANDIDATES) -> np.ndarray:
    """DUST post-pruning: cluster into k*p, medoids, query-aware rerank."""
    med = cluster_medoid_candidates(T, min(k * p, len(T)))
    top = rerank_topk_local(T[med], Q, k)
    return med[top]


def run_table2(
    cache_dir: str | None = None,
    *,
    benchmarks: dict[str, int] | None = None,
    s: int = S_PRUNE,
    max_queries: int | None = None,
    gne_max_s: int = 400,
    include_random: bool = True,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Returns (summary, per_query). Summary = the Table 2 rows."""
    if benchmarks is None:
        benchmarks = {"santos": K_SANTOS, "ugen_v1": K_UGEN}
    model = get_dust_model("roberta", cache_dir)
    per_query_rows = []
    for bname, k in benchmarks.items():
        bench = get_benchmark(bname, cache_dir)
        queries = bench.queries[:max_queries] if max_queries else bench.queries
        for q in queries:
            Q, T_all, tids, _ = embedded_query_tuples(bench, q.name, model)
            keep = prune_shared(T_all, tids, s)
            T = T_all[keep]
            methods: dict[str, callable] = {
                "GMC": lambda: gmc_select(T, Q, k),
                "CLT": lambda: clt_select(T, Q, k),
                "DUST": lambda: dust_select(T, Q, k),
            }
            if len(T) <= gne_max_s:
                methods["GNE"] = lambda: gne_select(T, Q, k)
            row = {"benchmark": bname, "query": q.name, "n_tuples": len(T), "k": k}
            for m, fn in methods.items():
                with timer() as t:
                    idx = fn()
                elapsed = t()
                sel = T[np.asarray(idx)]
                row[f"{m}_avg"] = average_diversity(Q, sel)
                row[f"{m}_min"] = min_diversity(Q, sel)
                row[f"{m}_time"] = elapsed
            if include_random:
                # The paper's random baseline: 5 seeds, best set kept
                # *per metric* (Sec. 6.4.3).
                with timer() as t:
                    sets = [T[random_select(T, Q, k, seed=sd)] for sd in range(5)]
                row["RANDOM_time"] = t() / 5
                row["RANDOM_avg"] = max(average_diversity(Q, S) for S in sets)
                row["RANDOM_min"] = max(min_diversity(Q, S) for S in sets)
            per_query_rows.append(row)
    per_query = pd.DataFrame(per_query_rows)

    summary_rows = []
    method_names = ["GMC", "GNE", "CLT", "DUST"] + (["RANDOM"] if include_random else [])
    for bname in benchmarks:
        sub = per_query[per_query["benchmark"] == bname]
        for m in method_names:
            if f"{m}_avg" not in sub.columns:
                continue
            have = sub[sub[f"{m}_avg"].notna()]
            if have.empty:
                continue
            avail = [
                mm for mm in method_names if f"{mm}_avg" in sub.columns
            ]

            def wins(metric: str) -> int:
                n = 0
                for _, r in sub.iterrows():
                    vals = {
                        mm: r[f"{mm}_{metric}"]
                        for mm in avail
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
                    "mean_time_s": float(have[f"{m}_time"].mean()),
                    "n_queries": len(sub),
                }
            )
    return pd.DataFrame(summary_rows), per_query
