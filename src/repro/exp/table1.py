"""Table 1: column-alignment effectiveness (P/R/F1).

10 method variants x 3 benchmarks: cell-level {FastText, Glove, BERT,
RoBERTa, sBERT}, column-level {BERT, RoBERTa, sBERT}, and table-context
Starmie (B) bipartite / Starmie (H) holistic. Scores are averaged over
queries; each query aligns its ground-truth unionable tables plus a few
non-unionable distractors (the search step precedes alignment in the
pipeline, but search is not under test here).
"""
from __future__ import annotations

import pandas as pd

from repro.core.align import (
    alignment_ground_truth,
    bipartite_alignment,
    corpus_idf,
    holistic_alignment,
)
from repro.core.metrics import alignment_prf
from repro.exp.common import get_benchmark

METHODS: list[tuple[str, dict]] = [
    ("cell/fasttext", {"model_name": "fasttext", "level": "cell"}),
    ("cell/glove", {"model_name": "glove", "level": "cell"}),
    ("cell/bert", {"model_name": "bert", "level": "cell"}),
    ("cell/roberta", {"model_name": "roberta", "level": "cell"}),
    ("cell/sbert", {"model_name": "sbert", "level": "cell"}),
    ("column/bert", {"model_name": "bert", "level": "column"}),
    ("column/roberta", {"model_name": "roberta", "level": "column"}),
    ("column/sbert", {"model_name": "sbert", "level": "column"}),
    ("starmie_b", "bipartite"),
    ("starmie_h", {"model_name": "starmie", "level": "column", "table_context": 0.5}),
]

BENCHMARKS = ("tus_sampled", "santos", "ugen_v1")


def _tables_for_query(bench, query, n_unionable: int = 5, n_distractor: int = 2):
    unionable = bench.unionable_tables(query.name)[:n_unionable]
    distractors = [t for t in bench.lake if t.base_id != query.base_id][:n_distractor]
    return unionable + distractors


def run_table1(
    cache_dir: str | None = None,
    *,
    benchmarks=BENCHMARKS,
    max_queries: int | None = None,
) -> pd.DataFrame:
    rows = []
    for bname in benchmarks:
        bench = get_benchmark(bname, cache_dir)
        queries = bench.queries[:max_queries] if max_queries else bench.queries
        for method_name, cfg in METHODS:
            ps, rs, f1s = [], [], []
            for q in queries:
                tables = _tables_for_query(bench, q)
                idf = corpus_idf([q] + tables)
                if cfg == "bipartite":
                    al = bipartite_alignment(q, tables, idf=idf)
                else:
                    al = holistic_alignment(q, tables, idf=idf, **cfg)
                gt, _ = alignment_ground_truth(q, tables)
                m = alignment_prf(gt, al.aligned_pairs(q.name))
                ps.append(m["precision"])
                rs.append(m["recall"])
                f1s.append(m["f1"])
            rows.append(
                {
                    "benchmark": bname,
                    "method": method_name,
                    "P": sum(ps) / len(ps),
                    "R": sum(rs) / len(rs),
                    "F1": sum(f1s) / len(f1s),
                }
            )
    return pd.DataFrame(rows)
