"""DUST tuple diversification (Algorithm 2, Sec. 5).

Three stages:

1. **Prune** (Sec. 5.1): per-table mean embedding, score every tuple by
   its distance from its table's mean, keep the global top-s. Runs as a
   Spark job (applyInPandas per table + global orderBy/limit).
2. **Cluster** (Sec. 5.2): average-linkage hierarchical clustering of
   the <=s pruned embeddings into k*p clusters; the medoid of each
   cluster is a candidate diverse tuple. Driver-side numpy, exactly as
   the paper runs it (clustering is what pruning makes tractable).
3. **Re-rank** (Sec. 5.3): score each candidate by its minimum distance
   to the query tuples (ties: highest average distance), return top-k.
   Runs as a Spark cross-join + groupBy aggregation.

``dust_diversify_local`` is the same algorithm in pure numpy — used for
the Fig 7 runtime-scaling benchmark, where JVM job overhead would mask
the algorithmic shapes at small n, and as a cross-check of the Spark
path.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType, StructField, StructType

from repro.cluster import agglomerative, medoids
from repro.cluster.distance import cosine_distance_matrix, distance_matrix

from repro.core.union import SRC_COL, UID_COL

EMB_COL = "embedding"
PRUNE_SCORE_COL = "_prune_score"


# ---------------------------------------------------------------------------
# Stage 1: pruning
# ---------------------------------------------------------------------------

def prune_scores_pandas(
    pdf: pd.DataFrame, emb_col: str = EMB_COL, metric: str = "cosine"
) -> np.ndarray:
    """Score(t) = delta(E(t_m), E(t)) against the group's mean embedding."""
    E = np.stack(pdf[emb_col].to_list())
    mean = E.mean(axis=0, keepdims=True)
    if metric == "cosine":
        return cosine_distance_matrix(E, mean)[:, 0]
    return np.linalg.norm(E - mean, axis=1)


def prune_tuples(
    df: DataFrame,
    s: int,
    *,
    emb_col: str = EMB_COL,
    table_col: str = SRC_COL,
    metric: str = "cosine",
) -> DataFrame:
    """Spark pruning job: per-table distance-from-mean score, global
    top-s (ties broken by tuple uid for determinism)."""
    # Fresh StructType: StructType.add mutates the df's schema in place.
    schema = StructType(
        df.schema.fields + [StructField(PRUNE_SCORE_COL, DoubleType())]
    )

    def _score(key: tuple, pdf: pd.DataFrame) -> pd.DataFrame:
        out = pdf.copy()
        out[PRUNE_SCORE_COL] = prune_scores_pandas(pdf, emb_col, metric)
        return out

    scored = df.groupBy(table_col).applyInPandas(_score, schema=schema)
    return scored.orderBy(F.desc(PRUNE_SCORE_COL), F.asc(UID_COL)).limit(s)


# ---------------------------------------------------------------------------
# Stage 2: clustering candidates
# ---------------------------------------------------------------------------

def cluster_medoid_candidates(
    E: np.ndarray, n_clusters: int, metric: str = "cosine"
) -> np.ndarray:
    """Indices of cluster medoids after hierarchical clustering into
    ``min(n_clusters, n)`` clusters (Sec. 5.2; also the CLT baseline)."""
    n = len(E)
    if n == 0:
        return np.zeros(0, dtype=np.int64)
    n_clusters = min(n_clusters, n)
    D = distance_matrix(E, metric)
    dend = agglomerative(D)
    labels = dend.labels(n_clusters)
    return medoids(D, labels)


# ---------------------------------------------------------------------------
# Stage 3: re-ranking
# ---------------------------------------------------------------------------

def rerank_scores_local(
    cand: np.ndarray, query: np.ndarray, metric: str = "cosine"
) -> tuple[np.ndarray, np.ndarray]:
    """(min, avg) distance of each candidate to the query tuples."""
    if metric == "cosine":
        D = cosine_distance_matrix(cand, query)
    else:
        D = distance_matrix(np.vstack([cand, query]), metric)[: len(cand), len(cand):]
    return D.min(axis=1), D.mean(axis=1)


def rerank_topk_local(
    cand: np.ndarray, query: np.ndarray, k: int, metric: str = "cosine"
) -> np.ndarray:
    """Top-k candidate indices by (min desc, avg desc) — Sec. 5.3."""
    mins, avgs = rerank_scores_local(cand, query, metric)
    order = np.lexsort((-avgs, -mins))
    return order[:k]


def rerank_topk_spark(
    cand_df: DataFrame,
    query_emb: np.ndarray,
    k: int,
    *,
    emb_col: str = EMB_COL,
    metric: str = "cosine",
) -> DataFrame:
    """Spark re-rank: mapInPandas computes each candidate's (min, avg)
    distance to the broadcast query embeddings; orderBy + limit k."""
    spark = cand_df.sparkSession
    bc = spark.sparkContext.broadcast(np.asarray(query_emb, dtype=np.float64))
    schema = StructType(
        cand_df.schema.fields
        + [
            StructField("rank_score", DoubleType()),
            StructField("tie_score", DoubleType()),
        ]
    )

    def _score(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        Q = bc.value
        for pdf in batches:
            out = pdf.copy()
            if len(pdf) == 0:
                out["rank_score"] = pd.Series([], dtype=float)
                out["tie_score"] = pd.Series([], dtype=float)
                yield out
                continue
            E = np.stack(pdf[emb_col].to_list())
            mins, avgs = rerank_scores_local(E, Q, metric)
            out["rank_score"] = mins
            out["tie_score"] = avgs
            yield out

    scored = cand_df.mapInPandas(_score, schema=schema)
    return scored.orderBy(
        F.desc("rank_score"), F.desc("tie_score"), F.asc(UID_COL)
    ).limit(k)


# ---------------------------------------------------------------------------
# Algorithm 2, end to end
# ---------------------------------------------------------------------------

def dust_diversify_spark(
    tuples_df: DataFrame,
    query_emb: np.ndarray,
    k: int,
    *,
    p: int = 2,
    s: int = 2500,
    metric: str = "cosine",
) -> DataFrame:
    """DiversifyTuples over a Spark DataFrame of embedded unionable
    tuples (columns: query schema + provenance + ``embedding``)."""
    pruned = prune_tuples(tuples_df, s, metric=metric)
    local = pruned.select(UID_COL, EMB_COL).toPandas()
    if len(local) == 0:
        return pruned.limit(0)
    E = np.stack(local[EMB_COL].to_list())
    med = cluster_medoid_candidates(E, k * p, metric)
    cand_uids = set(local[UID_COL].iloc[med])
    cand_df = pruned.where(F.col(UID_COL).isin(cand_uids))
    return rerank_topk_spark(cand_df, query_emb, k, metric=metric)


def dust_diversify_local(
    T: np.ndarray,
    Q: np.ndarray,
    k: int,
    *,
    p: int = 2,
    s: int = 2500,
    table_ids: np.ndarray | None = None,
    metric: str = "cosine",
) -> np.ndarray:
    """Pure-numpy Algorithm 2; returns selected indices into ``T``.

    ``table_ids`` drives per-table pruning means; without it the whole
    input is treated as one table (used in the Fig 7 synthetic sweep).
    """
    n = len(T)
    if n == 0:
        return np.zeros(0, dtype=np.int64)
    if table_ids is None:
        table_ids = np.zeros(n, dtype=np.int64)
    scores = np.empty(n)
    for tid in np.unique(table_ids):
        m = table_ids == tid
        scores[m] = prune_scores_pandas(
            pd.DataFrame({EMB_COL: list(T[m])}), metric=metric
        )
    keep = np.argsort(-scores, kind="stable")[: min(s, n)]
    med_local = cluster_medoid_candidates(T[keep], k * p, metric)
    cand_idx = keep[med_local]
    top = rerank_topk_local(T[cand_idx], Q, k, metric)
    return cand_idx[top]
