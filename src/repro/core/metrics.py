"""Evaluation metrics: diversity (Sec. 5.4), alignment P/R/F1
(Sec. 6.2.2), and pair-classification accuracy (Sec. 6.3.1).

Diversity metrics exist in two implementations — numpy (driver-side)
and Spark (a pairwise-distance DataFrame job) — cross-checked against
each other and against DuckDB SQL in the tests.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.cluster.distance import cosine_distance_matrix, distance_matrix


def _cross_block(Q: np.ndarray, T: np.ndarray, metric: str) -> np.ndarray:
    if metric == "cosine":
        return cosine_distance_matrix(Q, T)
    full = distance_matrix(np.vstack([Q, T]), metric)
    return full[: len(Q), len(Q):]


def average_diversity(Q: np.ndarray, T: np.ndarray, metric: str = "cosine") -> float:
    """Eq. 1: (sum of query-result distances + within-result distances)
    normalized by n + k. Query-query distances are excluded (constant)."""
    n, k = len(Q), len(T)
    if k == 0:
        return 0.0
    qt = _cross_block(Q, T, metric).sum()
    DT = distance_matrix(T, metric)
    tt = DT[np.triu_indices(k, k=1)].sum() if k > 1 else 0.0
    return float((qt + tt) / (n + k))


def min_diversity(Q: np.ndarray, T: np.ndarray, metric: str = "cosine") -> float:
    """Eq. 2: min over query-result and within-result distances."""
    k = len(T)
    if k == 0:
        return 0.0
    vals = [float(_cross_block(Q, T, metric).min())] if len(Q) else []
    if k > 1:
        DT = distance_matrix(T, metric)
        vals.append(float(DT[np.triu_indices(k, k=1)].min()))
    return min(vals) if vals else 0.0


def diversity_scores(Q: np.ndarray, T: np.ndarray, metric: str = "cosine") -> dict[str, float]:
    return {
        "average_diversity": average_diversity(Q, T, metric),
        "min_diversity": min_diversity(Q, T, metric),
    }


# ---------------------------------------------------------------------------
# Spark implementation of the same metrics (pairwise-distance job)
# ---------------------------------------------------------------------------

def pairwise_distances_spark(
    spark: SparkSession,
    Q: np.ndarray,
    T: np.ndarray,
    metric: str = "cosine",
) -> DataFrame:
    """All (side, i, j, dist) rows the diversity metrics need: side 'qt'
    for query x result and 'tt' for within-result upper-triangle pairs."""
    qt = _cross_block(Q, T, metric)
    rows = [
        ("qt", int(i), int(j), float(qt[i, j]))
        for i in range(len(Q))
        for j in range(len(T))
    ]
    DT = distance_matrix(T, metric)
    rows += [
        ("tt", int(i), int(j), float(DT[i, j]))
        for i in range(len(T))
        for j in range(i + 1, len(T))
    ]
    return spark.createDataFrame(rows, schema="side string, i int, j int, dist double")


def diversity_scores_spark(
    spark: SparkSession,
    Q: np.ndarray,
    T: np.ndarray,
    metric: str = "cosine",
) -> dict[str, float]:
    """Eq. 1 / Eq. 2 computed by Spark aggregation over the pair rows."""
    pairs = pairwise_distances_spark(spark, Q, T, metric)
    agg = pairs.agg(
        F.sum("dist").alias("sum_dist"), F.min("dist").alias("min_dist")
    ).collect()[0]
    n, k = len(Q), len(T)
    return {
        "average_diversity": float(agg["sum_dist"]) / (n + k) if k else 0.0,
        "min_diversity": float(agg["min_dist"]) if k else 0.0,
    }


# ---------------------------------------------------------------------------
# Column alignment P/R/F1 (Sec. 6.2.2)
# ---------------------------------------------------------------------------

def alignment_prf(gt_pairs: set, method_pairs: set) -> dict[str, float]:
    inter = len(gt_pairs & method_pairs)
    p = inter / len(method_pairs) if method_pairs else 0.0
    r = inter / len(gt_pairs) if gt_pairs else 0.0
    f1 = 2 * p * r / (p + r) if (p + r) > 0 else 0.0
    return {"precision": p, "recall": r, "f1": f1}


# ---------------------------------------------------------------------------
# Pair-classification accuracy (Sec. 6.3.1, Eq. 3)
# ---------------------------------------------------------------------------

def pair_accuracy(pred: np.ndarray, labels: np.ndarray) -> float:
    pred = np.asarray(pred)
    labels = np.asarray(labels)
    if len(pred) != len(labels):
        raise ValueError("pred/labels length mismatch")
    if len(pred) == 0:
        return 0.0
    return float((pred == labels).mean())
