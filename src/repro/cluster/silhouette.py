"""Silhouette coefficient (Rousseeuw 1987) over a distance matrix.

Used to choose the number of clusters during holistic column alignment
(Sec. 3.3): DUST sweeps cut heights of one dendrogram and keeps the cut
with the highest mean silhouette.
"""
from __future__ import annotations

import numpy as np


def silhouette_score(D: np.ndarray, labels: np.ndarray) -> float:
    """Mean silhouette over all points.

    Singleton-cluster points get silhouette 0 (sklearn convention).
    Requires at least 2 clusters and at least 2 points; degenerate inputs
    raise ValueError so callers never silently score a trivial cut.
    """
    D = np.asarray(D, dtype=np.float64)
    labels = np.asarray(labels)
    n = D.shape[0]
    uniq = np.unique(labels)
    if n < 2 or len(uniq) < 2 or len(uniq) >= n + 1:
        raise ValueError("silhouette needs 2 <= n_clusters and n >= 2")
    masks = {c: labels == c for c in uniq}
    sizes = {c: int(m.sum()) for c, m in masks.items()}
    s = np.zeros(n)
    # Mean distance from each point to each cluster, vectorized per cluster.
    mean_to = np.stack([D[:, masks[c]].mean(axis=1) for c in uniq], axis=1)
    col_of = {c: i for i, c in enumerate(uniq)}
    for i in range(n):
        c = labels[i]
        if sizes[c] == 1:
            s[i] = 0.0
            continue
        # a(i): mean intra-cluster distance, excluding self.
        a = mean_to[i, col_of[c]] * sizes[c] / (sizes[c] - 1)
        b = np.inf
        for c2 in uniq:
            if c2 != c:
                b = min(b, mean_to[i, col_of[c2]])
        denom = max(a, b)
        s[i] = 0.0 if denom == 0 else (b - a) / denom
    return float(s.mean())


def best_cut(
    D: np.ndarray,
    dendrogram,
    k_min: int = 2,
    k_max: int | None = None,
) -> tuple[int, np.ndarray, float]:
    """Sweep cluster counts, return ``(k, labels, score)`` of the best cut.

    ``k_max`` defaults to n-1 (all-singletons has no silhouette). If the
    dendrogram's constraints prevent reaching ``k_min``, the sweep starts
    at the smallest reachable count.
    """
    n = D.shape[0]
    if k_max is None:
        k_max = n - 1
    k_lo = max(k_min, dendrogram.min_clusters)
    k_hi = min(k_max, n - 1)
    if k_lo > k_hi:
        labels = dendrogram.labels(dendrogram.min_clusters)
        return dendrogram.min_clusters, labels, float("nan")
    best = (k_lo, None, -np.inf)
    for k in range(k_lo, k_hi + 1):
        labels = dendrogram.labels(k)
        score = silhouette_score(D, labels)
        if score > best[2]:
            best = (k, labels, score)
    return best  # type: ignore[return-value]
