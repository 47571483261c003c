"""Cluster medoids — the central-most member of each cluster.

Algorithm 2 selects each cluster's medoid as its candidate diverse tuple
(robust to outliers, Sec. 5.2); the CLT baseline uses the same selection.
"""
from __future__ import annotations

import numpy as np


def medoid_index(D: np.ndarray, members: np.ndarray) -> int:
    """Index (into the full matrix) of the member minimizing total
    distance to the other members; ties break to the lowest index."""
    members = np.asarray(members)
    if members.size == 0:
        raise ValueError("empty cluster has no medoid")
    sub = D[np.ix_(members, members)]
    return int(members[int(np.argmin(sub.sum(axis=1)))])


def medoids(D: np.ndarray, labels: np.ndarray) -> np.ndarray:
    """Medoid index per cluster, ordered by cluster label."""
    labels = np.asarray(labels)
    out = []
    for c in np.unique(labels):
        out.append(medoid_index(D, np.flatnonzero(labels == c)))
    return np.asarray(out, dtype=np.int64)
