"""Numpy clustering & matching substrate (no scipy/sklearn in the box).

- ``hierarchy``: average-linkage agglomerative clustering with optional
  cannot-link constraints (columns of one table must not co-cluster).
- ``silhouette``: Silhouette coefficient for selecting the cut height.
- ``medoid``: cluster medoids (central-most member).
- ``bipartite``: max-weight bipartite matching (Starmie-style alignment).
"""
from repro.cluster.bipartite import max_weight_matching
from repro.cluster.hierarchy import agglomerative
from repro.cluster.medoid import medoid_index, medoids
from repro.cluster.silhouette import silhouette_score

__all__ = [
    "agglomerative",
    "silhouette_score",
    "medoid_index",
    "medoids",
    "max_weight_matching",
]
