"""Average-linkage agglomerative clustering (numpy, no scipy).

Two execution paths behind one API:

- **NN-chain** (O(n^2)) for unconstrained inputs — used to cluster up to
  a few thousand pruned tuple embeddings (Algorithm 2, line 4).
- **Naive global-min** (O(n^3)) when cannot-link constraints are present —
  used for holistic column alignment, where two columns of the same table
  must never co-cluster (Sec. 3.3) and n is at most a few hundred.

Both record the merge sequence into a :class:`Dendrogram`, which can be
cut at any number of clusters — the silhouette sweep in column alignment
cuts one dendrogram many times instead of re-clustering.
"""
from __future__ import annotations

import numpy as np


class Dendrogram:
    """Merge history of an agglomerative run.

    ``merges`` is a list of ``(i, j, dist)`` where i/j are representative
    point indices of the two clusters merged, in replay order. NN-chain
    output is sorted by distance before construction (reducibility makes
    that the monotone dendrogram); constrained output replays in the
    order merges actually happened, since skipped-then-blocked pairs can
    make the sequence non-monotone.
    """

    def __init__(self, n: int, merges: list[tuple[int, int, float]]):
        self.n = n
        self.merges = list(merges)

    @property
    def min_clusters(self) -> int:
        """Fewest clusters reachable (constraints can stop merging early)."""
        return self.n - len(self.merges)

    def labels(self, n_clusters: int) -> np.ndarray:
        """Cluster labels (0..k-1, ordered by first member) at a given cut."""
        if n_clusters < self.min_clusters or n_clusters > self.n:
            raise ValueError(
                f"n_clusters={n_clusters} outside [{self.min_clusters}, {self.n}]"
            )
        parent = np.arange(self.n)

        def find(x: int) -> int:
            while parent[x] != x:
                parent[x] = parent[parent[x]]
                x = parent[x]
            return x

        for i, j, _ in self.merges[: self.n - n_clusters]:
            ri, rj = find(i), find(j)
            if ri != rj:
                parent[rj] = ri
        roots = np.fromiter((find(i) for i in range(self.n)), dtype=np.int64)
        _, labels = np.unique(roots, return_inverse=True)
        # Renumber by first appearance so labels are deterministic.
        order = {}
        out = np.empty(self.n, dtype=np.int64)
        for idx, lab in enumerate(labels):
            if lab not in order:
                order[lab] = len(order)
            out[idx] = order[lab]
        return out


def _nn_chain(D: np.ndarray) -> list[tuple[int, int, float]]:
    """Nearest-neighbour-chain average linkage over a square dist matrix."""
    n = D.shape[0]
    D = D.astype(np.float64, copy=True)
    np.fill_diagonal(D, np.inf)
    size = np.ones(n, dtype=np.float64)
    active = np.ones(n, dtype=bool)
    merges: list[tuple[int, int, float]] = []
    chain: list[int] = []
    for _ in range(n - 1):
        if not chain:
            chain.append(int(np.flatnonzero(active)[0]))
        while True:
            a = chain[-1]
            row = np.where(active, D[a], np.inf)
            row[a] = np.inf
            b = int(np.argmin(row))
            if len(chain) > 1 and b == chain[-2]:
                break
            chain.append(b)
        b = chain.pop()
        a = chain.pop()
        merges.append((a, b, float(D[a, b])))
        # Lance-Williams average-linkage update; b merges into a.
        sa, sb = size[a], size[b]
        new_row = (sa * D[a] + sb * D[b]) / (sa + sb)
        D[a, :] = new_row
        D[:, a] = new_row
        D[a, a] = np.inf
        active[b] = False
        D[b, :] = np.inf
        D[:, b] = np.inf
        size[a] = sa + sb
        if chain and chain[-1] == b:  # defensive; b was popped above
            chain.pop()
    return merges


def _naive_constrained(
    D: np.ndarray, groups: np.ndarray
) -> list[tuple[int, int, float]]:
    """Global-min average linkage; never merges clusters sharing a group.

    ``groups[i] >= 0`` is a cannot-link group id (e.g. source table of a
    column); ``groups[i] == -1`` means unconstrained. A merge is valid iff
    the union contains no repeated non-negative group.
    """
    n = D.shape[0]
    D = D.astype(np.float64, copy=True)
    np.fill_diagonal(D, np.inf)
    size = np.ones(n, dtype=np.float64)
    active = list(range(n))
    member_groups: list[set[int]] = [
        {int(g)} - {-1} for g in groups
    ]
    merges: list[tuple[int, int, float]] = []
    blocked = np.zeros((n, n), dtype=bool)
    for i in range(n):
        for j in range(i + 1, n):
            if member_groups[i] & member_groups[j]:
                blocked[i, j] = blocked[j, i] = True
    while len(active) > 1:
        W = D.copy()
        W[blocked] = np.inf
        idx = np.unravel_index(np.argmin(W), W.shape)
        a, b = int(idx[0]), int(idx[1])
        if not np.isfinite(W[a, b]):
            break  # every remaining pair violates a constraint
        merges.append((a, b, float(D[a, b])))
        sa, sb = size[a], size[b]
        new_row = (sa * D[a] + sb * D[b]) / (sa + sb)
        D[a, :] = new_row
        D[:, a] = new_row
        D[a, a] = np.inf
        D[b, :] = np.inf
        D[:, b] = np.inf
        size[a] = sa + sb
        member_groups[a] = member_groups[a] | member_groups[b]
        active.remove(b)
        blocked[b, :] = True
        blocked[:, b] = True
        for c in active:
            if c != a and member_groups[a] & member_groups[c]:
                blocked[a, c] = blocked[c, a] = True
    return merges


def agglomerative(
    D: np.ndarray, cannot_link_groups: np.ndarray | None = None
) -> Dendrogram:
    """Cluster a square distance matrix; returns the full dendrogram.

    ``cannot_link_groups``: optional per-point group ids; two points with
    the same non-negative group id are never placed in one cluster.
    """
    D = np.asarray(D, dtype=np.float64)
    if D.ndim != 2 or D.shape[0] != D.shape[1]:
        raise ValueError("D must be a square distance matrix")
    n = D.shape[0]
    if n == 0:
        return Dendrogram(0, [])
    if n == 1:
        return Dendrogram(1, [])
    if cannot_link_groups is None:
        merges = sorted(_nn_chain(D), key=lambda m: m[2])
    else:
        groups = np.asarray(cannot_link_groups)
        if groups.shape != (n,):
            raise ValueError("cannot_link_groups must have one entry per point")
        merges = _naive_constrained(D, groups)
    return Dendrogram(n, merges)
