"""Max-weight bipartite matching (Hungarian algorithm, numpy).

Starmie aligns each data-lake table to the query with maximum-weight
bipartite matching between their columns (Sec. 3.3 / 6.2.3); the
``Starmie (B)`` baseline in Table 1 uses this.
"""
from __future__ import annotations

import numpy as np


def max_weight_matching(W: np.ndarray) -> list[tuple[int, int]]:
    """Maximum-weight matching of a (possibly rectangular) weight matrix.

    Returns ``(row, col)`` pairs. Every row/col is matched at most once;
    pairs with non-positive weight are dropped from the result, so the
    matching only keeps genuinely attractive assignments.
    """
    W = np.asarray(W, dtype=np.float64)
    if W.size == 0:
        return []
    n_rows, n_cols = W.shape
    n = max(n_rows, n_cols)
    # Partial-matching reduction: clamp negatives to zero (an edge worth
    # <= 0 is as good as unmatched) and pad to square with zeros, so the
    # complete assignment the Hungarian solver returns has exactly the
    # value of the best partial matching over positive edges.
    C = np.zeros((n, n))
    C[:n_rows, :n_cols] = -np.maximum(W, 0.0)
    assignment = _hungarian(C)
    out = []
    for r, c in assignment:
        if r < n_rows and c < n_cols and W[r, c] > 0:
            out.append((int(r), int(c)))
    return sorted(out)


def _hungarian(C: np.ndarray) -> list[tuple[int, int]]:
    """O(n^3) Jonker-style shortest-augmenting-path assignment (min-cost)."""
    n = C.shape[0]
    INF = np.inf
    u = np.zeros(n + 1)
    v = np.zeros(n + 1)
    p = np.zeros(n + 1, dtype=np.int64)  # p[j]: row matched to column j
    way = np.zeros(n + 1, dtype=np.int64)
    for i in range(1, n + 1):
        p[0] = i
        j0 = 0
        minv = np.full(n + 1, INF)
        used = np.zeros(n + 1, dtype=bool)
        while True:
            used[j0] = True
            i0 = p[j0]
            delta = INF
            j1 = -1
            for j in range(1, n + 1):
                if used[j]:
                    continue
                cur = C[i0 - 1, j - 1] - u[i0] - v[j]
                if cur < minv[j]:
                    minv[j] = cur
                    way[j] = j0
                if minv[j] < delta:
                    delta = minv[j]
                    j1 = j
            for j in range(n + 1):
                if used[j]:
                    u[p[j]] += delta
                    v[j] -= delta
                else:
                    minv[j] -= delta
            j0 = j1
            if p[j0] == 0:
                break
        while j0:
            j1 = way[j0]
            p[j0] = p[j1]
            j0 = j1
    return [(int(p[j] - 1), j - 1) for j in range(1, n + 1)]
