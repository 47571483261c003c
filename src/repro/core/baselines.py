"""Diversification baselines (Sec. 6.4.2): GMC, GNE, CLT, random.

All operate on numpy embeddings: ``T`` (s x d) unionable data-lake
tuples, ``Q`` (n x d) query tuples, output ``k`` selected indices into
``T``. Relevance, where the MMR-style objectives need it, keeps the
baselines' own IR definition (the paper runs them "with the default
parameters suggested in the respective papers"): an item is relevant if
it is *similar* to the query — here, mean cosine similarity to the
query tuples. This is the classic MMR relevance/diversity trade-off,
and it is precisely why similarity-seeking baselines lose diversity
with respect to the query table. The trade-off parameter defaults to
the papers' lambda = 0.5.

GMC/GNE follow Vieira et al. (DivDB): the marginal contribution of a
candidate combines relevance, distances to the already-selected set,
and the largest remaining distances to unselected candidates — the term
that makes GMC O(k * s^2) and reproduces the quadratic runtime growth in
Fig 7(a).
"""
from __future__ import annotations

import numpy as np

from repro.cluster.distance import cosine_distance_matrix, distance_matrix
from repro.core.diversify import cluster_medoid_candidates


def _setup(T: np.ndarray, Q: np.ndarray, metric: str):
    D = distance_matrix(T, metric)
    if metric == "cosine":
        DQ = cosine_distance_matrix(T, Q)
        # IR relevance: similarity to the query (cosine dist in [0, 2]).
        rel = 1.0 - DQ.mean(axis=1) / 2.0
    else:
        full = distance_matrix(np.vstack([T, Q]), metric)
        DQ = full[: len(T), len(T):]
        rel = 1.0 / (1.0 + DQ.mean(axis=1))
    return D, rel


def _mmc(
    D: np.ndarray,
    rel: np.ndarray,
    selected: list[int],
    candidates: np.ndarray,
    k: int,
    lam: float,
) -> np.ndarray:
    """Maximum marginal contribution of each candidate (Vieira et al.).

    mmc(i) = (1-lam) * rel(i)
           + lam/(k-1) * [ sum_{j in R} d(i,j)
                           + (k-1-|R|) * max_{u unselected} d(i,u) ]

    The future term is DivDB's optimistic bound: each remaining slot is
    assumed to contribute candidate i's best-case distance. It is a
    loose, max-based bound (not the exact top-m sum), so the first pick
    is dominated by relevance = query similarity — the similarity-first
    behaviour the paper observes in MMR-family baselines — and the
    per-iteration row-max over unselected items is what makes GMC
    O(k * s^2), the quadratic growth of Fig 7a.
    """
    n_future = max(0, k - 1 - len(selected))
    div_sel = (
        D[np.ix_(candidates, selected)].sum(axis=1)
        if selected
        else np.zeros(len(candidates))
    )
    if n_future > 0 and len(candidates) > 1:
        D_unsel = D[np.ix_(candidates, candidates)].copy()
        np.fill_diagonal(D_unsel, -np.inf)
        div_future = n_future * D_unsel.max(axis=1)
    else:
        div_future = np.zeros(len(candidates))
    denom = max(1, k - 1)
    return (1 - lam) * rel + lam / denom * (div_sel + div_future)


def gmc_select(
    T: np.ndarray,
    Q: np.ndarray,
    k: int,
    *,
    lam: float = 0.5,
    metric: str = "cosine",
) -> np.ndarray:
    """Greedy Marginal Contribution (GMC)."""
    n = len(T)
    k = min(k, n)
    D, rel = _setup(T, Q, metric)
    selected: list[int] = []
    remaining = np.arange(n)
    for _ in range(k):
        scores = _mmc(D, rel[remaining], selected, remaining, k, lam)
        pick = remaining[int(np.argmax(scores))]
        selected.append(int(pick))
        remaining = remaining[remaining != pick]
    return np.asarray(selected, dtype=np.int64)


def gne_select(
    T: np.ndarray,
    Q: np.ndarray,
    k: int,
    *,
    lam: float = 0.5,
    metric: str = "cosine",
    n_iter: int = 20,
    top_alpha: float = 0.1,
    seed: int = 0,
) -> np.ndarray:
    """Greedy randomized with Neighborhood Expansion (GNE) — GRASP:
    randomized-greedy construction (pick uniformly among the top-alpha
    fraction by mmc), then iterated local search swapping selected with
    unselected items when the max-sum objective improves."""
    rng = np.random.default_rng(seed)
    n = len(T)
    k = min(k, n)
    D, rel = _setup(T, Q, metric)

    def objective(sel: np.ndarray) -> float:
        sub = D[np.ix_(sel, sel)]
        return (1 - lam) * rel[sel].sum() + lam * sub.sum() / 2.0

    best_sel: np.ndarray | None = None
    best_obj = -np.inf
    for _ in range(max(1, n_iter)):
        selected: list[int] = []
        remaining = np.arange(n)
        for _ in range(k):
            scores = _mmc(D, rel[remaining], selected, remaining, k, lam)
            n_top = max(1, int(np.ceil(top_alpha * len(remaining))))
            top_idx = np.argsort(-scores, kind="stable")[:n_top]
            pick = remaining[int(rng.choice(top_idx))]
            selected.append(int(pick))
            remaining = remaining[remaining != pick]
        sel = np.asarray(selected, dtype=np.int64)
        # Neighborhood expansion: random swap local search.
        cur = objective(sel)
        for _ in range(2 * k):
            if len(remaining) == 0:
                break
            i = int(rng.integers(k))
            cand = int(remaining[int(rng.integers(len(remaining)))])
            trial = sel.copy()
            out_item = trial[i]
            trial[i] = cand
            t_obj = objective(trial)
            if t_obj > cur:
                remaining = remaining[remaining != cand]
                remaining = np.append(remaining, out_item)
                sel = trial
                cur = t_obj
        if cur > best_obj:
            best_obj = cur
            best_sel = sel
    assert best_sel is not None
    return best_sel


def clt_select(
    T: np.ndarray,
    Q: np.ndarray,  # unused; kept for a uniform baseline signature
    k: int,
    *,
    metric: str = "cosine",
) -> np.ndarray:
    """CLT (van Leuken et al.): cluster into k clusters, take medoids —
    same clustering and medoid selection as DUST, but no query-aware
    re-ranking and no candidate over-generation."""
    return cluster_medoid_candidates(T, min(k, len(T)), metric)


def random_select(T: np.ndarray, Q: np.ndarray, k: int, *, seed: int = 0) -> np.ndarray:
    rng = np.random.default_rng(seed)
    n = len(T)
    return rng.choice(n, size=min(k, n), replace=False).astype(np.int64)
