"""Fig 7 (data): diversification runtime scaling, plus the Fig 11
p-sweep and the Appendix A.2.3 pruning ablation.

Synthetic workload: a Gaussian-mixture embedding cloud standing in for
one query's unionable tuples (the paper uses one query table with a
variable number of unionable tuples). Sweeps:

- (a) runtime vs s at k = 100 — GMC grows quadratically, CLT/DUST stay
  near-linear with a small slope;
- (b) runtime vs k at s = 5000 — DUST is essentially flat;
- p-sweep: diversity-metric change as p grows (the basis for p = 2);
- pruning ablation: DUST runtime with and without the pruning stage.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.baselines import clt_select, gmc_select
from repro.core.diversify import dust_diversify_local
from repro.core.metrics import average_diversity, min_diversity
from repro.exp.common import timer


def synthetic_embeddings(
    n: int, *, dim: int = 64, n_modes: int = 12, n_query: int = 50, seed: int = 0
):
    """Clustered unit-norm embeddings (T) plus query embeddings (Q)."""
    rng = np.random.default_rng(seed)
    centers = rng.normal(0, 1, (n_modes, dim))
    centers /= np.linalg.norm(centers, axis=1, keepdims=True)
    assign = rng.integers(0, n_modes, n)
    T = centers[assign] + 0.25 * rng.normal(0, 1, (n, dim))
    q_assign = rng.integers(0, max(1, n_modes // 2), n_query)
    Q = centers[q_assign] + 0.25 * rng.normal(0, 1, (n_query, dim))
    return T, Q


def run_fig7a(
    *, s_values=(500, 1000, 2000, 4000), k: int = 100, seed: int = 0
) -> pd.DataFrame:
    """Runtime vs number of input tuples s (k fixed)."""
    rows = []
    for s in s_values:
        T, Q = synthetic_embeddings(s, seed=seed)
        for name, fn in (
            ("GMC", lambda: gmc_select(T, Q, k)),
            ("CLT", lambda: clt_select(T, Q, k)),
            ("DUST", lambda: dust_diversify_local(T, Q, k, s=s)),
        ):
            with timer() as t:
                fn()
            rows.append({"s": s, "k": k, "method": name, "time_s": t()})
    return pd.DataFrame(rows)


def run_fig7b(
    *, k_values=(25, 50, 100, 200), s: int = 5000, seed: int = 0
) -> pd.DataFrame:
    """Runtime vs number of output tuples k (s fixed)."""
    T, Q = synthetic_embeddings(s, seed=seed)
    rows = []
    for k in k_values:
        for name, fn in (
            ("GMC", lambda: gmc_select(T, Q, k)),
            ("CLT", lambda: clt_select(T, Q, k)),
            ("DUST", lambda: dust_diversify_local(T, Q, k, s=s)),
        ):
            with timer() as t:
                fn()
            rows.append({"s": s, "k": k, "method": name, "time_s": t()})
    return pd.DataFrame(rows)


def run_fig11_p_sweep(
    *, n: int = 2000, k: int = 100, p_values=(1, 2, 3, 4, 5), seed: int = 0
) -> pd.DataFrame:
    """Diversity metrics as p grows (Appendix A.2.2): improvement should
    flatten for average diversity and turn negative for min diversity
    past p = 2 — the basis for the paper's p = 2 default."""
    T, Q = synthetic_embeddings(n, seed=seed)
    rows = []
    for p in p_values:
        idx = dust_diversify_local(T, Q, k, p=p, s=n)
        rows.append(
            {
                "p": p,
                "average_diversity": average_diversity(Q, T[idx]),
                "min_diversity": min_diversity(Q, T[idx]),
            }
        )
    df = pd.DataFrame(rows)
    df["average_improvement_pct"] = df["average_diversity"].pct_change() * 100
    df["min_improvement_pct"] = df["min_diversity"].pct_change() * 100
    return df


def run_pruning_ablation(
    *, n: int = 4000, s: int = 1000, k: int = 100, seed: int = 0
) -> pd.DataFrame:
    """Appendix A.2.3: DUST runtime with and without pruning."""
    T, Q = synthetic_embeddings(n, seed=seed)
    rows = []
    with timer() as t:
        dust_diversify_local(T, Q, k, s=n)  # no pruning (s = n keeps all)
    rows.append({"variant": "no_pruning", "n": n, "s": n, "time_s": t()})
    with timer() as t:
        dust_diversify_local(T, Q, k, s=s)
    rows.append({"variant": "pruned", "n": n, "s": s, "time_s": t()})
    return pd.DataFrame(rows)
