"""Pairwise distance matrices used by clustering and diversity metrics."""
from __future__ import annotations

import numpy as np


def l2_normalize(X: np.ndarray, eps: float = 1e-12) -> np.ndarray:
    """Row-normalize to unit L2 norm (zero rows stay zero)."""
    X = np.asarray(X, dtype=np.float64)
    norms = np.linalg.norm(X, axis=-1, keepdims=True)
    return X / np.maximum(norms, eps)


def cosine_distance_matrix(X: np.ndarray, Y: np.ndarray | None = None) -> np.ndarray:
    """1 - cosine similarity, clipped to [0, 2]. ``Y=None`` means X vs X."""
    Xn = l2_normalize(X)
    Yn = Xn if Y is None else l2_normalize(Y)
    D = 1.0 - Xn @ Yn.T
    np.clip(D, 0.0, 2.0, out=D)
    if Y is None:
        np.fill_diagonal(D, 0.0)
    return D


def euclidean_distance_matrix(X: np.ndarray, Y: np.ndarray | None = None) -> np.ndarray:
    X = np.asarray(X, dtype=np.float64)
    Y2 = X if Y is None else np.asarray(Y, dtype=np.float64)
    sq = (
        (X * X).sum(1)[:, None]
        + (Y2 * Y2).sum(1)[None, :]
        - 2.0 * X @ Y2.T
    )
    np.maximum(sq, 0.0, out=sq)
    D = np.sqrt(sq)
    if Y is None:
        np.fill_diagonal(D, 0.0)
    return D


def distance_matrix(X: np.ndarray, metric: str = "cosine") -> np.ndarray:
    if metric == "cosine":
        return cosine_distance_matrix(X)
    if metric == "euclidean":
        return euclidean_distance_matrix(X)
    raise ValueError(f"unknown metric {metric!r}")
