"""Fine-tuned tuple encoder (the DUST model, Sec. 4) — numpy SGD.

The paper appends dropout + two linear layers to a pre-trained
transformer and trains with cosine-embedding loss on unionable /
non-unionable tuple pairs. Here the "pre-trained transformer" is the
hashed-feature space of a zoo model (DESIGN.md §2) and the trainable
head is a linear map ``W`` initialized from the model's projection;
training minimizes the paper's loss verbatim:

    L = 1 - cos(e1, e2)        if label = 1
    L = max(0, cos(e1, e2))    if label = 0

with Adam, feature dropout (the paper's dropout layer), and early
stopping on validation loss with a patience of 10 (Sec. 6.3.3).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.embed.features import HashedFeaturizer
from repro.embed.models import EMBED_DIM, make_model
from repro.tokenize import IdfWeights, tokenize


class FineTunedModel:
    """Frozen trained encoder: hashed features -> R^d via learned ``W``."""

    def __init__(self, featurizer: HashedFeaturizer, W: np.ndarray):
        self.featurizer = featurizer
        self.W = W

    def embed_texts(self, texts: list[str]) -> np.ndarray:
        X = self.featurizer.matrix([str(t) for t in texts])
        return X @ self.W

    def predict_unionable(
        self, pairs: list[tuple[str, str]], threshold: float = 0.7
    ) -> np.ndarray:
        """1 = unionable iff cosine *distance* < threshold (Sec. 6.3.1)."""
        d = self.pair_distances(pairs)
        return (d < threshold).astype(np.int64)

    def pair_distances(self, pairs: list[tuple[str, str]]) -> np.ndarray:
        a = self.embed_texts([p[0] for p in pairs])
        b = self.embed_texts([p[1] for p in pairs])
        return 1.0 - _cos_rows(a, b)


@dataclass
class TrainHistory:
    train_loss: list[float] = field(default_factory=list)
    val_loss: list[float] = field(default_factory=list)
    stopped_epoch: int = 0


def _cos_rows(A: np.ndarray, B: np.ndarray, eps: float = 1e-12) -> np.ndarray:
    na = np.maximum(np.linalg.norm(A, axis=1), eps)
    nb = np.maximum(np.linalg.norm(B, axis=1), eps)
    return (A * B).sum(axis=1) / (na * nb)


def _pair_loss(c: np.ndarray, y: np.ndarray) -> np.ndarray:
    return np.where(y == 1, 1.0 - c, np.maximum(0.0, c))


def train_finetuned(
    train_pairs: list[tuple[str, str]],
    train_labels: np.ndarray,
    val_pairs: list[tuple[str, str]],
    val_labels: np.ndarray,
    *,
    base: str = "roberta",
    max_epochs: int = 60,
    patience: int = 10,
    lr: float = 0.05,
    batch_size: int = 128,
    dropout: float = 0.1,
    seed: int = 0,
) -> tuple[FineTunedModel, TrainHistory]:
    """Train the DUST encoder (or the Ditto analog — same trainer,
    different labels) and return the best-validation-loss model."""
    base_model = make_model(base)
    # Fit idf on the training tuples when the base spec uses idf; the
    # featurizer is then frozen into the returned model.
    idf = None
    if base_model.spec.use_idf:
        idf = IdfWeights(tokenize(t) for p in train_pairs for t in p)
    featurizer = HashedFeaturizer(
        base_model.spec.n_buckets,
        salt=base_model.spec.name,
        use_ngrams=base_model.spec.use_ngrams,
        idf=idf,
    )

    def feats(texts: list[str]) -> np.ndarray:
        return featurizer.matrix(texts)

    X1 = feats([p[0] for p in train_pairs])
    X2 = feats([p[1] for p in train_pairs])
    y = np.asarray(train_labels, dtype=np.int64)
    V1 = feats([p[0] for p in val_pairs])
    V2 = feats([p[1] for p in val_pairs])
    vy = np.asarray(val_labels, dtype=np.int64)

    rng = np.random.default_rng(seed)
    W = base_model.P.copy()  # warm start from the "pre-trained" projection
    mW = np.zeros_like(W)
    vW = np.zeros_like(W)
    beta1, beta2, eps = 0.9, 0.999, 1e-8
    step = 0

    def val_loss_of(Wc: np.ndarray) -> float:
        c = _cos_rows(V1 @ Wc, V2 @ Wc)
        return float(_pair_loss(c, vy).mean())

    history = TrainHistory()
    best_W = W.copy()
    best_val = val_loss_of(W)
    bad_epochs = 0
    n = len(train_pairs)
    for epoch in range(1, max_epochs + 1):
        order = rng.permutation(n)
        ep_loss = 0.0
        for start in range(0, n, batch_size):
            idx = order[start : start + batch_size]
            x1, x2, yb = X1[idx], X2[idx], y[idx]
            if dropout > 0:
                keep = (rng.random(x1.shape) >= dropout) / (1 - dropout)
                x1 = x1 * keep
                keep = (rng.random(x2.shape) >= dropout) / (1 - dropout)
                x2 = x2 * keep
            E1, E2 = x1 @ W, x2 @ W
            n1 = np.maximum(np.linalg.norm(E1, axis=1), 1e-12)
            n2 = np.maximum(np.linalg.norm(E2, axis=1), 1e-12)
            c = (E1 * E2).sum(axis=1) / (n1 * n2)
            loss = _pair_loss(c, yb)
            ep_loss += float(loss.sum())
            # dL/dc: -1 for positives, 1 for active-hinge negatives.
            g = np.where(yb == 1, -1.0, (c > 0).astype(np.float64))
            G1 = g[:, None] * (E2 / (n1 * n2)[:, None] - (c / n1**2)[:, None] * E1)
            G2 = g[:, None] * (E1 / (n1 * n2)[:, None] - (c / n2**2)[:, None] * E2)
            dW = (x1.T @ G1 + x2.T @ G2) / len(idx)
            step += 1
            mW = beta1 * mW + (1 - beta1) * dW
            vW = beta2 * vW + (1 - beta2) * dW**2
            mhat = mW / (1 - beta1**step)
            vhat = vW / (1 - beta2**step)
            W = W - lr * mhat / (np.sqrt(vhat) + eps)
        history.train_loss.append(ep_loss / n)
        vl = val_loss_of(W)
        history.val_loss.append(vl)
        if vl < best_val - 1e-6:
            best_val = vl
            best_W = W.copy()
            bad_epochs = 0
        else:
            bad_epochs += 1
            if bad_epochs >= patience:
                break
    history.stopped_epoch = len(history.train_loss)
    assert best_W.shape == (base_model.spec.n_buckets, EMBED_DIM)
    return FineTunedModel(featurizer, best_W), history
