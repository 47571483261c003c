"""Fig 6 (a table in the paper): unionable-tuple-representation accuracy
on the fine-tuning test split, plus the Fig 10 column-shuffle robustness
statistic for the DUST model.

Models: pre-trained BERT / RoBERTa / sBERT (raw embedding spaces),
Ditto (fine-tuned for entity matching), DUST (BERT), DUST (RoBERTa).
Classification: unionable iff cosine distance < 0.7 (Sec. 6.3.1).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.metrics import pair_accuracy
from repro.embed.finetune import train_finetuned
from repro.embed.models import make_model
from repro.exp.common import get_benchmark, get_dust_model, get_pair_benchmark, _cached, default_cache_dir
from repro.lake.pairs import build_entity_match_benchmark
from repro.tokenize import tokenize

THRESHOLD = 0.7


def _pretrained_accuracy(model_name: str, pairs, labels) -> float:
    m = make_model(model_name)
    a = m.embed_texts([p[0] for p in pairs])
    b = m.embed_texts([p[1] for p in pairs])
    na = np.maximum(np.linalg.norm(a, axis=1), 1e-12)
    nb = np.maximum(np.linalg.norm(b, axis=1), 1e-12)
    dist = 1.0 - (a * b).sum(axis=1) / (na * nb)
    return pair_accuracy((dist < THRESHOLD).astype(int), labels)


def get_ditto_model(cache_dir: str | None = None):
    cache_dir = cache_dir or default_cache_dir()

    def build():
        em = build_entity_match_benchmark(get_benchmark("tus", cache_dir))
        model, _ = train_finetuned(
            em.train.pairs,
            em.train.labels,
            em.val.pairs,
            em.val.labels,
            base="roberta",
            max_epochs=40,
            patience=10,
        )
        return model

    return _cached(cache_dir, "ditto_model", build)


def run_fig6(cache_dir: str | None = None) -> pd.DataFrame:
    pb = get_pair_benchmark(cache_dir)
    pairs, labels = pb.test.pairs, pb.test.labels
    rows = []
    for name in ("bert", "roberta", "sbert"):
        rows.append({"model": name, "accuracy": _pretrained_accuracy(name, pairs, labels)})
    ditto = get_ditto_model(cache_dir)
    rows.append(
        {
            "model": "ditto",
            "accuracy": pair_accuracy(ditto.predict_unionable(pairs, THRESHOLD), labels),
        }
    )
    for base in ("bert", "roberta"):
        m = get_dust_model(base, cache_dir)
        rows.append(
            {
                "model": f"dust_{base}",
                "accuracy": pair_accuracy(m.predict_unionable(pairs, THRESHOLD), labels),
            }
        )
    return pd.DataFrame(rows)


def run_fig10_shuffle_robustness(
    cache_dir: str | None = None, *, n_tuples: int = 1000, seed: int = 0
) -> dict[str, float]:
    """Cosine similarity between original and column-shuffled serialized
    tuples under the DUST (RoBERTa) encoder (Appendix A.2.1)."""
    rng = np.random.default_rng(seed)
    pb = get_pair_benchmark(cache_dir)
    model = get_dust_model("roberta", cache_dir)
    texts = [p[0] for p in pb.test.pairs][:n_tuples]

    def shuffle_serialized(s: str) -> str:
        # Split on the [SEP] markers, shuffle the column segments.
        parts = [seg.strip() for seg in s.replace("[CLS]", "").split("[SEP]") if seg.strip()]
        rng.shuffle(parts)
        return "[CLS] " + " [SEP] ".join(parts) + " [SEP]"

    shuffled = [shuffle_serialized(s) for s in texts]
    a = model.embed_texts(texts)
    b = model.embed_texts(shuffled)
    na = np.maximum(np.linalg.norm(a, axis=1), 1e-12)
    nb = np.maximum(np.linalg.norm(b, axis=1), 1e-12)
    cos = (a * b).sum(axis=1) / (na * nb)
    return {"mean_cosine": float(cos.mean()), "std_cosine": float(cos.std())}
