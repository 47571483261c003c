"""Shared experiment context: canonical benchmark instances, the
fine-tuned DUST model (disk-cached — the paper trains once and reuses),
and small helpers used by every harness."""
from __future__ import annotations

import os
import pickle
import time
from contextlib import contextmanager

import numpy as np

from repro.embed.finetune import FineTunedModel, train_finetuned
from repro.lake.benchmark import (
    Benchmark,
    imdb_lite,
    santos_lite,
    tus_lite,
    tus_sampled_lite,
    ugen_v1_lite,
)
from repro.lake.pairs import PairBenchmark, build_pair_benchmark

# Canonical scaled-down parameters (paper values in EXPERIMENTS.md).
K_SANTOS = 100
K_UGEN = 30
S_PRUNE = 1000
P_CANDIDATES = 2
N_FINETUNE_PAIRS = 6000


def default_cache_dir() -> str:
    d = os.environ.get("REPRO_CACHE", os.path.join(os.path.dirname(__file__), "..", "..", "..", ".cache"))
    d = os.path.abspath(d)
    os.makedirs(d, exist_ok=True)
    return d


def _cached(cache_dir: str, name: str, builder):
    path = os.path.join(cache_dir, name + ".pkl")
    if os.path.exists(path):
        with open(path, "rb") as f:
            return pickle.load(f)
    obj = builder()
    with open(path, "wb") as f:
        pickle.dump(obj, f)
    return obj


def get_benchmark(name: str, cache_dir: str | None = None) -> Benchmark:
    cache_dir = cache_dir or default_cache_dir()
    builders = {
        "tus": tus_lite,
        "tus_sampled": tus_sampled_lite,
        "santos": santos_lite,
        "ugen_v1": ugen_v1_lite,
        "imdb": imdb_lite,
    }
    return _cached(cache_dir, f"bench_{name}", builders[name])


def get_pair_benchmark(cache_dir: str | None = None) -> PairBenchmark:
    cache_dir = cache_dir or default_cache_dir()
    return _cached(
        cache_dir,
        "pairs_tus",
        lambda: build_pair_benchmark(
            get_benchmark("tus", cache_dir), n_pairs=N_FINETUNE_PAIRS
        ),
    )


def get_dust_model(
    base: str = "roberta", cache_dir: str | None = None
) -> FineTunedModel:
    """The fine-tuned DUST tuple encoder (Sec. 4), trained once on the
    TUS-lite pair benchmark and cached."""
    cache_dir = cache_dir or default_cache_dir()

    def build():
        pb = get_pair_benchmark(cache_dir)
        model, _hist = train_finetuned(
            pb.train.pairs,
            pb.train.labels,
            pb.val.pairs,
            pb.val.labels,
            base=base,
            max_epochs=40,
            patience=10,
        )
        return model

    return _cached(cache_dir, f"dust_model_{base}", build)


@contextmanager
def timer():
    """``with timer() as t: ...; t()`` -> elapsed seconds."""
    t0 = time.perf_counter()
    yield lambda: time.perf_counter() - t0


def count_best(rows: list[dict], methods: list[str], key: str) -> dict[str, int]:
    """Per-query winner counting used by Tables 2 and 3: for each query
    row ({method: score}), every method achieving the max score gets a
    win (ties credited to all, like the paper's 'performs the best')."""
    wins = {m: 0 for m in methods}
    for row in rows:
        present = {m: row[m] for m in methods if m in row and row[m] is not None}
        if not present:
            continue
        best = max(present.values())
        for m, v in present.items():
            if np.isclose(v, best):
                wins[m] += 1
    return wins
