"""Shared fixtures: small benchmark instances and a quickly-trained
tuple encoder, all session-scoped so the suite stays fast."""
from __future__ import annotations

import numpy as np
import pytest

from repro.embed.finetune import train_finetuned
from repro.lake.benchmark import imdb_lite, santos_lite, tus_lite, ugen_v1_lite
from repro.lake.pairs import build_pair_benchmark


@pytest.fixture(scope="session")
def tiny_santos():
    return santos_lite(n_topics=2, lake_per_topic=3)


@pytest.fixture(scope="session")
def tiny_ugen():
    return ugen_v1_lite(n_topics=2)


@pytest.fixture(scope="session")
def tiny_tus():
    return tus_lite(n_topics=4, lake_per_topic=3)


@pytest.fixture(scope="session")
def tiny_imdb():
    return imdb_lite(n_tables=4, rows_per_table=40)


@pytest.fixture(scope="session")
def tiny_pairs(tiny_tus):
    return build_pair_benchmark(tiny_tus, n_pairs=1200, seed=7)


@pytest.fixture(scope="session")
def tiny_model(tiny_pairs):
    model, _ = train_finetuned(
        tiny_pairs.train.pairs,
        tiny_pairs.train.labels,
        tiny_pairs.val.pairs,
        tiny_pairs.val.labels,
        base="roberta",
        max_epochs=8,
        patience=4,
    )
    return model


@pytest.fixture()
def rng():
    return np.random.default_rng(42)
