"""Topic vocabularies and schema templates for the synthetic lake.

A *topic* plays the role of a TUS/SANTOS base table's subject area
(parks, movies, ...). Each topic owns a private vocabulary of generated
pseudo-words (so tables from different topics are textually dissimilar,
like real non-unionable open-data tables) plus columns drawn from shared
pools (countries, cities, person names) that create the realistic
cross-topic token overlap that makes alignment non-trivial.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

_CONSONANTS = list("bcdfghjklmnprstvwz")
_VOWELS = list("aeiou")

COUNTRIES = [
    "usa", "canada", "france", "germany", "japan", "brazil", "india",
    "kenya", "norway", "chile", "spain", "poland", "vietnam", "egypt",
]


def pseudo_word(rng: np.random.Generator, n_syllables: int | None = None) -> str:
    """A pronounceable deterministic pseudo-word, e.g. 'kelora'."""
    n = int(n_syllables or rng.integers(2, 4))
    return "".join(
        rng.choice(_CONSONANTS) + rng.choice(_VOWELS) for _ in range(n)
    )


def word_pool(rng: np.random.Generator, size: int, prefix: str = "") -> list[str]:
    seen: set[str] = set()
    out: list[str] = []
    while len(out) < size:
        w = prefix + pseudo_word(rng)
        if w not in seen:
            seen.add(w)
            out.append(w)
    return out


# Shared cross-topic pools (seeded once, module-level determinism).
_shared_rng = np.random.default_rng(20260814)
CITIES = word_pool(_shared_rng, 120)
FIRST_NAMES = word_pool(_shared_rng, 150)
LAST_NAMES = word_pool(_shared_rng, 150)
# Generic vocabulary that leaks across topics (real open-data tables
# about different subjects still share plenty of ordinary words) — this
# is what keeps tuple-unionability from being trivially separable.
SHARED_WORDS = word_pool(_shared_rng, 200)
SHARED_CATEGORIES = word_pool(_shared_rng, 40)
# Header vocabulary: real open-data headers are ordinary English words
# ("name", "city", "type") reused across unrelated tables, so half the
# header stems come from a shared pool.
SHARED_HEADER_STEMS = word_pool(_shared_rng, 30)


@dataclass
class ColumnSpec:
    """One base-table column: a stable id, synonymous header variants,
    and a value generator kind."""

    base_col_id: int
    headers: list[str]  # header synonyms; derived tables pick one
    kind: str  # entity | person | city | country | category | number | date | phone | text

    @property
    def canonical_header(self) -> str:
        return self.headers[0]


@dataclass
class Topic:
    topic_id: int
    name: str
    columns: list[ColumnSpec]
    entity_pool: list[str] = field(default_factory=list)
    category_pools: dict[int, list[str]] = field(default_factory=dict)
    text_pool: list[str] = field(default_factory=list)


_KIND_CYCLE = [
    "entity", "person", "city", "country", "category",
    "number", "category", "text", "date", "person",
    "number", "phone", "text", "category",
]


def make_topic(
    topic_id: int,
    *,
    n_columns: int = 8,
    entity_pool_size: int = 600,
    seed: int = 0,
    vocab_overlap_with: "Topic | None" = None,
) -> Topic:
    """Build a topic with ``n_columns`` columns (first is always the
    topic's entity column). ``vocab_overlap_with`` shares part of the
    category/text vocabulary with another topic — used by UGEN-V1-lite
    hard negatives ("non-unionable tables on the same topic")."""
    rng = np.random.default_rng(900_000 + topic_id * 31 + seed)
    name = pseudo_word(rng, 3)
    n_columns = max(3, n_columns)
    cols: list[ColumnSpec] = []
    cat_pools: dict[int, list[str]] = {}
    used_stems: set[str] = set()
    for i in range(n_columns):
        kind = "entity" if i == 0 else _KIND_CYCLE[i % len(_KIND_CYCLE)]
        # Half the headers are shared English-like words, half invented.
        stem = None
        while stem is None or stem in used_stems:
            stem = (
                str(rng.choice(SHARED_HEADER_STEMS))
                if rng.random() < 0.5
                else pseudo_word(rng, 2)
            )
        used_stems.add(stem)
        headers = [stem, f"{name}_{stem}", f"{stem}_info"]
        cols.append(ColumnSpec(i, headers, kind))
        if kind == "category":
            pool = word_pool(rng, int(rng.integers(4, 9)), prefix=f"{stem[:3]}")
            # ~1/3 of category values come from the shared pool.
            n_shared = max(1, len(pool) // 3)
            pool[:n_shared] = list(
                rng.choice(SHARED_CATEGORIES, size=n_shared, replace=False)
            )
            if vocab_overlap_with is not None:
                donor = [
                    p
                    for pools in vocab_overlap_with.category_pools.values()
                    for p in pools
                ]
                if donor:
                    n_share = min(len(donor), max(1, len(pool) // 2))
                    pool[:n_share] = list(
                        rng.choice(donor, size=n_share, replace=False)
                    )
            cat_pools[i] = pool
    text_pool = word_pool(rng, 80, prefix=name[:2])
    # 40% of descriptive-text vocabulary is shared across every topic.
    n_shared = int(0.4 * len(text_pool))
    text_pool[:n_shared] = list(
        rng.choice(SHARED_WORDS, size=n_shared, replace=False)
    )
    if vocab_overlap_with is not None and vocab_overlap_with.text_pool:
        half = len(text_pool) // 2
        text_pool[:half] = list(
            rng.choice(vocab_overlap_with.text_pool, size=half, replace=False)
        )
    entity_pool = word_pool(rng, entity_pool_size, prefix=name[:3] + "_")
    return Topic(topic_id, name, cols, entity_pool, cat_pools, text_pool)


def generate_base_table(
    topic: Topic, n_rows: int, seed: int = 0
) -> pd.DataFrame:
    """The topic's base table; every value is a string (open-data style).

    Row ``r`` of the base table is a stable tuple: derived tables that
    sample the same base row carry *identical* tuples, reproducing the
    lake redundancy the paper targets.
    """
    rng = np.random.default_rng(700_000 + topic.topic_id * 97 + seed)
    n_rows = min(n_rows, len(topic.entity_pool))
    entities = list(rng.choice(topic.entity_pool, size=n_rows, replace=False))
    data: dict[str, list[str]] = {}
    for col in topic.columns:
        if col.kind == "entity":
            vals = entities
        elif col.kind == "person":
            vals = [
                f"{rng.choice(FIRST_NAMES)} {rng.choice(LAST_NAMES)}"
                for _ in range(n_rows)
            ]
        elif col.kind == "city":
            vals = list(rng.choice(CITIES, size=n_rows))
        elif col.kind == "country":
            vals = list(rng.choice(COUNTRIES, size=n_rows))
        elif col.kind == "category":
            vals = list(rng.choice(topic.category_pools[col.base_col_id], size=n_rows))
        elif col.kind == "number":
            vals = [str(int(v)) for v in rng.integers(1, 100_000, size=n_rows)]
        elif col.kind == "date":
            days = rng.integers(0, 7300, size=n_rows)
            vals = [
                str(pd.Timestamp("2000-01-01") + pd.Timedelta(int(d), "D"))[:10]
                for d in days
            ]
        elif col.kind == "phone":
            vals = [
                f"{rng.integers(100, 999)} {rng.integers(100, 999)}-{rng.integers(1000, 9999)}"
                for _ in range(n_rows)
            ]
        elif col.kind == "text":
            vals = [
                " ".join(rng.choice(topic.text_pool, size=3)) for _ in range(n_rows)
            ]
        else:  # pragma: no cover - spec kinds are closed
            raise ValueError(f"unknown column kind {col.kind!r}")
        data[col.canonical_header] = [str(v) for v in vals]
    return pd.DataFrame(data)
