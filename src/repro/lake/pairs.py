"""The fine-tuning pair benchmark (Sec. 6.1.1, "TUS Fine-tuning").

Data points are (serialized tuple, serialized tuple, label) with label 1
iff the tuples come from the same table or two unionable tables, 0 iff
from non-unionable tables. The set is balanced; the 70:15:15 split is
leakage-free by construction: every *tuple* is assigned to exactly one
split and pairs are formed only within a split, so no tuple (let alone a
pair) appears in two splits.

The paper also builds the Ditto (entity matching) baseline by
fine-tuning on a different labeling; :func:`entity_match_pairs` relabels
the same tuples for that task — positives are copies of the *same base
row* (same entity), everything else negative.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.serialize import serialize_row
from repro.lake.benchmark import Benchmark, LakeTable


@dataclass
class PairSplit:
    pairs: list[tuple[str, str]]
    labels: np.ndarray


@dataclass
class PairBenchmark:
    train: PairSplit
    val: PairSplit
    test: PairSplit


@dataclass
class _TupleRef:
    table: LakeTable
    row: int  # position within table.df

    def serialized(self) -> str:
        return serialize_row(self.table.df.iloc[self.row])

    @property
    def base_row(self) -> tuple[int, int]:
        return (self.table.base_id, self.table.row_ids[self.row])


def _split_tuples(
    bench: Benchmark, rng: np.random.Generator
) -> dict[str, list[_TupleRef]]:
    """Assign every lake tuple to train/val/test (70:15:15)."""
    refs = [
        _TupleRef(t, r)
        for t in bench.lake + bench.queries
        for r in range(t.n_rows)
    ]
    order = rng.permutation(len(refs))
    n = len(refs)
    cut1, cut2 = int(0.7 * n), int(0.85 * n)
    return {
        "train": [refs[i] for i in order[:cut1]],
        "val": [refs[i] for i in order[cut1:cut2]],
        "test": [refs[i] for i in order[cut2:]],
    }


def _unionable_lookup(bench: Benchmark) -> dict[str, set[str]]:
    """table name -> names of tables unionable with it (same base)."""
    by_base: dict[int, list[str]] = {}
    for t in bench.lake + bench.queries:
        by_base.setdefault(t.base_id, []).append(t.name)
    return {
        name: set(names)
        for names in by_base.values()
        for name in names
    }


def _sample_unionability_pairs(
    refs: list[_TupleRef],
    n_pairs: int,
    rng: np.random.Generator,
    lookup: dict[str, set[str]],
) -> PairSplit:
    """Balanced unionability pairs within one split.

    Positives are steered (pick a table, then a tuple from one of its
    unionable partner tables — including itself, "same table" is the
    paper's self-supervised positive); negatives are drawn uniformly and
    rejected if unionable.
    """
    by_table: dict[str, list[_TupleRef]] = {}
    for r in refs:
        by_table.setdefault(r.table.name, []).append(r)
    names = list(by_table)
    partner_names = {
        n: [m for m in names if m in lookup[n]] for n in names
    }
    pairs: list[tuple[str, str]] = []
    labels: list[int] = []
    want_pos = n_pairs // 2
    guard = 0
    while want_pos > 0 and guard < 100 * n_pairs:
        guard += 1
        tname = names[int(rng.integers(len(names)))]
        partners = partner_names[tname]
        if not partners:
            continue
        a_group = by_table[tname]
        b_group = by_table[partners[int(rng.integers(len(partners)))]]
        a = a_group[int(rng.integers(len(a_group)))]
        b = b_group[int(rng.integers(len(b_group)))]
        if a is b:
            continue
        pairs.append((a.serialized(), b.serialized()))
        labels.append(1)
        want_pos -= 1
    want_neg = n_pairs - len(pairs)
    # Hard negatives: tuples from sibling topics (same subject-area
    # vocabulary, non-unionable schema — benchmark.py links topic t and
    # sibling 10000+t). Half the negatives are drawn hard when siblings
    # exist, mirroring how real non-unionable Open Data tables still
    # share subject matter.
    hard_pool: dict[int, list[_TupleRef]] = {}
    for r in refs:
        hard_pool.setdefault(r.table.base_id, []).append(r)
    sibling_pairs = [
        (b1, b2)
        for b1 in hard_pool
        for b2 in hard_pool
        if b2 == b1 + 10_000
    ]
    guard = 0
    while want_neg > 0 and guard < 100 * n_pairs:
        guard += 1
        if sibling_pairs and rng.random() < 0.5:
            b1, b2 = sibling_pairs[int(rng.integers(len(sibling_pairs)))]
            g1, g2 = hard_pool[b1], hard_pool[b2]
            a = g1[int(rng.integers(len(g1)))]
            b = g2[int(rng.integers(len(g2)))]
        else:
            a = refs[int(rng.integers(len(refs)))]
            b = refs[int(rng.integers(len(refs)))]
        if a is b or b.table.name in lookup[a.table.name]:
            continue
        pairs.append((a.serialized(), b.serialized()))
        labels.append(0)
        want_neg -= 1
    return PairSplit(pairs, np.asarray(labels, dtype=np.int64))


def build_pair_benchmark(
    bench: Benchmark, *, n_pairs: int = 6000, seed: int = 0
) -> PairBenchmark:
    """Unionability pairs (the DUST fine-tuning task)."""
    rng = np.random.default_rng(seed)
    lookup = _unionable_lookup(bench)
    splits = _split_tuples(bench, rng)
    return PairBenchmark(
        train=_sample_unionability_pairs(
            splits["train"], int(0.7 * n_pairs), rng, lookup
        ),
        val=_sample_unionability_pairs(
            splits["val"], int(0.15 * n_pairs), rng, lookup
        ),
        test=_sample_unionability_pairs(
            splits["test"], int(0.15 * n_pairs), rng, lookup
        ),
    )


def build_entity_match_benchmark(
    bench: Benchmark, *, n_pairs: int = 6000, seed: int = 1
) -> PairBenchmark:
    """Entity-match pairs (the Ditto analog's training task): label 1 iff
    the two tuples are derived from the same base row (same entity)."""
    rng = np.random.default_rng(seed)

    def is_same_entity(a: _TupleRef, b: _TupleRef) -> int:
        return int(a.base_row == b.base_row)

    splits = _split_tuples(bench, rng)
    out = {}
    for key, refs in splits.items():
        # Same-entity positives are rare under uniform sampling; index by
        # base row for direct draws.
        by_entity: dict[tuple[int, int], list[_TupleRef]] = {}
        for r in refs:
            by_entity.setdefault(r.base_row, []).append(r)
        dup_entities = [k for k, v in by_entity.items() if len(v) > 1]
        n_split = int(
            {"train": 0.7, "val": 0.15, "test": 0.15}[key] * n_pairs
        )
        pairs: list[tuple[str, str]] = []
        labels: list[int] = []
        want_pos = n_split // 2
        while want_pos > 0 and dup_entities:
            ent = dup_entities[int(rng.integers(len(dup_entities)))]
            group = by_entity[ent]
            i, j = rng.choice(len(group), size=2, replace=False)
            pairs.append((group[int(i)].serialized(), group[int(j)].serialized()))
            labels.append(1)
            want_pos -= 1
        # Entity matching is trained within a domain (two catalogs of the
        # same kind of entity), so negatives are *same-topic* different-
        # entity pairs — the model learns to separate tuples that are in
        # fact unionable, which is exactly why an EM encoder underserves
        # unionability (Fig 6's Ditto row).
        by_topic: dict[int, list[_TupleRef]] = {}
        for r in refs:
            by_topic.setdefault(r.table.base_id, []).append(r)
        topics = [t for t, v in by_topic.items() if len(v) > 1]
        want_neg = n_split - len(pairs)
        guard = 0
        while want_neg > 0 and guard < 100 * n_split:
            guard += 1
            if topics and rng.random() < 0.55:
                group = by_topic[topics[int(rng.integers(len(topics)))]]
                a = group[int(rng.integers(len(group)))]
                b = group[int(rng.integers(len(group)))]
            else:
                a = refs[int(rng.integers(len(refs)))]
                b = refs[int(rng.integers(len(refs)))]
            if a is b or a.base_row == b.base_row:
                continue
            pairs.append((a.serialized(), b.serialized()))
            labels.append(0)
            want_neg -= 1
        out[key] = PairSplit(pairs, np.asarray(labels, dtype=np.int64))
    return PairBenchmark(out["train"], out["val"], out["test"])
