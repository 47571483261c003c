"""Fine-tuning pair benchmarks: balance, labels, leakage."""
import numpy as np

from repro.lake.pairs import (
    build_entity_match_benchmark,
    build_pair_benchmark,
)


class TestUnionabilityPairs:
    def test_balanced(self, tiny_pairs):
        for split in (tiny_pairs.train, tiny_pairs.val, tiny_pairs.test):
            assert abs(split.labels.mean() - 0.5) < 0.05

    def test_split_sizes_70_15_15(self, tiny_pairs):
        n_tr = len(tiny_pairs.train.pairs)
        n_va = len(tiny_pairs.val.pairs)
        n_te = len(tiny_pairs.test.pairs)
        total = n_tr + n_va + n_te
        assert n_tr / total > 0.6
        assert abs(n_va - n_te) / total < 0.1

    def test_pairs_are_serialized_tuples(self, tiny_pairs):
        s1, s2 = tiny_pairs.train.pairs[0]
        assert s1.startswith("[CLS]")
        assert "[SEP]" in s2

    def test_no_tuple_leakage_between_splits(self, tiny_pairs):
        tr = {t for p in tiny_pairs.train.pairs for t in p}
        va = {t for p in tiny_pairs.val.pairs for t in p}
        te = {t for p in tiny_pairs.test.pairs for t in p}
        # Serialized-tuple identity: a tuple string seen in one split
        # must not appear in another. (Distinct base rows can coincide
        # textually only if generation duplicated a full tuple, which
        # per-table unique entities prevent.)
        assert not (tr & va)
        assert not (tr & te)
        assert not (va & te)

    def test_deterministic(self, tiny_tus):
        a = build_pair_benchmark(tiny_tus, n_pairs=400, seed=3)
        b = build_pair_benchmark(tiny_tus, n_pairs=400, seed=3)
        assert a.train.pairs == b.train.pairs
        assert np.array_equal(a.train.labels, b.train.labels)

    def test_seed_changes_pairs(self, tiny_tus):
        a = build_pair_benchmark(tiny_tus, n_pairs=400, seed=3)
        b = build_pair_benchmark(tiny_tus, n_pairs=400, seed=4)
        assert a.train.pairs != b.train.pairs


class TestEntityMatchPairs:
    def test_balanced_when_duplicates_exist(self, tiny_tus):
        em = build_entity_match_benchmark(tiny_tus, n_pairs=600)
        assert 0.3 <= em.train.labels.mean() <= 0.6

    def test_positive_pairs_share_entity_token(self, tiny_tus):
        em = build_entity_match_benchmark(tiny_tus, n_pairs=600)
        pos = [p for p, l in zip(em.train.pairs, em.train.labels) if l == 1][:20]
        # Same base row => same entity value appears in both serializations.
        share = 0
        for s1, s2 in pos:
            t1 = set(s1.split())
            t2 = set(s2.split())
            if len(t1 & t2) >= 3:
                share += 1
        assert share >= len(pos) * 0.8

    def test_labels_binary(self, tiny_tus):
        em = build_entity_match_benchmark(tiny_tus, n_pairs=400)
        for split in (em.train, em.val, em.test):
            assert set(np.unique(split.labels)) <= {0, 1}
