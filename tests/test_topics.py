"""Topic/vocabulary generators."""
import numpy as np
import pytest

from repro.lake.topics import (
    COUNTRIES,
    Topic,
    generate_base_table,
    make_topic,
    pseudo_word,
    word_pool,
)


class TestPseudoWords:
    def test_deterministic(self):
        a = pseudo_word(np.random.default_rng(1))
        b = pseudo_word(np.random.default_rng(1))
        assert a == b

    def test_pronounceable_structure(self):
        w = pseudo_word(np.random.default_rng(0), 3)
        assert len(w) == 6  # 3 CV syllables

    def test_word_pool_unique(self):
        pool = word_pool(np.random.default_rng(2), 50)
        assert len(set(pool)) == 50

    def test_word_pool_prefix(self):
        pool = word_pool(np.random.default_rng(3), 10, prefix="xx_")
        assert all(w.startswith("xx_") for w in pool)


class TestMakeTopic:
    def test_deterministic(self):
        t1 = make_topic(3, n_columns=8)
        t2 = make_topic(3, n_columns=8)
        assert t1.name == t2.name
        assert [c.canonical_header for c in t1.columns] == [
            c.canonical_header for c in t2.columns
        ]

    def test_distinct_topics_distinct_entities(self):
        t1, t2 = make_topic(1), make_topic(2)
        assert not (set(t1.entity_pool) & set(t2.entity_pool))

    def test_first_column_is_entity(self):
        assert make_topic(5).columns[0].kind == "entity"

    def test_min_three_columns(self):
        assert len(make_topic(6, n_columns=1).columns) >= 3

    def test_headers_unique_within_topic(self):
        t = make_topic(7, n_columns=12)
        canon = [c.canonical_header for c in t.columns]
        assert len(canon) == len(set(canon))

    def test_sibling_overlap_shares_vocab(self):
        t = make_topic(8, n_columns=8)
        sib = make_topic(9, n_columns=8, vocab_overlap_with=t)
        t_vocab = set(t.text_pool) | {
            v for pool in t.category_pools.values() for v in pool
        }
        sib_vocab = set(sib.text_pool) | {
            v for pool in sib.category_pools.values() for v in pool
        }
        assert t_vocab & sib_vocab


class TestBaseTable:
    def test_shape(self):
        t = make_topic(10, n_columns=8)
        df = generate_base_table(t, 50)
        assert len(df) == 50
        assert list(df.columns) == [c.canonical_header for c in t.columns]

    def test_deterministic(self):
        t = make_topic(11)
        a = generate_base_table(t, 30)
        b = generate_base_table(t, 30)
        assert a.equals(b)

    def test_all_strings(self):
        t = make_topic(12)
        df = generate_base_table(t, 10)
        for c in df.columns:
            assert all(isinstance(v, str) for v in df[c])

    def test_entities_unique(self):
        t = make_topic(13)
        df = generate_base_table(t, 60)
        ent = df[t.columns[0].canonical_header]
        assert ent.nunique() == 60

    def test_country_values_from_shared_pool(self):
        t = make_topic(14, n_columns=8)
        country_cols = [c for c in t.columns if c.kind == "country"]
        if not country_cols:
            pytest.skip("no country column in this schema")
        df = generate_base_table(t, 40)
        vals = set(df[country_cols[0].canonical_header])
        assert vals <= set(COUNTRIES)

    def test_rows_capped_by_entity_pool(self):
        t = make_topic(15, entity_pool_size=20)
        df = generate_base_table(t, 100)
        assert len(df) == 20
