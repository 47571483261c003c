"""Benchmark generators: structure, ground truth, redundancy."""
import numpy as np
import pytest

from repro.lake.benchmark import (
    benchmark_stats,
    imdb_lite,
    santos_lite,
    tus_lite,
    tus_sampled_lite,
    ugen_v1_lite,
)


class TestStructure:
    def test_santos_counts(self, tiny_santos):
        assert len(tiny_santos.queries) == 2
        assert len(tiny_santos.lake) == 6

    def test_unionable_map_complete(self, tiny_santos):
        for q in tiny_santos.queries:
            assert q.name in tiny_santos.unionable
            assert len(tiny_santos.unionable[q.name]) == 3

    def test_unionable_tables_share_base(self, tiny_santos):
        for q in tiny_santos.queries:
            for t in tiny_santos.unionable_tables(q.name):
                assert t.base_id == q.base_id

    def test_table_lookup(self, tiny_santos):
        t = tiny_santos.lake[0]
        assert tiny_santos.table(t.name) is t
        with pytest.raises(KeyError):
            tiny_santos.table("nope")

    def test_col_map_covers_all_columns(self, tiny_santos):
        for t in tiny_santos.queries + tiny_santos.lake:
            assert set(t.col_map) == set(t.df.columns)

    def test_min_three_columns(self, tiny_santos):
        for t in tiny_santos.queries + tiny_santos.lake:
            assert t.n_cols >= 3

    def test_row_ids_tracked(self, tiny_santos):
        for t in tiny_santos.queries + tiny_santos.lake:
            assert len(t.row_ids) == t.n_rows

    def test_deterministic(self):
        a = santos_lite(n_topics=2, lake_per_topic=2)
        b = santos_lite(n_topics=2, lake_per_topic=2)
        assert [t.name for t in a.lake] == [t.name for t in b.lake]
        assert a.lake[0].df.equals(b.lake[0].df)


class TestRedundancy:
    def test_lake_tables_overlap_query_rows(self, tiny_santos):
        """The redundancy knob: unionable tables re-use query base rows."""
        q = tiny_santos.queries[0]
        overlaps = []
        for t in tiny_santos.unionable_tables(q.name):
            overlaps.append(len(set(t.row_ids) & set(q.row_ids)) / t.n_rows)
        assert max(overlaps) > 0.3

    def test_same_base_row_identical_tuple(self, tiny_santos):
        q = tiny_santos.queries[0]
        t = tiny_santos.unionable_tables(q.name)[0]
        shared = set(t.row_ids) & set(q.row_ids)
        if not shared:
            pytest.skip("no shared rows in this sample")
        r = next(iter(shared))
        qi = q.row_ids.index(r)
        ti = t.row_ids.index(r)
        # Values agree on every column pair mapped to the same base col.
        q_by_base = {b: c for c, b in q.col_map.items()}
        for tc, b in t.col_map.items():
            if b in q_by_base:
                assert t.df.iloc[ti][tc] == q.df.iloc[qi][q_by_base[b]]


class TestUgen:
    def test_has_hard_negatives(self, tiny_ugen):
        neg = [t for t in tiny_ugen.lake if t.base_id >= 10_000]
        assert len(neg) > 0

    def test_negatives_not_unionable(self, tiny_ugen):
        for q in tiny_ugen.queries:
            names = set(tiny_ugen.unionable[q.name])
            for t in tiny_ugen.lake:
                if t.base_id >= 10_000:
                    assert t.name not in names

    def test_tiny_tables(self, tiny_ugen):
        for t in tiny_ugen.lake:
            assert t.n_rows <= 14


class TestTusSampled:
    def test_subsample_of_tus(self):
        sub = tus_sampled_lite(n_queries=3, per_query=4)
        assert len(sub.queries) == 3
        for q in sub.queries:
            assert len(sub.unionable[q.name]) == 4
        lake_names = {t.name for t in sub.lake}
        for names in sub.unionable.values():
            assert set(names) <= lake_names


class TestImdb:
    def test_single_query_13_columns(self, tiny_imdb):
        assert len(tiny_imdb.queries) == 1
        assert tiny_imdb.queries[0].n_cols == 13

    def test_imdb_headers(self, tiny_imdb):
        assert "title" in tiny_imdb.queries[0].df.columns
        assert "filming_locations" in tiny_imdb.queries[0].df.columns

    def test_all_tables_unionable(self, tiny_imdb):
        q = tiny_imdb.queries[0]
        assert set(tiny_imdb.unionable[q.name]) == {t.name for t in tiny_imdb.lake}

    def test_row_counts(self):
        b = imdb_lite(n_tables=3, rows_per_table=50)
        assert all(t.n_rows == 50 for t in b.lake)


class TestStats:
    def test_stats_fields(self, tiny_santos):
        s = benchmark_stats(tiny_santos)
        assert s["query_tables"] == 2
        assert s["lake_tables"] == 6
        assert s["avg_unionable_per_query"] == 3.0
        assert s["lake_tuples"] == sum(t.n_rows for t in tiny_santos.lake)

    def test_stats_consistent_columns(self, tiny_ugen):
        s = benchmark_stats(tiny_ugen)
        assert s["lake_columns"] == sum(t.n_cols for t in tiny_ugen.lake)
