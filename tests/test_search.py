"""Table union search baselines."""
import duckdb
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.align import corpus_idf
from repro.core.union import SRC_COL, UID_COL
from repro.embed.models import make_model
from repro.lake.search import (
    d3l_table_scores,
    lake_tuples_df,
    starmie_table_scores,
    starmie_tuple_topk_spark,
    top_n_tables,
)


@pytest.fixture(scope="module")
def search_setup(tiny_santos):
    q = tiny_santos.queries[0]
    idf = corpus_idf([q] + tiny_santos.lake)
    return tiny_santos, q, idf


class TestTableScores:
    def test_starmie_ranks_unionable_first(self, search_setup):
        bench, q, idf = search_setup
        scores = starmie_table_scores(q, bench.lake, idf)
        top3 = top_n_tables(scores, 3)
        truth = set(bench.unionable[q.name])
        assert len(set(top3) & truth) == 3

    def test_d3l_ranks_unionable_high(self, search_setup):
        """D3L aggregates weaker signals than Starmie (value overlap on
        shared-pool columns misfires), so expect most — not necessarily
        all — of the top-3 to be truly unionable."""
        bench, q, idf = search_setup
        scores = d3l_table_scores(q, bench.lake, idf)
        top3 = top_n_tables(scores, 3)
        truth = set(bench.unionable[q.name])
        assert len(set(top3) & truth) >= 2

    def test_scores_sorted_descending(self, search_setup):
        bench, q, idf = search_setup
        scores = starmie_table_scores(q, bench.lake, idf)
        vals = [s for _, s in scores]
        assert vals == sorted(vals, reverse=True)

    def test_all_lake_tables_scored(self, search_setup):
        bench, q, idf = search_setup
        assert len(starmie_table_scores(q, bench.lake, idf)) == len(bench.lake)

    def test_top_n(self, search_setup):
        bench, q, idf = search_setup
        scores = starmie_table_scores(q, bench.lake, idf)
        assert len(top_n_tables(scores, 2)) == 2


class TestLakeTuplesDf:
    def test_row_per_tuple(self, spark, tiny_santos):
        df = lake_tuples_df(spark, tiny_santos.lake[:3])
        assert df.count() == sum(t.n_rows for t in tiny_santos.lake[:3])

    def test_provenance_and_serialization(self, spark, tiny_santos):
        df = lake_tuples_df(spark, tiny_santos.lake[:1]).toPandas()
        t = tiny_santos.lake[0]
        assert set(df[SRC_COL]) == {t.name}
        assert df["serialized"].str.startswith("[CLS]").all()

    def test_tuple_count_matches_duckdb(self, spark, tiny_santos):
        """Per-table counts re-checked in SQL."""
        tables = tiny_santos.lake[:3]
        df = lake_tuples_df(spark, tables)
        got = df.groupBy(SRC_COL).count().toPandas().sort_values(SRC_COL)
        con = duckdb.connect()
        try:
            frames = pd.concat(
                [pd.DataFrame({SRC_COL: [t.name] * t.n_rows}) for t in tables]
            )
            con.register("tup", frames)
            want = con.execute(
                f"select {SRC_COL}, count(*) as count from tup group by 1 order by 1"
            ).fetchdf()
        finally:
            con.close()
        assert list(got["count"]) == list(want["count"])


class TestTupleTopK:
    def test_returns_k(self, spark, tiny_santos):
        q = tiny_santos.queries[0]
        top = starmie_tuple_topk_spark(
            spark, q, tiny_santos.lake[:4], 10, make_model("starmie")
        )
        assert len(top) == 10

    def test_similarity_descending(self, spark, tiny_santos):
        q = tiny_santos.queries[0]
        top = starmie_tuple_topk_spark(
            spark, q, tiny_santos.lake[:4], 10, make_model("starmie")
        )
        sims = top["similarity"].to_numpy()
        assert np.all(np.diff(sims) <= 1e-12)

    def test_favors_unionable_tuples(self, spark, tiny_santos):
        """Similarity search pulls from unionable (same-base) tables."""
        q = tiny_santos.queries[0]
        mixed = tiny_santos.unionable_tables(q.name)[:2] + [
            t for t in tiny_santos.lake if t.base_id != q.base_id
        ][:2]
        top = starmie_tuple_topk_spark(spark, q, mixed, 15, make_model("starmie"))
        truth = set(tiny_santos.unionable[q.name])
        frac_unionable = top[SRC_COL].isin(truth).mean()
        assert frac_unionable > 0.8
