"""Algorithm 1 end-to-end on Spark."""
import numpy as np
import pytest

from repro.core.metrics import average_diversity, min_diversity
from repro.core.pipeline import run_dust, serialize_tuples_df
from repro.core.serialize import serialize_table
from repro.core.union import UID_COL


class TestSerializeStage:
    def test_serialized_column_appended(self, spark, tiny_santos):
        q = tiny_santos.queries[0]
        sdf = spark.createDataFrame(q.df.astype(str))
        out = serialize_tuples_df(sdf, list(q.df.columns)).toPandas()
        assert out["serialized"].str.startswith("[CLS]").all()

    def test_matches_driver_serialization(self, spark, tiny_santos):
        q = tiny_santos.queries[0]
        sdf = spark.createDataFrame(q.df.astype(str)).coalesce(1)
        out = serialize_tuples_df(sdf, list(q.df.columns)).toPandas()
        assert sorted(out["serialized"]) == sorted(serialize_table(q.df))


class TestRunDust:
    @pytest.fixture(scope="class")
    def result(self, spark, tiny_santos, tiny_model):
        return run_dust(
            spark,
            tiny_santos,
            tiny_santos.queries[0].name,
            k=15,
            tuple_model=tiny_model,
            search="ground_truth",
            top_n=3,
            s=400,
        )

    def test_returns_k_tuples(self, result):
        assert len(result.selected) == 15
        assert result.selected_embeddings.shape[0] == 15

    def test_provenance_from_searched_tables(self, result, tiny_santos):
        assert set(result.selected["_src_table"]) <= set(result.searched_tables)

    def test_query_embeddings_shape(self, result, tiny_santos):
        assert result.query_embeddings.shape[0] == tiny_santos.queries[0].n_rows

    def test_uids_unique(self, result):
        assert result.selected[UID_COL].is_unique

    def test_starmie_search_path(self, spark, tiny_santos, tiny_model):
        res = run_dust(
            spark,
            tiny_santos,
            tiny_santos.queries[0].name,
            k=5,
            tuple_model=tiny_model,
            search="starmie",
            top_n=3,
            s=200,
        )
        assert len(res.selected) == 5
        truth = set(tiny_santos.unionable[tiny_santos.queries[0].name])
        # Starmie search should find mostly truly unionable tables.
        assert len(set(res.searched_tables) & truth) >= 2

    def test_unknown_search_raises(self, spark, tiny_santos, tiny_model):
        with pytest.raises(ValueError):
            run_dust(
                spark, tiny_santos, tiny_santos.queries[0].name, 5,
                tiny_model, search="bm25",
            )

    def test_diversity_beats_similarity_search(self, spark, tiny_santos, tiny_model, result):
        """The headline claim: DUST's k tuples are more diverse than the
        top-k most *similar* tuples (Table 3's shape)."""
        from repro.embed.models import make_model
        from repro.lake.search import starmie_tuple_topk_spark

        q = tiny_santos.queries[0]
        tables = tiny_santos.unionable_tables(q.name)[:3]
        top = starmie_tuple_topk_spark(spark, q, tables, 15, make_model("starmie"))
        E_sim = tiny_model.embed_texts(top["serialized"].tolist())
        Q = result.query_embeddings
        assert min_diversity(Q, result.selected_embeddings) >= min_diversity(Q, E_sim)
        assert average_diversity(Q, result.selected_embeddings) > average_diversity(Q, E_sim)
