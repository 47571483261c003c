"""Distributed embedding stage (mapInPandas)."""
import numpy as np
import pandas as pd
import pytest

from repro.embed.models import EMBED_DIM, make_model
from repro.embed.spark_embed import embed_dataframe


@pytest.fixture(scope="module")
def texts_df(spark):
    pdf = pd.DataFrame(
        {"id": list(range(12)), "serialized": [f"[CLS] a tok{i} [SEP]" for i in range(12)]}
    )
    return spark.createDataFrame(pdf), pdf


class TestEmbedDataframe:
    def test_appends_embedding_column(self, texts_df):
        df, _ = texts_df
        out = embed_dataframe(df, "serialized", make_model("roberta"))
        assert out.columns == ["id", "serialized", "embedding"]

    def test_matches_driver_side(self, texts_df):
        df, pdf = texts_df
        model = make_model("roberta")
        got = embed_dataframe(df, "serialized", model).toPandas().sort_values("id")
        want = model.embed_texts(pdf["serialized"].tolist())
        E = np.stack(got["embedding"].to_list())
        assert np.allclose(E, want, atol=1e-12)

    def test_dimension(self, texts_df):
        df, _ = texts_df
        got = embed_dataframe(df, "serialized", make_model("bert")).toPandas()
        assert all(len(e) == EMBED_DIM for e in got["embedding"])

    def test_finetuned_model_works(self, texts_df, tiny_model):
        df, pdf = texts_df
        got = embed_dataframe(df, "serialized", tiny_model).toPandas().sort_values("id")
        want = tiny_model.embed_texts(pdf["serialized"].tolist())
        assert np.allclose(np.stack(got["embedding"].to_list()), want, atol=1e-12)

    def test_preserves_row_count_under_partitioning(self, spark):
        pdf = pd.DataFrame({"serialized": [f"[CLS] x{i} [SEP]" for i in range(100)]})
        df = spark.createDataFrame(pdf).repartition(8)
        out = embed_dataframe(df, "serialized", make_model("glove"))
        assert out.count() == 100
