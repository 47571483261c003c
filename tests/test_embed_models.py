"""Embedding model zoo behaviours the experiments rely on."""
import numpy as np
import pytest

from repro.cluster.distance import cosine_distance_matrix
from repro.embed.models import EMBED_DIM, MODEL_NAMES, make_model
from repro.tokenize import IdfWeights, tokenize


@pytest.fixture(scope="module")
def idf():
    docs = [tokenize(t) for t in ("park city usa", "movie title actor", "a b c")]
    return IdfWeights(docs)


class TestZoo:
    def test_all_models_instantiate(self):
        for name in MODEL_NAMES:
            assert make_model(name).name == name

    def test_unknown_model_raises(self):
        with pytest.raises(ValueError):
            make_model("gpt7")

    def test_embed_dim(self):
        E = make_model("roberta").embed_texts(["park", "city"])
        assert E.shape == (2, EMBED_DIM)

    def test_deterministic_across_instances(self):
        a = make_model("bert").embed_texts(["park city"])
        b = make_model("bert").embed_texts(["park city"])
        assert np.allclose(a, b)

    def test_models_have_distinct_spaces(self):
        a = make_model("bert").embed_texts(["park city"])
        b = make_model("roberta").embed_texts(["park city"])
        assert not np.allclose(a, b)

    def test_empty_text(self):
        E = make_model("roberta").embed_texts([""])
        assert E.shape == (1, EMBED_DIM)
        assert np.all(np.isfinite(E))


class TestAnisotropy:
    """Raw BERT/RoBERTa cosine distances collapse (bias cone); sBERT
    less so; euclidean differences survive — the mechanisms behind
    Fig 6 and Table 1."""

    def test_bert_cosines_collapsed(self):
        m = make_model("bert")
        E = m.embed_texts(["park city usa", "stock price market", "disease virus"])
        D = cosine_distance_matrix(E)
        off = D[np.triu_indices(3, 1)]
        assert off.max() < 0.2  # all pairs look similar under cosine

    def test_sbert_cosines_spread_more(self):
        texts = ["park city usa", "stock price market", "disease virus lab"]
        Db = cosine_distance_matrix(make_model("bert").embed_texts(texts))
        Ds = cosine_distance_matrix(make_model("sbert").embed_texts(texts))
        assert Ds[np.triu_indices(3, 1)].mean() > Db[np.triu_indices(3, 1)].mean()

    def test_bias_cancels_in_euclidean(self):
        m = make_model("bert")
        E = m.embed_texts(["park city", "stock market"])
        no_bias = E - m.bias
        d_with = np.linalg.norm(E[0] - E[1])
        d_without = np.linalg.norm(no_bias[0] - no_bias[1])
        assert d_with == pytest.approx(d_without)


class TestColumnEmbeddings:
    def test_cell_level_average(self, idf):
        m = make_model("roberta", idf)
        e = m.embed_column_cell_level(["park", "city"])
        assert e.shape == (EMBED_DIM,)

    def test_cell_level_skips_empty_cells(self, idf):
        m = make_model("roberta", idf)
        a = m.embed_column_cell_level(["park", "", None])
        b = m.embed_column_cell_level(["park"])
        assert np.allclose(a, b)

    def test_column_level_caps_tokens(self, idf):
        m = make_model("roberta", idf)
        cells = [f"tok{i}" for i in range(2000)]
        e = m.embed_column_column_level(cells, idf)
        assert np.all(np.isfinite(e))

    def test_similar_columns_closer_than_different(self, idf):
        m = make_model("roberta", idf)
        c1 = m.embed_column_column_level(["usa", "canada", "france"], idf)
        c2 = m.embed_column_column_level(["canada", "france", "japan"], idf)
        c3 = m.embed_column_column_level(["impressionism", "cubism"], idf)
        assert np.linalg.norm(c1 - c2) < np.linalg.norm(c1 - c3)

    def test_table_context_pulls_columns_together(self, idf):
        m = make_model("starmie", idf)
        cols = [["usa", "canada"], ["rock", "jazz", "pop"]]
        E0 = m.embed_table_columns(cols, idf, table_context=0.0)
        E5 = m.embed_table_columns(cols, idf, table_context=0.5)
        assert np.linalg.norm(E5[0] - E5[1]) < np.linalg.norm(E0[0] - E0[1])

    def test_unknown_level_raises(self, idf, tiny_santos):
        from repro.core.align import embed_columns

        with pytest.raises(ValueError):
            embed_columns([tiny_santos.queries[0]], make_model("bert"), idf, level="row")
