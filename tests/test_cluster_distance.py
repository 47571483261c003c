"""Distance matrix helpers."""
import numpy as np
import pytest

from repro.cluster.distance import (
    cosine_distance_matrix,
    distance_matrix,
    euclidean_distance_matrix,
    l2_normalize,
)


class TestNormalize:
    def test_unit_norm(self):
        X = np.array([[3.0, 4.0]])
        assert np.linalg.norm(l2_normalize(X)) == pytest.approx(1.0)

    def test_zero_row_stays_zero(self):
        X = np.zeros((1, 4))
        assert np.allclose(l2_normalize(X), 0.0)


class TestCosine:
    def test_self_distance_zero(self):
        rng = np.random.default_rng(0)
        X = rng.normal(size=(5, 8))
        D = cosine_distance_matrix(X)
        assert np.allclose(np.diag(D), 0.0)

    def test_orthogonal_is_one(self):
        X = np.array([[1.0, 0.0], [0.0, 1.0]])
        assert cosine_distance_matrix(X)[0, 1] == pytest.approx(1.0)

    def test_opposite_is_two(self):
        X = np.array([[1.0, 0.0], [-1.0, 0.0]])
        assert cosine_distance_matrix(X)[0, 1] == pytest.approx(2.0)

    def test_symmetric(self):
        rng = np.random.default_rng(1)
        X = rng.normal(size=(6, 4))
        D = cosine_distance_matrix(X)
        assert np.allclose(D, D.T)

    def test_rectangular_cross(self):
        rng = np.random.default_rng(2)
        X = rng.normal(size=(3, 4))
        Y = rng.normal(size=(5, 4))
        assert cosine_distance_matrix(X, Y).shape == (3, 5)

    def test_scale_invariant(self):
        X = np.array([[1.0, 2.0], [2.0, 1.0]])
        assert np.allclose(
            cosine_distance_matrix(X), cosine_distance_matrix(10 * X)
        )


class TestEuclidean:
    def test_known_value(self):
        X = np.array([[0.0, 0.0], [3.0, 4.0]])
        assert euclidean_distance_matrix(X)[0, 1] == pytest.approx(5.0)

    def test_diag_zero(self):
        rng = np.random.default_rng(3)
        X = rng.normal(size=(4, 3))
        assert np.allclose(np.diag(euclidean_distance_matrix(X)), 0.0)

    def test_cross_block(self):
        X = np.array([[0.0]])
        Y = np.array([[1.0], [2.0]])
        D = euclidean_distance_matrix(X, Y)
        assert np.allclose(D, [[1.0, 2.0]])

    def test_triangle_inequality(self):
        rng = np.random.default_rng(4)
        X = rng.normal(size=(10, 3))
        D = euclidean_distance_matrix(X)
        for i in range(10):
            for j in range(10):
                for k in range(10):
                    assert D[i, j] <= D[i, k] + D[k, j] + 1e-9


class TestDispatch:
    def test_cosine(self):
        X = np.eye(2)
        assert np.allclose(distance_matrix(X, "cosine"), cosine_distance_matrix(X))

    def test_euclidean(self):
        X = np.eye(2)
        assert np.allclose(
            distance_matrix(X, "euclidean"), euclidean_distance_matrix(X)
        )

    def test_unknown_raises(self):
        with pytest.raises(ValueError):
            distance_matrix(np.eye(2), "manhattan-typo")
