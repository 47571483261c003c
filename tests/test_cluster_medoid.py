"""Medoid selection."""
import numpy as np
import pytest

from repro.cluster import medoid_index, medoids
from repro.cluster.distance import euclidean_distance_matrix


class TestMedoidIndex:
    def test_central_point_wins(self):
        X = np.array([[0.0], [1.0], [2.0]])
        D = euclidean_distance_matrix(X)
        assert medoid_index(D, np.array([0, 1, 2])) == 1

    def test_singleton(self):
        X = np.array([[0.0], [9.0]])
        D = euclidean_distance_matrix(X)
        assert medoid_index(D, np.array([1])) == 1

    def test_subset_indices_are_global(self):
        X = np.array([[0.0], [100.0], [101.0], [102.0]])
        D = euclidean_distance_matrix(X)
        assert medoid_index(D, np.array([1, 2, 3])) == 2

    def test_empty_raises(self):
        D = euclidean_distance_matrix(np.array([[0.0]]))
        with pytest.raises(ValueError):
            medoid_index(D, np.array([], dtype=int))

    def test_tie_breaks_low_index(self):
        X = np.array([[0.0], [0.0]])
        D = euclidean_distance_matrix(X)
        assert medoid_index(D, np.array([0, 1])) == 0


class TestMedoids:
    def test_one_per_cluster(self):
        X = np.array([[0.0], [0.1], [10.0], [10.1]])
        D = euclidean_distance_matrix(X)
        labels = np.array([0, 0, 1, 1])
        m = medoids(D, labels)
        assert len(m) == 2
        assert m[0] in (0, 1) and m[1] in (2, 3)

    def test_ordered_by_label(self):
        X = np.array([[5.0], [0.0], [5.1]])
        D = euclidean_distance_matrix(X)
        labels = np.array([1, 0, 1])
        m = medoids(D, labels)
        assert m[0] == 1  # cluster 0's only member

    def test_medoid_is_member(self):
        rng = np.random.default_rng(0)
        X = rng.normal(size=(30, 4))
        D = euclidean_distance_matrix(X)
        labels = rng.integers(0, 5, 30)
        for c, m in zip(np.unique(labels), medoids(D, labels)):
            assert labels[m] == c
