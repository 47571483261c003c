"""Silhouette coefficient and best-cut selection."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.cluster import agglomerative
from repro.cluster.distance import euclidean_distance_matrix
from repro.cluster.silhouette import best_cut, silhouette_score

from tests.test_cluster_hierarchy import blobs


class TestSilhouette:
    def test_perfect_separation_near_one(self):
        X, true = blobs([[0, 0], [100, 100]], 10)
        D = euclidean_distance_matrix(X)
        assert silhouette_score(D, true) > 0.95

    def test_random_labels_score_lower(self):
        X, true = blobs([[0, 0], [100, 100]], 10)
        D = euclidean_distance_matrix(X)
        rng = np.random.default_rng(0)
        rand = rng.integers(0, 2, len(true))
        assert silhouette_score(D, true) > silhouette_score(D, rand)

    def test_bounds(self):
        rng = np.random.default_rng(1)
        X = rng.normal(size=(20, 3))
        D = euclidean_distance_matrix(X)
        labels = rng.integers(0, 4, 20)
        s = silhouette_score(D, labels)
        assert -1.0 <= s <= 1.0

    def test_single_cluster_raises(self):
        D = euclidean_distance_matrix(np.zeros((4, 2)))
        with pytest.raises(ValueError):
            silhouette_score(D, np.zeros(4, dtype=int))

    def test_singleton_clusters_score_zero(self):
        # All singletons is invalid (n_clusters == n); two real + rest.
        X = np.array([[0.0], [0.1], [5.0]])
        D = euclidean_distance_matrix(X)
        s = silhouette_score(D, np.array([0, 0, 1]))
        assert -1.0 <= s <= 1.0

    @given(st.integers(4, 15), st.integers(0, 300))
    @settings(max_examples=25, deadline=None)
    def test_property_bounds(self, n, seed):
        rng = np.random.default_rng(seed)
        X = rng.normal(size=(n, 2))
        D = euclidean_distance_matrix(X)
        labels = rng.integers(0, max(2, n // 2), n)
        if len(np.unique(labels)) < 2:
            return
        assert -1.0 <= silhouette_score(D, labels) <= 1.0


class TestBestCut:
    def test_recovers_true_k(self):
        X, _ = blobs([[0, 0], [50, 50], [0, 50], [50, 0]], 8, spread=0.5)
        D = euclidean_distance_matrix(X)
        dend = agglomerative(D)
        k, labels, score = best_cut(D, dend)
        assert k == 4
        assert score > 0.8

    def test_two_blobs(self):
        X, _ = blobs([[0, 0], [30, 30]], 10)
        D = euclidean_distance_matrix(X)
        k, _, _ = best_cut(D, agglomerative(D))
        assert k == 2

    def test_respects_k_range(self):
        X, _ = blobs([[0, 0], [30, 30], [60, 0]], 6)
        D = euclidean_distance_matrix(X)
        k, _, _ = best_cut(D, agglomerative(D), k_min=4, k_max=8)
        assert 4 <= k <= 8

    def test_constrained_min_clusters_floor(self):
        # Constraints force >= 2 clusters even when k_min would be lower.
        X = np.zeros((4, 2))
        D = euclidean_distance_matrix(X)
        groups = np.array([0, 0, 0, 0])
        dend = agglomerative(D, cannot_link_groups=groups)
        assert dend.min_clusters == 4
        k, labels, score = best_cut(D, dend, k_min=2)
        assert k == 4  # only reachable cut
        assert np.isnan(score)  # degenerate: no valid sweep range

    def test_labels_match_k(self):
        X, _ = blobs([[0, 0], [20, 20]], 5)
        D = euclidean_distance_matrix(X)
        k, labels, _ = best_cut(D, agglomerative(D))
        assert len(np.unique(labels)) == k
