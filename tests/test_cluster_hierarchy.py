"""Agglomerative clustering: NN-chain + constrained paths."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.cluster import agglomerative
from repro.cluster.distance import euclidean_distance_matrix


def blobs(centers, n_per, spread=0.05, seed=0):
    rng = np.random.default_rng(seed)
    pts, labels = [], []
    for i, c in enumerate(centers):
        pts.append(np.asarray(c) + spread * rng.normal(size=(n_per, len(c))))
        labels.extend([i] * n_per)
    return np.vstack(pts), np.asarray(labels)


class TestNNChain:
    def test_two_obvious_clusters(self):
        X, true = blobs([[0, 0], [10, 10]], 10)
        D = euclidean_distance_matrix(X)
        labels = agglomerative(D).labels(2)
        # Cluster assignment should match the generating blobs exactly.
        assert len(set(zip(labels, true))) == 2

    def test_three_clusters(self):
        X, true = blobs([[0, 0], [10, 0], [0, 10]], 8)
        D = euclidean_distance_matrix(X)
        labels = agglomerative(D).labels(3)
        assert len(set(zip(labels, true))) == 3

    def test_n_clusters_n_gives_singletons(self):
        X, _ = blobs([[0, 0], [5, 5]], 3)
        D = euclidean_distance_matrix(X)
        labels = agglomerative(D).labels(6)
        assert len(np.unique(labels)) == 6

    def test_one_cluster(self):
        X, _ = blobs([[0, 0], [5, 5]], 3)
        D = euclidean_distance_matrix(X)
        labels = agglomerative(D).labels(1)
        assert len(np.unique(labels)) == 1

    def test_labels_contiguous_from_zero(self):
        X, _ = blobs([[0, 0], [9, 9], [0, 9]], 5)
        D = euclidean_distance_matrix(X)
        for k in (1, 2, 3, 5):
            labels = agglomerative(D).labels(k)
            assert sorted(np.unique(labels)) == list(range(k))

    def test_deterministic(self):
        X, _ = blobs([[0, 0], [3, 3]], 6, seed=3)
        D = euclidean_distance_matrix(X)
        a = agglomerative(D).labels(2)
        b = agglomerative(D).labels(2)
        assert np.array_equal(a, b)

    def test_invalid_cut_raises(self):
        D = euclidean_distance_matrix(np.array([[0.0], [1.0], [2.0]]))
        dend = agglomerative(D)
        with pytest.raises(ValueError):
            dend.labels(0)
        with pytest.raises(ValueError):
            dend.labels(4)

    def test_empty_and_singleton(self):
        assert agglomerative(np.zeros((0, 0))).n == 0
        d1 = agglomerative(np.zeros((1, 1)))
        assert np.array_equal(d1.labels(1), [0])

    def test_non_square_raises(self):
        with pytest.raises(ValueError):
            agglomerative(np.zeros((2, 3)))

    def test_merge_distances_monotone_after_sort(self):
        X, _ = blobs([[0, 0], [4, 4], [8, 0]], 7, seed=5)
        D = euclidean_distance_matrix(X)
        dend = agglomerative(D)
        dists = [m[2] for m in dend.merges]
        assert dists == sorted(dists)

    @given(st.integers(2, 20), st.integers(0, 1000))
    @settings(max_examples=25, deadline=None)
    def test_full_merge_tree_reaches_one_cluster(self, n, seed):
        rng = np.random.default_rng(seed)
        X = rng.normal(size=(n, 3))
        D = euclidean_distance_matrix(X)
        dend = agglomerative(D)
        assert dend.min_clusters == 1
        assert len(np.unique(dend.labels(1))) == 1


class TestConstrained:
    def test_cannot_link_never_merged(self):
        # Two points forced apart despite being identical.
        X = np.array([[0.0, 0.0], [0.0, 0.0], [5.0, 5.0], [5.0, 5.0]])
        D = euclidean_distance_matrix(X)
        groups = np.array([0, 0, 1, 1])  # 0-1 same table, 2-3 same table
        dend = agglomerative(D, cannot_link_groups=groups)
        # Identical same-group points can never co-cluster: min 2 clusters.
        assert dend.min_clusters >= 2
        labels = dend.labels(dend.min_clusters)
        assert labels[0] != labels[1]
        assert labels[2] != labels[3]

    def test_cross_group_merging_allowed(self):
        X = np.array([[0.0], [0.1], [9.0], [9.1]])
        groups = np.array([0, 1, 0, 1])
        D = euclidean_distance_matrix(X)
        labels = agglomerative(D, cannot_link_groups=groups).labels(2)
        assert labels[0] == labels[1]
        assert labels[2] == labels[3]

    def test_unconstrained_marker_minus_one(self):
        X = np.array([[0.0], [0.01], [0.02]])
        groups = np.array([-1, -1, -1])
        dend = agglomerative(euclidean_distance_matrix(X), cannot_link_groups=groups)
        assert dend.min_clusters == 1

    def test_transitive_constraint(self):
        # a(g0) merges with b(g1); the merged cluster contains both
        # groups and may then not absorb c(g0) or d(g1).
        X = np.array([[0.0], [0.05], [0.1], [0.15]])
        groups = np.array([0, 1, 0, 1])
        dend = agglomerative(euclidean_distance_matrix(X), cannot_link_groups=groups)
        labels = dend.labels(dend.min_clusters)
        for g in (0, 1):
            members = np.flatnonzero(groups == g)
            assert labels[members[0]] != labels[members[1]]

    def test_bad_groups_shape_raises(self):
        with pytest.raises(ValueError):
            agglomerative(np.zeros((3, 3)), cannot_link_groups=np.array([0, 1]))

    @given(st.integers(4, 12), st.integers(0, 500))
    @settings(max_examples=25, deadline=None)
    def test_property_no_same_group_cluster(self, n, seed):
        rng = np.random.default_rng(seed)
        X = rng.normal(size=(n, 2))
        groups = rng.integers(0, 3, n)
        dend = agglomerative(
            euclidean_distance_matrix(X), cannot_link_groups=groups
        )
        for k in range(dend.min_clusters, n + 1):
            labels = dend.labels(k)
            for c in np.unique(labels):
                g = groups[labels == c]
                g = g[g >= 0]
                assert len(g) == len(set(g.tolist()))
