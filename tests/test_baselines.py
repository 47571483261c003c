"""Diversification baselines: GMC, GNE, CLT, random."""
import numpy as np
import pytest

from repro.core.baselines import (
    clt_select,
    gmc_select,
    gne_select,
    random_select,
)
from repro.core.metrics import average_diversity, min_diversity


@pytest.fixture(scope="module")
def data():
    rng = np.random.default_rng(0)
    modes = rng.normal(size=(6, 8))
    T = np.vstack([m + 0.1 * rng.normal(size=(15, 8)) for m in modes])
    Q = np.repeat(modes[:2], 5, axis=0) + 0.1 * rng.normal(size=(10, 8))
    return T, Q


class TestGMC:
    def test_returns_k_unique(self, data):
        T, Q = data
        idx = gmc_select(T, Q, 10)
        assert len(idx) == 10
        assert len(set(idx.tolist())) == 10

    def test_k_capped_at_n(self, data):
        T, Q = data
        assert len(gmc_select(T[:5], Q, 10)) == 5

    def test_beats_random_on_average_diversity(self, data):
        T, Q = data
        g = average_diversity(Q, T[gmc_select(T, Q, 12)])
        r = average_diversity(Q, T[random_select(T, Q, 12, seed=1)])
        assert g > r

    def test_deterministic(self, data):
        T, Q = data
        assert np.array_equal(gmc_select(T, Q, 8), gmc_select(T, Q, 8))

    def test_pure_diversity_lambda_one(self, data):
        T, Q = data
        idx = gmc_select(T, Q, 5, lam=1.0)
        assert len(idx) == 5

    def test_pure_relevance_lambda_zero(self, data):
        T, Q = data
        idx = gmc_select(T, Q, 5, lam=0.0)
        # With lam=0 GMC picks purely by IR relevance = similarity to
        # the query — the classic MMR degenerate case.
        from repro.core.baselines import _setup

        _, rel = _setup(T, Q, "cosine")
        assert set(idx.tolist()) == set(np.argsort(-rel)[:5].tolist())

    def test_relevance_is_query_similarity(self, data):
        """An exact query copy has maximal relevance (similarity), not
        maximal novelty — the baselines keep their IR semantics."""
        from repro.core.baselines import _setup

        T, Q = data
        T2 = np.vstack([Q[:1], T])
        _, rel = _setup(T2, Q, "cosine")
        assert rel[0] >= np.median(rel)


class TestGNE:
    def test_returns_k_unique(self, data):
        T, Q = data
        idx = gne_select(T, Q, 8, n_iter=3)
        assert len(idx) == 8
        assert len(set(idx.tolist())) == 8

    def test_seeded_deterministic(self, data):
        T, Q = data
        a = gne_select(T, Q, 6, n_iter=2, seed=3)
        b = gne_select(T, Q, 6, n_iter=2, seed=3)
        assert np.array_equal(a, b)

    def test_not_worse_than_its_construction(self, data):
        """Local search never decreases the objective vs pure greedy-random."""
        T, Q = data
        idx1 = gne_select(T, Q, 8, n_iter=1, seed=0)
        idx5 = gne_select(T, Q, 8, n_iter=5, seed=0)
        assert average_diversity(Q, T[idx5]) >= average_diversity(Q, T[idx1]) - 0.05


class TestCLT:
    def test_returns_k(self, data):
        T, Q = data
        assert len(clt_select(T, Q, 9)) == 9

    def test_spreads_across_modes(self):
        rng = np.random.default_rng(1)
        modes = np.array([[20.0, 0], [0, 20.0], [-20.0, 0]])
        T = np.vstack([m + 0.1 * rng.normal(size=(10, 2)) for m in modes])
        idx = clt_select(T, None, 3, metric="euclidean")
        assert {int(i) // 10 for i in idx} == {0, 1, 2}

    def test_ignores_query(self, data):
        T, Q = data
        a = clt_select(T, Q, 7)
        b = clt_select(T, None, 7)
        assert np.array_equal(a, b)


class TestRandom:
    def test_seeded(self, data):
        T, Q = data
        assert np.array_equal(
            random_select(T, Q, 10, seed=5), random_select(T, Q, 10, seed=5)
        )

    def test_no_replacement(self, data):
        T, Q = data
        idx = random_select(T, Q, 20, seed=2)
        assert len(set(idx.tolist())) == 20

    def test_k_capped(self, data):
        T, Q = data
        assert len(random_select(T[:4], Q, 10)) == 4


class TestRelativeBehaviour:
    def test_dust_query_awareness_beats_clt_min_diversity(self):
        """CLT ignores the query: planting query-duplicates in the lake
        sinks CLT's min diversity but not DUST's (Table 2 mechanism)."""
        from repro.core.diversify import dust_diversify_local

        rng = np.random.default_rng(4)
        Q = rng.normal(size=(10, 8))
        fresh = rng.normal(size=(60, 8))
        T = np.vstack([np.repeat(Q, 2, axis=0), fresh])
        k = 10
        clt_scores = min_diversity(Q, T[clt_select(T, Q, k)])
        dust_scores = min_diversity(Q, T[dust_diversify_local(T, Q, k, s=len(T))])
        assert dust_scores > clt_scores

    def test_gmc_quadratic_cost_structure(self, data):
        """GMC touches the full pairwise matrix (its future-contribution
        term): verify it runs with s x s distances of modest size."""
        rng = np.random.default_rng(5)
        T = rng.normal(size=(300, 8))
        Q = rng.normal(size=(10, 8))
        idx = gmc_select(T, Q, 20)
        assert len(idx) == 20
