"""Max-weight bipartite matching, validated against brute force."""
import itertools

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.cluster import max_weight_matching


def brute_force_best(W: np.ndarray) -> float:
    """Best matching weight by exhaustive search (keeps only positive
    weights, like the implementation)."""
    n_rows, n_cols = W.shape
    best = 0.0
    cols = list(range(n_cols))
    for r_subset_size in range(0, min(n_rows, n_cols) + 1):
        for rows in itertools.combinations(range(n_rows), r_subset_size):
            for perm in itertools.permutations(cols, r_subset_size):
                w = sum(W[r, c] for r, c in zip(rows, perm) if W[r, c] > 0)
                best = max(best, w)
    return best


def matching_weight(W, pairs):
    return sum(W[r, c] for r, c in pairs)


class TestMatching:
    def test_identity(self):
        W = np.eye(3)
        assert max_weight_matching(W) == [(0, 0), (1, 1), (2, 2)]

    def test_anti_diagonal(self):
        W = np.array([[0.0, 1.0], [1.0, 0.0]])
        assert max_weight_matching(W) == [(0, 1), (1, 0)]

    def test_rectangular_more_rows(self):
        W = np.array([[5.0, 0.0], [0.0, 4.0], [1.0, 1.0]])
        pairs = max_weight_matching(W)
        assert (0, 0) in pairs and (1, 1) in pairs
        assert len(pairs) == 2

    def test_rectangular_more_cols(self):
        W = np.array([[1.0, 9.0, 2.0]])
        assert max_weight_matching(W) == [(0, 1)]

    def test_empty(self):
        assert max_weight_matching(np.zeros((0, 0))) == []
        assert max_weight_matching(np.zeros((0, 3))) == []

    def test_all_nonpositive_gives_empty(self):
        W = -np.ones((3, 3))
        assert max_weight_matching(W) == []

    def test_zero_weight_pairs_dropped(self):
        W = np.array([[1.0, 0.0], [0.0, 0.0]])
        assert max_weight_matching(W) == [(0, 0)]

    def test_each_row_col_once(self):
        rng = np.random.default_rng(0)
        W = rng.random((6, 6))
        pairs = max_weight_matching(W)
        rows = [r for r, _ in pairs]
        cols = [c for _, c in pairs]
        assert len(rows) == len(set(rows))
        assert len(cols) == len(set(cols))

    def test_greedy_trap(self):
        # Greedy picks (0,0)=10 then only (1,1)=1 -> 11; optimal is 9+9=18.
        W = np.array([[10.0, 9.0], [9.0, 1.0]])
        pairs = max_weight_matching(W)
        assert matching_weight(W, pairs) == pytest.approx(18.0)

    @given(st.integers(1, 5), st.integers(1, 5), st.integers(0, 10_000))
    @settings(max_examples=40, deadline=None)
    def test_optimal_vs_brute_force(self, nr, nc, seed):
        rng = np.random.default_rng(seed)
        W = rng.uniform(-1, 1, (nr, nc))
        pairs = max_weight_matching(W)
        assert matching_weight(W, pairs) == pytest.approx(
            brute_force_best(W), abs=1e-9
        )
