"""Diversity metrics (Eq 1-2): numpy vs brute force vs Spark vs DuckDB."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.cluster.distance import cosine_distance_matrix
from repro.core.metrics import (
    alignment_prf,
    average_diversity,
    diversity_scores,
    diversity_scores_spark,
    min_diversity,
    pair_accuracy,
    pairwise_distances_spark,
)


@pytest.fixture(scope="module")
def QT(rng_mod=7):
    rng = np.random.default_rng(rng_mod)
    return rng.normal(size=(5, 8)), rng.normal(size=(7, 8))


def brute_average(Q, T):
    total = 0.0
    for i in range(len(Q)):
        for j in range(len(T)):
            total += cosine_distance_matrix(Q[i : i + 1], T[j : j + 1])[0, 0]
    for i in range(len(T)):
        for j in range(i + 1, len(T)):
            total += cosine_distance_matrix(T[i : i + 1], T[j : j + 1])[0, 0]
    return total / (len(Q) + len(T))


class TestAverageDiversity:
    def test_matches_brute_force(self, QT):
        Q, T = QT
        assert average_diversity(Q, T) == pytest.approx(brute_average(Q, T))

    def test_empty_selection_zero(self, QT):
        Q, _ = QT
        assert average_diversity(Q, np.zeros((0, 8))) == 0.0

    def test_single_tuple(self, QT):
        Q, T = QT
        v = average_diversity(Q, T[:1])
        expected = cosine_distance_matrix(Q, T[:1]).sum() / (len(Q) + 1)
        assert v == pytest.approx(expected)

    def test_identical_tuples_score_low(self, QT):
        Q, T = QT
        dup = np.repeat(T[:1], 5, axis=0)
        assert average_diversity(Q, dup) < average_diversity(Q, T[:5])


class TestMinDiversity:
    def test_matches_brute_force(self, QT):
        Q, T = QT
        qt = cosine_distance_matrix(Q, T).min()
        tt = cosine_distance_matrix(T)[np.triu_indices(len(T), 1)].min()
        assert min_diversity(Q, T) == pytest.approx(min(qt, tt))

    def test_duplicate_gives_zero(self, QT):
        Q, T = QT
        dup = np.vstack([T[:3], T[:1]])
        assert min_diversity(Q, dup) == pytest.approx(0.0, abs=1e-9)

    def test_query_copy_gives_zero(self, QT):
        Q, _ = QT
        sel = Q[:2].copy()
        assert min_diversity(Q, sel) == pytest.approx(0.0, abs=1e-9)

    def test_empty_query_uses_tt_only(self, QT):
        _, T = QT
        tt = cosine_distance_matrix(T)[np.triu_indices(len(T), 1)].min()
        assert min_diversity(np.zeros((0, 8)), T) == pytest.approx(tt)


class TestSparkAndDuckdb:
    def test_spark_matches_numpy(self, spark, QT):
        Q, T = QT
        got = diversity_scores_spark(spark, Q, T)
        want = diversity_scores(Q, T)
        assert got["average_diversity"] == pytest.approx(want["average_diversity"])
        assert got["min_diversity"] == pytest.approx(want["min_diversity"])

    def test_spark_agg_matches_duckdb(self, spark, QT):
        """The Spark aggregation re-stated as SQL over the same pair rows."""
        Q, T = QT
        pairs = pairwise_distances_spark(spark, Q, T)
        pdf = pairs.toPandas()
        con = duckdb.connect()
        try:
            con.register("pairs", pdf)
            row = con.execute(
                "select sum(dist) as s, min(dist) as m from pairs"
            ).fetchone()
        finally:
            con.close()
        got = diversity_scores_spark(spark, Q, T)
        assert got["average_diversity"] == pytest.approx(row[0] / (len(Q) + len(T)))
        assert got["min_diversity"] == pytest.approx(row[1])

    def test_pair_row_count(self, spark, QT):
        Q, T = QT
        n = pairwise_distances_spark(spark, Q, T).count()
        k = len(T)
        assert n == len(Q) * k + k * (k - 1) // 2


class TestAlignmentPrf:
    def test_perfect(self):
        gt = {frozenset(("a", "b"))}
        m = alignment_prf(gt, gt)
        assert m == {"precision": 1.0, "recall": 1.0, "f1": 1.0}

    def test_half_precision(self):
        gt = {frozenset(("a", "b"))}
        method = {frozenset(("a", "b")), frozenset(("a", "c"))}
        m = alignment_prf(gt, method)
        assert m["precision"] == 0.5
        assert m["recall"] == 1.0

    def test_empty_method(self):
        m = alignment_prf({frozenset(("a", "b"))}, set())
        assert m == {"precision": 0.0, "recall": 0.0, "f1": 0.0}


class TestPairAccuracy:
    def test_perfect(self):
        assert pair_accuracy(np.array([1, 0]), np.array([1, 0])) == 1.0

    def test_half(self):
        assert pair_accuracy(np.array([1, 1]), np.array([1, 0])) == 0.5

    def test_length_mismatch_raises(self):
        with pytest.raises(ValueError):
            pair_accuracy(np.array([1]), np.array([1, 0]))

    def test_empty(self):
        assert pair_accuracy(np.array([]), np.array([])) == 0.0
