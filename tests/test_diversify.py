"""Algorithm 2: pruning, clustering candidates, re-ranking — local and
Spark paths, with DuckDB oracle checks of the relational stages."""
import duckdb
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.cluster.distance import cosine_distance_matrix
from repro.core.diversify import (
    EMB_COL,
    PRUNE_SCORE_COL,
    cluster_medoid_candidates,
    dust_diversify_local,
    dust_diversify_spark,
    prune_scores_pandas,
    prune_tuples,
    rerank_scores_local,
    rerank_topk_local,
    rerank_topk_spark,
)
from repro.core.union import SRC_COL, UID_COL


def make_emb_df(spark, n=40, n_tables=4, dim=8, seed=0):
    rng = np.random.default_rng(seed)
    E = rng.normal(size=(n, dim))
    pdf = pd.DataFrame(
        {
            SRC_COL: [f"t{i % n_tables}" for i in range(n)],
            UID_COL: [f"t{i % n_tables}#{i}" for i in range(n)],
            EMB_COL: list(E),
        }
    )
    return spark.createDataFrame(pdf), E, pdf


class TestPruneScores:
    def test_distance_from_mean(self):
        rng = np.random.default_rng(1)
        E = rng.normal(size=(10, 4))
        pdf = pd.DataFrame({EMB_COL: list(E)})
        scores = prune_scores_pandas(pdf)
        mean = E.mean(axis=0, keepdims=True)
        want = cosine_distance_matrix(E, mean)[:, 0]
        assert np.allclose(scores, want)

    def test_outlier_scores_highest(self):
        E = np.vstack([np.ones((9, 4)), -np.ones((1, 4))])
        scores = prune_scores_pandas(pd.DataFrame({EMB_COL: list(E)}))
        assert np.argmax(scores) == 9

    def test_euclidean_variant(self):
        E = np.array([[0.0, 0.0], [2.0, 0.0]])
        scores = prune_scores_pandas(pd.DataFrame({EMB_COL: list(E)}), metric="euclidean")
        assert np.allclose(scores, [1.0, 1.0])


class TestPruneSpark:
    def test_keeps_top_s(self, spark):
        df, E, pdf = make_emb_df(spark)
        out = prune_tuples(df, 10).toPandas()
        assert len(out) == 10

    def test_s_larger_than_n_keeps_all(self, spark):
        df, E, pdf = make_emb_df(spark, n=12)
        assert prune_tuples(df, 100).count() == 12

    def test_matches_duckdb_window(self, spark):
        """Pruning re-stated as a DuckDB window query over per-table
        scores computed locally."""
        df, E, pdf = make_emb_df(spark)
        s = 15
        got = prune_tuples(df, s).toPandas()
        scores = np.empty(len(pdf))
        for t in pdf[SRC_COL].unique():
            m = (pdf[SRC_COL] == t).to_numpy()
            scores[m] = prune_scores_pandas(pdf[m])
        base = pdf[[SRC_COL, UID_COL]].copy()
        base["score"] = scores
        con = duckdb.connect()
        try:
            con.register("scored", base)
            want = con.execute(
                f"select * from scored order by score desc, {UID_COL} asc limit {s}"
            ).fetchdf()
        finally:
            con.close()
        assert list(got[UID_COL]) == list(want[UID_COL])
        assert np.allclose(got[PRUNE_SCORE_COL], want["score"])

    def test_per_table_means_not_global(self, spark):
        """Scores are relative to each table's own mean embedding."""
        rng = np.random.default_rng(3)
        # Table A clustered at +1, table B at -1: within-table outliers
        # must win over globally-far-but-table-typical tuples.
        Ea = 1 + 0.01 * rng.normal(size=(10, 4))
        Eb = -1 + 0.01 * rng.normal(size=(10, 4))
        Ea[0] = -0.5  # outlier within table A
        pdf = pd.DataFrame(
            {
                SRC_COL: ["a"] * 10 + ["b"] * 10,
                UID_COL: [f"x#{i}" for i in range(20)],
                EMB_COL: list(np.vstack([Ea, Eb])),
            }
        )
        df = spark.createDataFrame(pdf)
        top = prune_tuples(df, 1).toPandas()
        assert top[UID_COL].iloc[0] == "x#0"


class TestClusterCandidates:
    def test_count(self):
        rng = np.random.default_rng(0)
        E = rng.normal(size=(50, 6))
        idx = cluster_medoid_candidates(E, 10)
        assert len(idx) == 10
        assert len(set(idx.tolist())) == 10

    def test_more_clusters_than_points(self):
        E = np.random.default_rng(1).normal(size=(5, 4))
        idx = cluster_medoid_candidates(E, 10)
        assert len(idx) == 5

    def test_empty(self):
        assert len(cluster_medoid_candidates(np.zeros((0, 4)), 3)) == 0

    def test_medoids_spread_across_modes(self):
        rng = np.random.default_rng(2)
        modes = np.array([[10.0, 0], [0, 10.0], [-10.0, 0]])
        E = np.vstack([m + 0.1 * rng.normal(size=(20, 2)) for m in modes])
        idx = cluster_medoid_candidates(E, 3, metric="euclidean")
        picked_modes = {int(i) // 20 for i in idx}
        assert picked_modes == {0, 1, 2}


class TestRerank:
    def test_scores_match_duckdb(self, spark):
        rng = np.random.default_rng(4)
        C = rng.normal(size=(8, 6))
        Q = rng.normal(size=(5, 6))
        mins, avgs = rerank_scores_local(C, Q)
        D = cosine_distance_matrix(C, Q)
        rows = [
            {"cand": i, "q": j, "dist": float(D[i, j])}
            for i in range(8)
            for j in range(5)
        ]
        con = duckdb.connect()
        try:
            con.register("d", pd.DataFrame(rows))
            want = con.execute(
                "select cand, min(dist) as mn, avg(dist) as av from d group by cand order by cand"
            ).fetchdf()
        finally:
            con.close()
        assert np.allclose(mins, want["mn"])
        assert np.allclose(avgs, want["av"])

    def test_paper_example_fig4(self):
        """Fig 4's ranking worked end-to-end on its distance matrix."""
        D = np.array(
            [
                [0.3, 0.1, 0.9],
                [0.5, 0.4, 0.6],
                [0.75, 0.5, 0.1],
                [0.4, 0.55, 0.5],
                [0.9, 0.75, 0.01],
                [0.0, 0.99, 0.2],
            ]
        )
        mins = D.min(axis=1)
        avgs = D.mean(axis=1)
        order = np.lexsort((-avgs, -mins))
        assert list(order) == [1, 3, 2, 0, 4, 5]  # t2 t4 t3 t1 t5 t6

    def test_topk_local_order(self):
        rng = np.random.default_rng(5)
        C = rng.normal(size=(20, 6))
        Q = rng.normal(size=(4, 6))
        top = rerank_topk_local(C, Q, 5)
        mins, avgs = rerank_scores_local(C, Q)
        # Every selected candidate has min-score >= every unselected.
        unsel = [i for i in range(20) if i not in top]
        assert mins[top].min() >= mins[unsel].max() - 1e-12

    def test_spark_matches_local(self, spark):
        df, E, pdf = make_emb_df(spark, n=20)
        rng = np.random.default_rng(6)
        Q = rng.normal(size=(5, 8))
        got = rerank_topk_spark(df, Q, 6).toPandas()
        want_idx = rerank_topk_local(E, Q, 6)
        assert list(got[UID_COL]) == [pdf[UID_COL].iloc[i] for i in want_idx]

    def test_tie_break_by_average(self, spark):
        # Two candidates with identical min distance, different averages.
        Q = np.array([[1.0, 0.0], [0.0, 1.0]])
        C = np.array([[1.0, 1.0], [-1.0, 1.0]])
        mins, avgs = rerank_scores_local(C, Q)
        assert mins[0] == pytest.approx(mins[1])
        top = rerank_topk_local(C, Q, 1)
        assert top[0] == int(np.argmax(avgs))


class TestEndToEnd:
    def test_spark_matches_local(self, spark):
        df, E, pdf = make_emb_df(spark, n=60, n_tables=3)
        rng = np.random.default_rng(7)
        Q = rng.normal(size=(6, 8))
        got = dust_diversify_spark(df, Q, k=8, p=2, s=30).toPandas()
        tids = pd.factorize(pdf[SRC_COL])[0]
        want_idx = dust_diversify_local(E, Q, 8, p=2, s=30, table_ids=tids)
        assert sorted(got[UID_COL]) == sorted(pdf[UID_COL].iloc[want_idx])

    def test_returns_k(self, spark):
        df, E, pdf = make_emb_df(spark, n=50)
        Q = np.random.default_rng(8).normal(size=(4, 8))
        assert dust_diversify_spark(df, Q, k=7, s=40).count() == 7

    def test_local_empty_input(self):
        out = dust_diversify_local(np.zeros((0, 4)), np.zeros((2, 4)), 5)
        assert len(out) == 0

    def test_local_avoids_query_duplicates(self):
        """Tuples identical to query tuples rank at the bottom."""
        rng = np.random.default_rng(9)
        Q = rng.normal(size=(5, 8))
        fresh = rng.normal(size=(10, 8))
        T = np.vstack([Q, fresh])  # first 5 are exact query copies
        idx = dust_diversify_local(T, Q, k=5, p=2, s=15)
        assert not (set(idx.tolist()) & set(range(5)))

    def test_beats_random_on_min_diversity(self):
        from repro.core.baselines import random_select
        from repro.core.metrics import min_diversity

        rng = np.random.default_rng(10)
        Q = rng.normal(size=(10, 8))
        T = np.vstack([np.repeat(rng.normal(size=(3, 8)), 20, axis=0),
                       rng.normal(size=(40, 8))])
        dust_idx = dust_diversify_local(T, Q, k=10, s=100)
        rand_idx = random_select(T, Q, 10, seed=0)
        assert min_diversity(Q, T[dust_idx]) >= min_diversity(Q, T[rand_idx])
