"""Experiment harness integration tests at reduced scale.

Each reproduced table's harness runs end to end on a tmp cache with
small benchmark instances, and the shape assertions mirror the paper's
qualitative claims.
"""
import numpy as np
import pandas as pd
import pytest

import repro.exp.common as common
from repro.exp.common import count_best, get_benchmark, get_dust_model
from repro.exp.fig5 import run_fig5
from repro.exp.fig7 import (
    run_fig7a,
    run_fig7b,
    run_fig11_p_sweep,
    run_pruning_ablation,
    synthetic_embeddings,
)


@pytest.fixture(scope="module")
def small_cache(tmp_path_factory, monkeypatch_module=None):
    """Isolated cache with small benchmark instances pre-seeded."""
    import pickle

    from repro.lake.benchmark import (
        imdb_lite,
        santos_lite,
        tus_lite,
        tus_sampled_lite,
        ugen_v1_lite,
    )

    d = str(tmp_path_factory.mktemp("expcache"))
    seeds = {
        "bench_tus": tus_lite(n_topics=4, lake_per_topic=3),
        "bench_tus_sampled": tus_sampled_lite(n_queries=2, per_query=3),
        "bench_santos": santos_lite(n_topics=2, lake_per_topic=3),
        "bench_ugen_v1": ugen_v1_lite(n_topics=2),
        "bench_imdb": imdb_lite(n_tables=4, rows_per_table=40),
    }
    import os

    for name, obj in seeds.items():
        with open(os.path.join(d, name + ".pkl"), "wb") as f:
            pickle.dump(obj, f)
    return d


class TestCommon:
    def test_benchmarks_cached(self, small_cache):
        a = get_benchmark("santos", small_cache)
        b = get_benchmark("santos", small_cache)
        assert [t.name for t in a.lake] == [t.name for t in b.lake]

    def test_model_cached_across_calls(self, small_cache):
        m1 = get_dust_model("roberta", small_cache)
        m2 = get_dust_model("roberta", small_cache)
        assert np.allclose(m1.W, m2.W)

    def test_count_best_ties_credit_all(self):
        rows = [{"A": 1.0, "B": 1.0, "C": 0.5}]
        wins = count_best(rows, ["A", "B", "C"], "x")
        assert wins == {"A": 1, "B": 1, "C": 0}


class TestFig5:
    def test_rows_and_columns(self, small_cache):
        df = run_fig5(small_cache)
        assert set(df["benchmark"]) == {"tus", "tus_sampled", "santos", "ugen_v1"}
        assert {"lake_tables", "avg_unionable_per_query"} <= set(df.columns)

    def test_counts_positive(self, small_cache):
        df = run_fig5(small_cache)
        assert (df["lake_tuples"] > 0).all()


class TestTable1:
    def test_runs_and_orders_models(self, small_cache):
        from repro.exp.table1 import run_table1

        df = run_table1(
            small_cache, benchmarks=("santos",), max_queries=1
        )
        assert len(df) == 10  # 10 method variants
        assert ((df["F1"] >= 0) & (df["F1"] <= 1)).all()
        best = df.loc[df["F1"].idxmax(), "method"]
        # A holistic column-level LM should be near the top; the paper's
        # winner is column-level RoBERTa.
        assert best.startswith(("column/", "cell/"))


class TestFig6:
    def test_accuracy_table(self, small_cache):
        from repro.exp.fig6 import run_fig6

        df = run_fig6(small_cache)
        acc = dict(zip(df["model"], df["accuracy"]))
        # Paper shape: pre-trained ~ coin toss; DUST >> Ditto > raw.
        assert acc["bert"] < 0.62 and acc["roberta"] < 0.62
        assert acc["dust_roberta"] > acc["ditto"]
        assert acc["dust_roberta"] > 0.8

    def test_shuffle_robustness(self, small_cache):
        from repro.exp.fig6 import run_fig10_shuffle_robustness

        rob = run_fig10_shuffle_robustness(small_cache, n_tuples=50)
        assert rob["mean_cosine"] > 0.95


class TestTable2:
    def test_summary_shape_and_dust_wins_min(self, small_cache):
        from repro.exp.table2 import run_table2

        summary, per_query = run_table2(
            small_cache,
            benchmarks={"santos": 20},
            s=300,
            max_queries=2,
            include_random=True,
        )
        assert set(summary["method"]) >= {"GMC", "CLT", "DUST"}
        dust = summary[summary["method"] == "DUST"].iloc[0]
        gmc = summary[summary["method"] == "GMC"].iloc[0]
        # Paper shape: DUST dominates Min Diversity and is much faster
        # than GMC.
        assert dust["n_best_min"] >= gmc["n_best_min"]
        assert dust["mean_time_s"] < gmc["mean_time_s"] * 1.5


class TestFig7:
    def test_gmc_grows_faster_than_dust(self):
        df = run_fig7a(s_values=(200, 800), k=20)
        piv = df.pivot(index="s", columns="method", values="time_s")
        gmc_growth = piv.loc[800, "GMC"] / max(piv.loc[200, "GMC"], 1e-9)
        dust_growth = piv.loc[800, "DUST"] / max(piv.loc[200, "DUST"], 1e-9)
        assert gmc_growth > dust_growth

    def test_dust_flat_in_k(self):
        df = run_fig7b(k_values=(10, 40), s=600)
        piv = df.pivot(index="k", columns="method", values="time_s")
        assert piv.loc[40, "DUST"] < piv.loc[10, "DUST"] * 5

    def test_p_sweep_has_p2_row(self):
        df = run_fig11_p_sweep(n=400, k=20, p_values=(1, 2, 3))
        assert list(df["p"]) == [1, 2, 3]
        assert df["min_diversity"].notna().all()

    def test_pruning_speeds_up(self):
        df = run_pruning_ablation(n=1500, s=300, k=30)
        t = dict(zip(df["variant"], df["time_s"]))
        assert t["pruned"] < t["no_pruning"]

    def test_synthetic_embeddings_shapes(self):
        T, Q = synthetic_embeddings(123, n_query=17)
        assert T.shape == (123, 64)
        assert Q.shape == (17, 64)


class TestTable3AndFig8:
    def test_table3_dust_wins(self, spark, small_cache):
        from repro.exp.table3 import run_table3

        summary, per_query = run_table3(
            spark,
            small_cache,
            benchmarks={"ugen_v1": 10},
            max_queries=2,
            top_n_tables=4,
        )
        dust = summary[summary["method"] == "DUST"].iloc[0]
        assert dust["n_best_min"] >= 1  # DUST best on min for most queries

    def test_fig8_dust_adds_most_novel_values(self, spark, small_cache):
        from repro.exp.fig8 import run_fig8

        df = run_fig8(spark, small_cache, k_values=(20,), top_n_tables_searched=4)
        totals = df.groupby("method")["novel_values"].sum()
        assert totals["DUST"] >= totals["Starmie"]
        assert set(totals.index) == {"D3L", "D3L-D", "Starmie", "Starmie-D", "DUST"}

    def test_fig8_novel_counts_match_duckdb(self, spark, small_cache):
        """novel_value_counts re-stated as SQL."""
        import duckdb

        from repro.exp.fig8 import novel_value_counts

        bench = get_benchmark("imdb", small_cache)
        q = bench.queries[0]
        sel = bench.lake[0].df
        got = novel_value_counts(q.df, sel)
        con = duckdb.connect()
        try:
            con.register("q", q.df.astype(str))
            con.register("s", sel.astype(str))
            for col in q.df.columns:
                want = con.execute(
                    f'select count(distinct "{col}") from s '
                    f'where "{col}" not in (select "{col}" from q)'
                ).fetchone()[0]
                assert got[col] == want
        finally:
            con.close()
