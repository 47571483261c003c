"""Fig 8 bench: the IMDB case-study harness (novel-value counting for
all five methods at one k)."""
import pytest

from repro.exp.fig8 import run_fig8


@pytest.mark.benchmark(group="fig8")
def test_bench_casestudy_k20(benchmark, spark, cache_dir, dust_model):
    df = benchmark.pedantic(
        lambda: run_fig8(spark, cache_dir, k_values=(20,), top_n_tables_searched=6),
        rounds=1,
        iterations=1,
    )
    totals = df.groupby("method")["novel_values"].sum()
    assert set(totals.index) == {"D3L", "D3L-D", "Starmie", "Starmie-D", "DUST"}
