"""Table 2 bench: per-query diversification time for each algorithm on
the same pruned candidate set (the paper's efficiency comparison)."""
import numpy as np
import pytest

from repro.core.baselines import clt_select, gmc_select, gne_select
from repro.exp.common import get_benchmark, get_dust_model
from repro.exp.table2 import dust_select, embedded_query_tuples, prune_shared


@pytest.fixture(scope="module")
def santos_inputs(cache_dir):
    bench = get_benchmark("santos", cache_dir)
    model = get_dust_model("roberta", cache_dir)
    q = bench.queries[0]
    Q, T_all, tids, _ = embedded_query_tuples(bench, q.name, model, max_tables=6)
    keep = prune_shared(T_all, tids, 800)
    return Q, T_all[keep]


K = 100


@pytest.mark.benchmark(group="table2")
def test_bench_dust_diversify(benchmark, santos_inputs):
    Q, T = santos_inputs
    idx = benchmark(lambda: dust_select(T, Q, K))
    assert len(idx) == min(K, len(T))


@pytest.mark.benchmark(group="table2")
def test_bench_gmc_diversify(benchmark, santos_inputs):
    Q, T = santos_inputs
    idx = benchmark(lambda: gmc_select(T, Q, K))
    assert len(idx) == min(K, len(T))


@pytest.mark.benchmark(group="table2")
def test_bench_clt_diversify(benchmark, santos_inputs):
    Q, T = santos_inputs
    idx = benchmark(lambda: clt_select(T, Q, K))
    assert len(idx) == min(K, len(T))


@pytest.mark.benchmark(group="table2")
def test_bench_gne_diversify_small(benchmark, cache_dir):
    """GNE only at UGEN scale — it does not scale (Sec. 6.4.4)."""
    bench = get_benchmark("ugen_v1", cache_dir)
    model = get_dust_model("roberta", cache_dir)
    q = bench.queries[0]
    Q, T_all, tids, _ = embedded_query_tuples(bench, q.name, model)
    keep = prune_shared(T_all, tids, 200)
    T = T_all[keep]
    idx = benchmark.pedantic(
        lambda: gne_select(T, Q, 30, n_iter=5), rounds=1, iterations=1
    )
    assert len(idx) == min(30, len(T))
