"""Fig 7 bench: the runtime-scaling measurements themselves (GMC
quadratic in s; DUST near-linear in s and flat in k)."""
import pytest

from repro.core.baselines import clt_select, gmc_select
from repro.core.diversify import dust_diversify_local
from repro.exp.fig7 import synthetic_embeddings


@pytest.fixture(scope="module", params=[1000, 3000])
def sized_inputs(request):
    s = request.param
    T, Q = synthetic_embeddings(s, seed=1)
    return s, T, Q


@pytest.mark.benchmark(group="fig7-vs-s")
def test_bench_dust_vs_s(benchmark, sized_inputs):
    s, T, Q = sized_inputs
    idx = benchmark.pedantic(
        lambda: dust_diversify_local(T, Q, 100, s=s), rounds=2, iterations=1
    )
    assert len(idx) == 100


@pytest.mark.benchmark(group="fig7-vs-s")
def test_bench_gmc_vs_s(benchmark, sized_inputs):
    s, T, Q = sized_inputs
    idx = benchmark.pedantic(
        lambda: gmc_select(T, Q, 100), rounds=1, iterations=1
    )
    assert len(idx) == 100


@pytest.mark.benchmark(group="fig7-vs-s")
def test_bench_clt_vs_s(benchmark, sized_inputs):
    s, T, Q = sized_inputs
    idx = benchmark.pedantic(
        lambda: clt_select(T, Q, 100), rounds=2, iterations=1
    )
    assert len(idx) == 100


@pytest.mark.benchmark(group="fig7-vs-k")
@pytest.mark.parametrize("k", [50, 200])
def test_bench_dust_vs_k(benchmark, k):
    T, Q = synthetic_embeddings(2000, seed=2)
    idx = benchmark.pedantic(
        lambda: dust_diversify_local(T, Q, k, s=2000), rounds=2, iterations=1
    )
    assert len(idx) == k
