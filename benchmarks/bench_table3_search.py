"""Table 3 bench: end-to-end DUST pipeline vs Starmie per-tuple search
on Spark (one UGEN-V1-lite query)."""
import pytest

from repro.core.pipeline import run_dust
from repro.embed.models import make_model
from repro.exp.common import get_benchmark
from repro.lake.search import starmie_tuple_topk_spark


@pytest.fixture(scope="module")
def ugen(cache_dir):
    return get_benchmark("ugen_v1", cache_dir)


@pytest.mark.benchmark(group="table3")
def test_bench_dust_end_to_end(benchmark, spark, ugen, dust_model):
    q = ugen.queries[0]
    res = benchmark.pedantic(
        lambda: run_dust(
            spark, ugen, q.name, 30, dust_model, search="starmie", top_n=8, s=1000
        ),
        rounds=1,
        iterations=1,
    )
    assert len(res.selected) == 30


@pytest.mark.benchmark(group="table3")
def test_bench_starmie_tuple_search(benchmark, spark, ugen):
    q = ugen.queries[0]
    model = make_model("starmie")
    top = benchmark.pedantic(
        lambda: starmie_tuple_topk_spark(spark, q, ugen.lake, 30, model),
        rounds=1,
        iterations=1,
    )
    assert len(top) == 30
