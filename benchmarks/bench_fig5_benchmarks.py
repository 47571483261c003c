"""Fig 5 bench: benchmark-generation throughput (the substrate every
experiment builds on)."""
import pytest

from repro.lake.benchmark import benchmark_stats, santos_lite, ugen_v1_lite


@pytest.mark.benchmark(group="fig5")
def test_bench_generate_santos_lite(benchmark):
    stats = benchmark(lambda: benchmark_stats(santos_lite(n_topics=4, lake_per_topic=4)))
    assert stats["lake_tables"] == 16


@pytest.mark.benchmark(group="fig5")
def test_bench_generate_ugen_lite(benchmark):
    stats = benchmark(lambda: benchmark_stats(ugen_v1_lite(n_topics=3)))
    assert stats["query_tables"] == 3
