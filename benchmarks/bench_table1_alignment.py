"""Table 1 bench: holistic column alignment per query (the paper
reports 24-46 s per query at their scale; shapes in EXPERIMENTS.md)."""
import pytest

from repro.core.align import bipartite_alignment, corpus_idf, holistic_alignment
from repro.exp.common import get_benchmark


@pytest.fixture(scope="module")
def santos_query(cache_dir):
    bench = get_benchmark("santos", cache_dir)
    q = bench.queries[0]
    tables = bench.unionable_tables(q.name)[:5]
    idf = corpus_idf([q] + tables)
    return q, tables, idf


@pytest.mark.benchmark(group="table1")
def test_bench_holistic_roberta(benchmark, santos_query):
    q, tables, idf = santos_query
    al = benchmark(lambda: holistic_alignment(q, tables, idf=idf))
    assert al.mapping


@pytest.mark.benchmark(group="table1")
def test_bench_holistic_cell_level(benchmark, santos_query):
    q, tables, idf = santos_query
    al = benchmark(lambda: holistic_alignment(q, tables, idf=idf, level="cell"))
    assert al.mapping


@pytest.mark.benchmark(group="table1")
def test_bench_starmie_bipartite(benchmark, santos_query):
    q, tables, idf = santos_query
    al = benchmark(lambda: bipartite_alignment(q, tables, idf=idf))
    assert al.mapping
