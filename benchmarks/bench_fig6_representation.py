"""Fig 6 bench: tuple-encoder inference throughput + test-set scoring."""
import pytest

from repro.core.metrics import pair_accuracy
from repro.exp.common import get_pair_benchmark


@pytest.mark.benchmark(group="fig6")
def test_bench_dust_pair_scoring(benchmark, cache_dir, dust_model):
    pb = get_pair_benchmark(cache_dir)
    pairs, labels = pb.test.pairs, pb.test.labels

    def score():
        return pair_accuracy(dust_model.predict_unionable(pairs), labels)

    acc = benchmark(score)
    assert acc > 0.7


@pytest.mark.benchmark(group="fig6")
def test_bench_embedding_throughput(benchmark, cache_dir, dust_model):
    pb = get_pair_benchmark(cache_dir)
    texts = [p[0] for p in pb.test.pairs[:500]]
    E = benchmark(lambda: dust_model.embed_texts(texts))
    assert E.shape[0] == len(texts)
