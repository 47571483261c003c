"""Benchmark fixtures: a shared cache dir so expensive artefacts (the
fine-tuned model, full-size lite benchmarks) are built once per machine
and reused across benchmark runs and jobs."""
import pytest

from repro.exp.common import default_cache_dir, get_dust_model


@pytest.fixture(scope="session")
def cache_dir() -> str:
    return default_cache_dir()


@pytest.fixture(scope="session")
def dust_model(cache_dir):
    return get_dust_model("roberta", cache_dir)
