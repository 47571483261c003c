"""Fig 5 (rendered as a table in the paper): benchmark statistics."""
from __future__ import annotations

import pandas as pd

from repro.exp.common import get_benchmark
from repro.lake.benchmark import benchmark_stats

BENCHMARKS = ("tus", "tus_sampled", "santos", "ugen_v1")


def run_fig5(cache_dir: str | None = None) -> pd.DataFrame:
    rows = [benchmark_stats(get_benchmark(n, cache_dir)) for n in BENCHMARKS]
    return pd.DataFrame(rows)
