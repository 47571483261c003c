"""Synthetic data-lake substrate.

Mirrors how TUS/SANTOS/UGEN-V1 were themselves constructed (DESIGN.md
§2): non-unionable base tables on distinct topics; query and lake tables
derived by row selection + column projection (+ header-synonym renames);
heavy tuple redundancy across derived tables, which is the phenomenon
the paper exists to counter.
"""
from repro.lake.benchmark import (
    Benchmark,
    LakeTable,
    benchmark_stats,
    imdb_lite,
    santos_lite,
    tus_lite,
    tus_sampled_lite,
    ugen_v1_lite,
)

__all__ = [
    "Benchmark",
    "LakeTable",
    "benchmark_stats",
    "tus_lite",
    "tus_sampled_lite",
    "santos_lite",
    "ugen_v1_lite",
    "imdb_lite",
]
