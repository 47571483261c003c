"""Experiment harnesses — one module per reproduced paper table.

Each module exposes a ``run_*`` function returning a pandas DataFrame
with the same rows the paper reports; ``jobs/`` wraps them for
spark-submit and ``benchmarks/`` wraps them for pytest-benchmark.
"""
