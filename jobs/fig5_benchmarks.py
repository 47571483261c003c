"""Fig 5: benchmark statistics table.

Usage: spark-submit jobs/fig5_benchmarks.py   (no Spark needed, kept
uniform with the other jobs).
"""
import sys

sys.path.insert(0, "jobs")
from _session import write_result

from repro.exp.fig5 import run_fig5


def main() -> None:
    df = run_fig5()
    print(df.to_string(index=False))
    write_result(df, "fig5_benchmarks")


if __name__ == "__main__":
    main()
