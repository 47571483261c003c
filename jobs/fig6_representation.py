"""Fig 6: tuple-representation accuracy + Fig 10 shuffle robustness.

Usage: spark-submit jobs/fig6_representation.py
"""
import sys

sys.path.insert(0, "jobs")
from _session import write_result

from repro.exp.fig6 import run_fig6, run_fig10_shuffle_robustness


def main() -> None:
    df = run_fig6()
    print(df.round(4).to_string(index=False))
    write_result(df, "fig6_representation")
    rob = run_fig10_shuffle_robustness()
    print(f"[fig10] column-shuffle cosine: mean={rob['mean_cosine']:.4f} "
          f"std={rob['std_cosine']:.4f}")


if __name__ == "__main__":
    main()
