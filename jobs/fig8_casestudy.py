"""Fig 8 (data): IMDB case study — novel values per query column for
D3L / D3L-D / Starmie / Starmie-D / DUST across k.

Usage: spark-submit jobs/fig8_casestudy.py
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_session, write_result


def main() -> None:
    from repro.exp.fig8 import run_fig8

    spark = get_session("fig8")
    try:
        df = run_fig8(spark)
        total = (
            df.groupby(["k", "method"])["novel_values"].sum().unstack()
        )
        print("-- total novel values across all columns")
        print(total.to_string())
        write_result(df, "fig8_casestudy")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
