"""Table 3: DUST end-to-end vs Starmie tuple search vs the simulated
LLM, on SANTOS-lite and UGEN-V1-lite.

Usage: spark-submit jobs/table3_search.py
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_session, write_result

from repro.exp.table3 import run_table3


def main() -> None:
    spark = get_session("table3")
    try:
        summary, per_query = run_table3(spark)
        print(summary.to_string(index=False))
        write_result(summary, "table3_summary")
        write_result(per_query, "table3_per_query")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
