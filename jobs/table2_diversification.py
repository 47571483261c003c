"""Table 2: diversification effectiveness + per-query time, SANTOS-lite
(k=100) and UGEN-V1-lite (k=30); GMC / GNE / CLT / DUST / random.

Usage: spark-submit jobs/table2_diversification.py
"""
import sys

sys.path.insert(0, "jobs")
from _session import write_result

from repro.exp.table2 import run_table2


def main() -> None:
    summary, per_query = run_table2()
    print(summary.round(4).to_string(index=False))
    write_result(summary, "table2_summary")
    write_result(per_query, "table2_per_query")


if __name__ == "__main__":
    main()
