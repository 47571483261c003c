"""Table 1: column-alignment effectiveness (P/R/F1) for 10 embedding
methods across TUS-Sampled-lite, SANTOS-lite and UGEN-V1-lite.

Usage: spark-submit jobs/table1_column_alignment.py
"""
import sys

sys.path.insert(0, "jobs")
from _session import write_result

from repro.exp.table1 import run_table1


def main() -> None:
    df = run_table1()
    pivot = df.pivot(index="method", columns="benchmark", values=["P", "R", "F1"])
    print(pivot.round(3).to_string())
    write_result(df, "table1_column_alignment")


if __name__ == "__main__":
    main()
