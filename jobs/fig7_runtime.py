"""Fig 7 (data): runtime scaling vs s and k; Fig 11 p-sweep; pruning
ablation (Appendix A.2.3).

Usage: spark-submit jobs/fig7_runtime.py
"""
import sys

sys.path.insert(0, "jobs")
from _session import write_result

from repro.exp.fig7 import (
    run_fig7a,
    run_fig7b,
    run_fig11_p_sweep,
    run_pruning_ablation,
)


def main() -> None:
    a = run_fig7a()
    print("-- Fig 7(a): runtime vs s (k=100)")
    print(a.pivot(index="s", columns="method", values="time_s").round(3).to_string())
    write_result(a, "fig7a_runtime_vs_s")

    b = run_fig7b()
    print("-- Fig 7(b): runtime vs k (s=5000)")
    print(b.pivot(index="k", columns="method", values="time_s").round(3).to_string())
    write_result(b, "fig7b_runtime_vs_k")

    p = run_fig11_p_sweep()
    print("-- Fig 11: p sweep")
    print(p.round(4).to_string(index=False))
    write_result(p, "fig11_p_sweep")

    pr = run_pruning_ablation()
    print("-- A.2.3: pruning ablation")
    print(pr.round(3).to_string(index=False))
    write_result(pr, "pruning_ablation")


if __name__ == "__main__":
    main()
