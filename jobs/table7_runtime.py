"""Reproduce Table 7: runtime of every selection policy on every
(synthetic) TIN at the benchmark scale factors, next to the paper's
numbers. Infeasible cells ('-') follow the paper's availability matrix.

Usage: spark-submit jobs/table7_runtime.py [--datasets a,b,...]
"""
import argparse

from repro.bench.harness import BENCH_SF, run_table7_8


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", default=",".join(BENCH_SF))
    args = ap.parse_args()
    t7, _t8 = run_table7_8(datasets=args.datasets.split(","))
    wide = t7.pivot(index="dataset", columns="policy", values="seconds")
    print("== Table 7: runtime (seconds), this reproduction ==")
    print(wide.to_string(float_format=lambda x: f"{x:.3f}"))
    paper = t7.pivot(index="dataset", columns="policy", values="paper_seconds")
    print("\n== Table 7: runtime (seconds), paper (C, full-scale data) ==")
    print(paper.to_string(float_format=lambda x: f"{x:.3f}"))


if __name__ == "__main__":
    main()
