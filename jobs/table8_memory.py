"""Reproduce Table 8: peak provenance memory of every selection policy
per dataset (analytic model over in-kernel peak entry counts; see
repro/bench/memory.py for the calibration against the paper's numbers).

Usage: spark-submit jobs/table8_memory.py [--datasets a,b,...]
"""
import argparse

from repro.bench.harness import BENCH_SF, run_table7_8
from repro.bench.memory import fmt_bytes


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", default=",".join(BENCH_SF))
    args = ap.parse_args()
    _t7, t8 = run_table7_8(datasets=args.datasets.split(","))
    fmt = lambda b: fmt_bytes(b) if b == b and b is not None else "-"  # noqa: E731
    for col, title in (
        ("bytes", "this reproduction"),
        ("paper_bytes", "paper (C, full-scale data)"),
    ):
        wide = t8.pivot(index="dataset", columns="policy", values=col)
        print(f"== Table 8: peak memory, {title} ==")
        print(wide.map(lambda b: fmt(b) if b == b else "-").to_string())
        print()


if __name__ == "__main__":
    main()
