"""Reproduce Table 9: shrinking statistics of budget-based provenance
(avg shrinks per non-empty buffer, % of vertices shrunk) for the three
large TINs across capacities C, plus the Figure 8 runtime/memory sweep.

Usage: spark-submit jobs/table9_budget.py [--keep-fraction 0.7]
"""
import argparse

from repro.bench.harness import run_table9
from repro.bench.memory import fmt_bytes


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--keep-fraction", type=float, default=0.7)
    args = ap.parse_args()
    t9 = run_table9(keep_fraction=args.keep_fraction)
    t9["bytes"] = t9["bytes"].map(fmt_bytes)
    print("== Table 9: budget-based provenance (paper values alongside) ==")
    print(
        t9.to_string(
            index=False,
            float_format=lambda x: f"{x:.2f}",
            na_rep="-",
        )
    )


if __name__ == "__main__":
    main()
