"""Reproduce Table 10: LIFO path tracking (how-provenance) — runtime,
entry memory, path memory and average path length per dataset.

Usage: spark-submit jobs/table10_paths.py
"""
from repro.bench.harness import run_table10
from repro.bench.memory import fmt_bytes


def main() -> None:
    t10 = run_table10()
    for col in ("mem_entries_bytes", "mem_paths_bytes", "total_bytes"):
        t10[col] = t10[col].map(fmt_bytes)
    print("== Table 10: path tracking in LIFO (paper values alongside) ==")
    print(t10.to_string(index=False, float_format=lambda x: f"{x:.3f}"))


if __name__ == "__main__":
    main()
