"""Reproduce Table 6: characteristics of the five (synthetic) TINs,
computed with the Spark SQL stats dataflow at the benchmark scale
factors.

Usage: spark-submit jobs/table6_datasets.py [--sf-scale X]
(--sf-scale multiplies every benchmark scale factor, e.g. 0.1 for a
quick run.)
"""
import argparse

from repro.bench.harness import BENCH_SF, load
from repro.graph.stats import dataset_stats
from repro.bench.paper_numbers import PAPER_TABLE6
from repro.session import build_spark
from repro.tin.datasets import to_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf-scale", type=float, default=1.0)
    args = ap.parse_args()
    spark = build_spark("table6")
    print(f"{'dataset':<10} {'#nodes':>10} {'#interactions':>14} {'avg r.q':>12} "
          f"| paper: {'#nodes':>10} {'#inter':>10} {'avg r.q':>10}")
    for name, sf in BENCH_SF.items():
        sdf = to_spark(spark, load(name, sf * args.sf_scale))
        row = dataset_stats(sdf).collect()[0]
        p_nodes, p_inter, p_avg = PAPER_TABLE6[name]
        print(
            f"{name:<10} {row.n_nodes:>10} {row.n_interactions:>14} "
            f"{row.avg_q:>12.3f} | {p_nodes:>17} {p_inter:>10} {p_avg:>10}"
        )
    spark.stop()


if __name__ == "__main__":
    main()
