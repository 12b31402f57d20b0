"""End-to-end distributed provenance pipeline on one dataset:

1. generate the synthetic TIN and lift it to Spark,
2. label weakly connected components (iterative hash-min joins),
3. replay every component's interactions in parallel under the chosen
   selection policy (applyInPandas kernels),
4. show the top buffered (vertex, origin) provenance pairs and write
   the full provenance DataFrame to parquet.

Usage:
  spark-submit jobs/distributed_provenance.py \
      --dataset taxis --policy prop_sparse --sf 0.05 --out /tmp/prov
"""
import argparse

import pyspark.sql.functions as F

from repro.core.distributed import run_distributed
from repro.graph.components import components_of_interactions
from repro.session import build_spark
from repro.tin.datasets import generate, to_spark


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="taxis")
    ap.add_argument("--policy", default="prop_sparse")
    ap.add_argument("--sf", type=float, default=0.05)
    ap.add_argument("--out", default=None, help="optional parquet output path")
    args = ap.parse_args()

    spark = build_spark("distributed-provenance")
    sdf = to_spark(spark, generate(args.dataset, sf=args.sf)).cache()
    comps = components_of_interactions(sdf, num_partitions=8).cache()
    n_comp = comps.select("component").distinct().count()
    print(f"{args.dataset}: {sdf.count()} interactions, {n_comp} weakly "
          f"connected component(s)")
    prov = run_distributed(sdf, args.policy, components=comps).cache()
    print(f"provenance rows: {prov.count()}")
    print("top (vertex, origin) pairs by buffered quantity:")
    prov.orderBy(F.desc("quantity")).show(20)
    if args.out:
        prov.write.mode("overwrite").parquet(args.out)
        print(f"written to {args.out}")
    spark.stop()


if __name__ == "__main__":
    main()
