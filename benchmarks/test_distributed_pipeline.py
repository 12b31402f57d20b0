"""End-to-end benchmark of the distributed pipeline (components →
tagging → per-component applyInPandas kernels) on a mid-size TIN —
the Spark-side cost that the paper's single-machine C study does not
have, reported for completeness.
"""
import pytest

from repro.core.distributed import run_distributed
from repro.graph.components import components_of_interactions
from repro.tin.datasets import generate, to_spark


@pytest.fixture(scope="module")
def taxi_sdf(spark):
    sdf = to_spark(spark, generate("taxis", sf=0.1)).cache()
    sdf.count()
    return sdf


def test_connected_components_bench(spark, benchmark, taxi_sdf):
    comps = benchmark.pedantic(
        lambda: components_of_interactions(taxi_sdf, num_partitions=8).cache(),
        rounds=1, iterations=1, warmup_rounds=0,
    )
    assert comps.count() > 0


@pytest.mark.parametrize("policy", ["noprov", "lifo", "prop_sparse"])
def test_distributed_replay_bench(spark, benchmark, taxi_sdf, policy):
    comps = components_of_interactions(taxi_sdf, num_partitions=8).cache()
    comps.count()
    prov = benchmark.pedantic(
        lambda: run_distributed(taxi_sdf, policy, components=comps).collect(),
        rounds=1, iterations=1, warmup_rounds=0,
    )
    if policy != "noprov":
        assert len(prov) > 0
