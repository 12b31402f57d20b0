"""Benchmark-scale reproduction of Table 6 (dataset characteristics):
generates every synthetic TIN at its benchmark scale factor and
computes the stats with the Spark SQL dataflow.
"""
import pytest

from repro.bench.harness import BENCH_SF, load, run_table6
from repro.bench.paper_numbers import PAPER_TABLE6
from repro.graph.stats import dataset_stats
from repro.tin.datasets import to_spark


@pytest.mark.parametrize("name", list(BENCH_SF))
def test_table6_dataset_stats(spark, benchmark, name):
    pdf = load(name, BENCH_SF[name])
    sdf = to_spark(spark, pdf).cache()
    sdf.count()  # materialise before timing the stats dataflow

    row = benchmark.pedantic(
        lambda: dataset_stats(sdf).collect()[0],
        rounds=1, iterations=1, warmup_rounds=0,
    )
    p_nodes, p_inter, p_avg = PAPER_TABLE6[name]
    assert row.n_interactions == len(pdf)
    # average quantity tracks the published Table 6 value
    assert 0.5 < row.avg_q / p_avg < 2.0
    sdf.unpersist()


def test_zz_print_table6(benchmark, capsys):
    """Emit the Table 6 comparison into the benchmark log."""
    t6 = benchmark.pedantic(run_table6, rounds=1, iterations=1, warmup_rounds=0)
    with capsys.disabled():
        print("\n== Table 6: dataset characteristics (bench SF vs paper) ==")
        print(t6.to_string(index=False, float_format=lambda x: f"{x:.3f}"))
