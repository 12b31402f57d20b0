"""Streaming-fashion maintenance tests: micro-batched replay must equal
one-shot batch replay for every policy, at any batch size.
"""
import pandas as pd
import pytest

from repro.core.api import run_policy
from repro.stream.microbatch import MicroBatchRunner, replay_with_observer, stream_pandas
from repro.tin.datasets import random_tin, running_example

POLICIES = [
    ("noprov", {}),
    ("lrb", {}),
    ("mrb", {}),
    ("fifo", {}),
    ("lifo", {}),
    ("prop_sparse", {}),
    ("windowed", {"window": 13}),
    ("budget", {"capacity": 5}),
]


@pytest.mark.parametrize("policy,opts", POLICIES)
@pytest.mark.parametrize("batch_size", [1, 7, 64])
def test_microbatch_equals_batch(policy, opts, batch_size):
    pdf = random_tin(n_nodes=12, n_interactions=150, seed=101)
    streamed = stream_pandas(pdf, policy, batch_size=batch_size, **opts)
    batch = run_policy(pdf, policy, **opts)
    assert streamed.provenance_rows() == batch.provenance_rows()
    assert streamed.totals == batch.totals


def test_out_of_order_batches_rejected():
    runner = MicroBatchRunner("fifo")
    runner.feed(pd.DataFrame({"s": [1], "d": [2], "t": [5.0], "q": [1.0]}))
    with pytest.raises(ValueError, match="time order"):
        runner.feed(pd.DataFrame({"s": [2], "d": [3], "t": [4.0], "q": [1.0]}))


def test_observer_sees_state_after_every_interaction():
    """batch_size=1 gives the §7.6-style per-interaction observation:
    the observer sees monotonically growing totals."""
    pdf = running_example()
    seen = []
    replay_with_observer(
        pdf, "noprov", lambda n, eng: seen.append(sum(eng.totals.values()))
    )
    assert len(seen) == len(pdf)
    assert seen == sorted(seen)  # total buffered == total generated, monotone
    assert seen[-1] == pytest.approx(9.0)  # Table 2: 3+2+4 at the end


def test_runner_counts_batches():
    pdf = random_tin(n_nodes=8, n_interactions=50, seed=102)
    runner = MicroBatchRunner("lifo")
    from repro.core.engine import iter_batches

    runner.run_stream(iter_batches(pdf, 10))
    assert runner.n_batches == 5


def test_midstream_provenance_query():
    """O(t, B_v) is answerable between batches — the streaming point of
    the paper: provenance is maintained, not recomputed."""
    pdf = running_example()
    runner = MicroBatchRunner("lrb")
    runner.feed(pdf.iloc[:3])
    # After 3 interactions, Table 3 row 3: B_v1 = {(1,1,3)}
    assert runner.engine.buffer_triples(1) == [(1, 1.0, 3.0)]
    runner.feed(pdf.iloc[3:])
    assert runner.engine.buffer_triples(1) == [(1, 1.0, 2.0)]


def test_stream_spark_equals_batch(spark):
    from repro.stream.microbatch import stream_spark
    from repro.tin.datasets import to_spark

    pdf = random_tin(n_nodes=10, n_interactions=120, seed=103)
    sdf = to_spark(spark, pdf)
    streamed = stream_spark(sdf, "prop_sparse", batch_size=17)
    batch = run_policy(pdf, "prop_sparse")
    rows_s = [(v, o, q) for v, o, _bt, q in streamed.provenance_rows()]
    rows_b = [(v, o, q) for v, o, _bt, q in batch.provenance_rows()]
    assert len(rows_s) == len(rows_b)
    for (vs, os_, qs), (vb, ob, qb) in zip(rows_s, rows_b):
        assert (vs, os_) == (vb, ob)
        assert qs == pytest.approx(qb, abs=1e-9)
