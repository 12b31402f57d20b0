"""Streaming-fashion provenance maintenance (paper §1: provenance "in
real-time, as new interactions take place in a streaming fashion").

The engines in ``repro.core`` are incremental, so streaming is a fold:
a :class:`MicroBatchRunner` owns a persistent engine and consumes
time-ordered micro-batches, exposing the exact provenance state
``O(t, B_v)`` after every batch. ``stream_spark`` replays a Spark
interaction DataFrame as micro-batches of ``batch_size`` rows — the
same processing model as a Structured Streaming ``foreachBatch`` sink
folding into operator state, without needing an unbounded source (the
container has no Kafka/socket source; a bounded DataFrame replayed in
time order exercises the identical code path).
"""
from __future__ import annotations

from typing import Any, Callable, Iterator

import pandas as pd
from pyspark.sql import DataFrame

from repro.core.api import make_engine
from repro.core.engine import Engine, iter_batches, sort_interactions


class MicroBatchRunner:
    """Fold time-ordered interaction micro-batches into one engine.

    The engine rejects batches that travel back in time, so feeding the
    runner out of order is an error, not silent corruption.
    """

    def __init__(self, policy: str, **opts: Any) -> None:
        self.engine: Engine = make_engine(policy, **opts)
        self.n_batches = 0

    def feed(self, batch: pd.DataFrame) -> Engine:
        """Process one micro-batch (sorted internally) and return the
        engine, whose state is now ``O(t, B_v)`` at the batch horizon."""
        self.engine.run(batch)
        self.n_batches += 1
        return self.engine

    def run_stream(
        self,
        batches: Iterator[pd.DataFrame],
        on_batch: Callable[[int, Engine], None] | None = None,
    ) -> Engine:
        """Drain ``batches``; optionally observe state after each one
        (e.g. the Figure 2-style per-interaction provenance pies)."""
        for batch in batches:
            self.feed(batch)
            if on_batch is not None:
                on_batch(self.n_batches, self.engine)
        return self.engine


def stream_pandas(
    pdf: pd.DataFrame, policy: str, *, batch_size: int, **opts: Any
) -> Engine:
    """Replay a pandas interaction frame as micro-batches."""
    runner = MicroBatchRunner(policy, **opts)
    return runner.run_stream(iter_batches(pdf, batch_size))


def stream_spark(
    interactions: DataFrame, policy: str, *, batch_size: int, **opts: Any
) -> Engine:
    """Replay a Spark interaction DataFrame as time-ordered micro-batches.

    Uses ``toLocalIterator`` over time-sorted partitions so only one
    partition is resident on the driver at a time — the bounded-source
    equivalent of a streaming sink folding into engine state.
    """
    runner = MicroBatchRunner(policy, **opts)
    ordered = interactions.select("s", "d", "t", "q").orderBy("t")
    buf: list = []
    for row in ordered.toLocalIterator(prefetchPartitions=True):
        buf.append((row.s, row.d, row.t, row.q))
        if len(buf) >= batch_size:
            runner.feed(pd.DataFrame(buf, columns=["s", "d", "t", "q"]))
            buf.clear()
    if buf:
        runner.feed(pd.DataFrame(buf, columns=["s", "d", "t", "q"]))
    return runner.engine


def replay_with_observer(
    pdf: pd.DataFrame,
    policy: str,
    observer: Callable[[int, Engine], None],
    *,
    batch_size: int = 1,
    **opts: Any,
) -> Engine:
    """Interaction-granular replay with a state observer — used for the
    alerting/analysis use cases (paper §7.6 monitors provenance after
    every single interaction, i.e. ``batch_size=1``)."""
    runner = MicroBatchRunner(policy, **opts)
    return runner.run_stream(
        iter_batches(sort_interactions(pdf), batch_size), on_batch=observer
    )
