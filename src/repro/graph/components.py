"""Weakly connected components over Spark DataFrames.

The provenance semantics of a TIN are sequential *within* a weakly
connected component (every interaction reads and writes the live buffer
state of its two endpoints) and trivially parallel *across* components
(quantities are relayed, never copied, so they cannot cross a
component boundary). This module supplies the component labelling that
``repro.core.distributed`` partitions on.

The algorithm is hash-min label propagation — the same iterative
message-passing computation GraphX's ``connectedComponents`` runs,
expressed as DataFrame joins (PySpark ships no GraphX binding and the
container has no Maven access; see DESIGN.md §3):

1. every vertex starts with label = its own id;
2. each round, every vertex takes the min of its label and its
   neighbours' labels (one join + groupBy-min = one message exchange);
3. stop when no label changed (the sum of labels is strictly
   monotone decreasing, so "sum unchanged" == converged).

Rounds needed = graph diameter; lineage is cut with localCheckpoint so
the plan does not grow with iterations.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame


def interaction_edges(interactions: DataFrame) -> DataFrame:
    """Distinct directed edges ``(src, dst)`` of a TIN's interaction
    stream (the graph's E, collapsing the per-edge interaction history)."""
    return interactions.select(
        F.col("s").alias("src"), F.col("d").alias("dst")
    ).distinct()


def connected_components(
    edges: DataFrame, *, max_iter: int = 100, num_partitions: int | None = None
) -> DataFrame:
    """Label each vertex with the minimum vertex id of its weakly
    connected component. Returns a DataFrame ``(vertex, component)``.

    ``edges`` is any DataFrame with ``src``/``dst`` columns; direction
    is ignored (weak connectivity). ``num_partitions`` tunes the
    iteration's shuffle width (defaults to the input's partitioning —
    pass a small number for small graphs to avoid 64-way shuffles of
    tiny data).
    """
    sym = edges.select("src", "dst").union(
        edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    )
    if num_partitions:
        sym = sym.repartition(num_partitions, "dst")
    sym = sym.distinct().persist()
    labels = (
        sym.select(F.col("src").alias("vertex"))
        .distinct()
        .withColumn("component", F.col("vertex"))
        .localCheckpoint()
    )
    prev_sum = labels.agg(F.sum("component")).collect()[0][0]
    for _ in range(max_iter):
        # One message round: every vertex proposes its current label to
        # each out-neighbour of the symmetrised graph; a vertex keeps
        # the min of its own label and all proposals.
        msgs = (
            sym.join(labels, sym.src == labels.vertex)
            .select(F.col("dst").alias("vertex"), "component")
        )
        labels = (
            labels.unionByName(msgs)
            .groupBy("vertex")
            .agg(F.min("component").alias("component"))
            .localCheckpoint()  # cut lineage; also materialises the round
        )
        cur_sum = labels.agg(F.sum("component")).collect()[0][0]
        if cur_sum == prev_sum:
            break
        prev_sum = cur_sum
    else:
        raise RuntimeError(f"connected components did not converge in {max_iter} rounds")
    sym.unpersist()
    return labels


def components_of_interactions(
    interactions: DataFrame, *, num_partitions: int | None = None
) -> DataFrame:
    """``(vertex, component)`` for every vertex of a TIN. Every vertex of
    an interaction stream has degree ≥ 1, so the edge-based labelling
    covers all of them."""
    return connected_components(
        interaction_edges(interactions), num_partitions=num_partitions
    )


def tag_interactions(interactions: DataFrame, components: DataFrame) -> DataFrame:
    """Attach the source vertex's component id to every interaction
    (source and destination are in the same component by construction)."""
    comp = components.withColumnRenamed("vertex", "s")
    return interactions.join(comp, on="s", how="inner").select(
        "component", "s", "d", "t", "q"
    )
