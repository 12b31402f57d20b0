"""Spark SQL dataflows over TINs: dataset statistics (Table 6), vertex
degrees, top-k origin selection (§5.1) and group assignment (§5.2).

Everything here is a plain Catalyst dataflow and is cross-checked
against the DuckDB oracle in ``tests/test_graph_stats.py``.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, Window


def dataset_stats(interactions: DataFrame) -> DataFrame:
    """One-row frame ``(n_nodes, n_interactions, avg_q)`` — the Table 6
    characteristics of a TIN."""
    nodes = (
        interactions.select(F.col("s").alias("v"))
        .union(interactions.select(F.col("d").alias("v")))
        .distinct()
        .count()
    )
    return interactions.agg(
        F.lit(nodes).alias("n_nodes"),
        F.count("*").alias("n_interactions"),
        F.avg("q").alias("avg_q"),
    )


def degrees(interactions: DataFrame) -> DataFrame:
    """Per-vertex interaction degrees and flow volumes:
    ``(vertex, out_deg, in_deg, out_q, in_q)``."""
    out = interactions.groupBy(F.col("s").alias("vertex")).agg(
        F.count("*").alias("out_deg"), F.sum("q").alias("out_q")
    )
    inn = interactions.groupBy(F.col("d").alias("vertex")).agg(
        F.count("*").alias("in_deg"), F.sum("q").alias("in_q")
    )
    return (
        out.join(inn, on="vertex", how="full")
        .na.fill(0)
        .select("vertex", "out_deg", "in_deg", "out_q", "in_q")
    )


def top_k_generators(generated: DataFrame, k: int) -> DataFrame:
    """§5.1 tracked-vertex choice: the k vertices with the largest total
    generated quantity. ``generated`` has columns ``(vertex, generated_q)``
    (produced by the distributed NoProv pass). Ties break on vertex id
    so the selection is deterministic."""
    w = Window.orderBy(F.desc("generated_q"), F.asc("vertex"))
    return (
        generated.withColumn("rank", F.row_number().over(w))
        .filter(F.col("rank") <= k)
        .select("vertex", "generated_q")
    )


def round_robin_groups(interactions: DataFrame, m: int) -> DataFrame:
    """§5.2 grouping: allocate every vertex to one of ``m`` groups
    round-robin by vertex id (the paper allocates randomly round-robin
    and notes cost is insensitive to the allocation). Returns
    ``(vertex, group)`` with ``group ∈ [0, m)``."""
    verts = (
        interactions.select(F.col("s").alias("vertex"))
        .union(interactions.select(F.col("d").alias("vertex")))
        .distinct()
    )
    return verts.select("vertex", (F.col("vertex") % m).cast("long").alias("group"))


def neighbor_pairs(interactions: DataFrame) -> DataFrame:
    """Distinct ``(vertex, neighbor)`` pairs where ``neighbor`` sends
    quantity directly to ``vertex`` — the in-neighbour relation behind
    the §7.6 alerting use case."""
    return interactions.select(
        F.col("d").alias("vertex"), F.col("s").alias("neighbor")
    ).distinct()
