"""Tests for the DataFrame hash-min connected components substrate,
oracle-checked against a DuckDB recursive CTE on small graphs.
"""
import pandas as pd
import pytest

from repro.graph.components import (
    components_of_interactions,
    connected_components,
    interaction_edges,
    tag_interactions,
)
from repro.oracle import assert_equivalent
from repro.tin.datasets import random_tin, to_spark

#: DuckDB reachability oracle: a vertex's component is the min id among
#: all vertices reachable from it in the symmetrised edge set.
_CC_SQL = """
WITH RECURSIVE sym AS (
  SELECT src, dst FROM edges UNION SELECT dst, src FROM edges
), reach(v, r) AS (
  SELECT src, src FROM sym
  UNION
  SELECT s.dst, reach.r FROM sym s JOIN reach ON s.src = reach.v
)
SELECT v AS vertex, min(r) AS component FROM reach GROUP BY v
"""


def _edges_pdf(rows):
    return pd.DataFrame(rows, columns=["src", "dst"])


def _edges_sdf(spark, rows):
    return spark.createDataFrame(_edges_pdf(rows), schema="src long, dst long")


def test_single_chain_is_one_component(spark):
    got = connected_components(
        _edges_sdf(spark, [(1, 2), (2, 3), (3, 4)]), num_partitions=2
    ).toPandas()
    assert set(got["component"]) == {1}
    assert set(got["vertex"]) == {1, 2, 3, 4}


def test_two_islands(spark):
    got = connected_components(
        _edges_sdf(spark, [(1, 2), (5, 6), (6, 7)]), num_partitions=2
    ).toPandas()
    comp = dict(zip(got["vertex"], got["component"]))
    assert comp[1] == comp[2] == 1
    assert comp[5] == comp[6] == comp[7] == 5


def test_direction_is_ignored(spark):
    """Weak connectivity: a→b and c→b land in one component."""
    got = connected_components(
        _edges_sdf(spark, [(1, 2), (3, 2)]), num_partitions=2
    ).toPandas()
    assert set(got["component"]) == {1}


@pytest.mark.parametrize("seed", [1, 2, 3])
def test_matches_duckdb_recursive_oracle(spark, seed):
    pdf = random_tin(n_nodes=30, n_interactions=40, seed=seed, n_components=3)
    edges = interaction_edges(to_spark(spark, pdf))
    got = connected_components(edges, num_partitions=4)
    assert_equivalent(got, _CC_SQL, edges=edges.toPandas())


def test_component_count_matches_construction(spark):
    pdf = random_tin(n_nodes=40, n_interactions=120, seed=7, n_components=4)
    comps = components_of_interactions(to_spark(spark, pdf), num_partitions=4)
    labels = comps.toPandas()
    # random_tin guarantees ≥... blocks are disjoint; within a block the
    # zipf draw may not connect everything, so components ≥ 4
    assert labels["component"].nunique() >= 4
    # block boundaries are never crossed
    labels["block"] = labels["vertex"] // 10
    assert (labels.groupby("component")["block"].nunique() == 1).all()


def test_tag_interactions_keeps_all_rows_and_components(spark):
    pdf = random_tin(n_nodes=30, n_interactions=60, seed=8, n_components=3)
    sdf = to_spark(spark, pdf)
    comps = components_of_interactions(sdf, num_partitions=4)
    tagged = tag_interactions(sdf, comps)
    assert tagged.count() == 60
    both = tagged.toPandas().merge(
        comps.toPandas().rename(columns={"vertex": "d", "component": "comp_d"}),
        on="d",
    )
    # source-assigned component equals destination's component
    assert (both["component"] == both["comp_d"]).all()


def test_interaction_edges_distinct(spark):
    pdf = pd.DataFrame(
        {"s": [1, 1, 2], "d": [2, 2, 1], "t": [1.0, 2.0, 3.0], "q": [1.0, 1.0, 1.0]}
    )
    edges = interaction_edges(to_spark(spark, pdf)).toPandas()
    assert len(edges) == 2  # (1,2) deduplicated; (2,1) kept as distinct
