"""Oracle-checked tests for the Spark SQL dataflows in repro.graph.stats."""
import pandas as pd
import pytest

from repro.graph.stats import (
    degrees,
    neighbor_pairs,
    round_robin_groups,
    top_k_generators,
)
from repro.oracle import assert_equivalent
from repro.tin.datasets import random_tin, to_spark


@pytest.fixture(scope="module")
def tin_pdf():
    return random_tin(n_nodes=25, n_interactions=200, seed=13)


@pytest.fixture(scope="module")
def tin_sdf(spark, tin_pdf):
    return to_spark(spark, tin_pdf).cache()


def test_degrees_match_duckdb(tin_sdf, tin_pdf):
    assert_equivalent(
        degrees(tin_sdf),
        """
        SELECT coalesce(o.vertex, i.vertex) AS vertex,
               coalesce(o.out_deg, 0) AS out_deg,
               coalesce(i.in_deg, 0) AS in_deg,
               coalesce(o.out_q, 0) AS out_q,
               coalesce(i.in_q, 0) AS in_q
        FROM (SELECT s AS vertex, count(*) AS out_deg, sum(q) AS out_q
              FROM inter GROUP BY s) o
        FULL JOIN (SELECT d AS vertex, count(*) AS in_deg, sum(q) AS in_q
                   FROM inter GROUP BY d) i
        USING (vertex)
        """,
        inter=tin_pdf,
    )


def test_degree_totals_conserve_flow(tin_sdf, tin_pdf):
    deg = degrees(tin_sdf).toPandas()
    assert deg["out_q"].sum() == pytest.approx(tin_pdf["q"].sum())
    assert deg["in_q"].sum() == pytest.approx(tin_pdf["q"].sum())
    assert deg["out_deg"].sum() == len(tin_pdf)


@pytest.mark.parametrize("k", [1, 5, 100])
def test_top_k_generators_match_duckdb(spark, k):
    gen = pd.DataFrame(
        {"vertex": range(20), "generated_q": [(i * 37) % 13 + 0.5 for i in range(20)]}
    )
    got = top_k_generators(spark.createDataFrame(gen), k)
    assert_equivalent(
        got,
        f"""
        SELECT vertex, generated_q FROM gen
        ORDER BY generated_q DESC, vertex ASC LIMIT {k}
        """,
        gen=gen,
    )


def test_top_k_breaks_ties_deterministically(spark):
    gen = pd.DataFrame({"vertex": [5, 3, 9], "generated_q": [1.0, 1.0, 1.0]})
    got = top_k_generators(spark.createDataFrame(gen), 2).toPandas()
    assert sorted(got["vertex"]) == [3, 5]


@pytest.mark.parametrize("m", [1, 3, 7])
def test_round_robin_groups_match_duckdb(tin_sdf, tin_pdf, m):
    assert_equivalent(
        round_robin_groups(tin_sdf, m),
        f"""
        SELECT vertex, vertex % {m} AS "group"
        FROM (SELECT s AS vertex FROM inter UNION SELECT d FROM inter)
        """,
        inter=tin_pdf,
    )


def test_round_robin_covers_all_groups(tin_sdf):
    got = round_robin_groups(tin_sdf, 5).toPandas()
    assert set(got["group"]) == set(range(5))


def test_neighbor_pairs_match_duckdb(tin_sdf, tin_pdf):
    assert_equivalent(
        neighbor_pairs(tin_sdf),
        "SELECT DISTINCT d AS vertex, s AS neighbor FROM inter",
        inter=tin_pdf,
    )
