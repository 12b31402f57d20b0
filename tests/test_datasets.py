"""Tests for the synthetic TIN generators, including the Table 6
characteristics computed with Spark SQL and oracle-checked with DuckDB.
"""
import numpy as np
import pytest

from repro.graph.stats import dataset_stats
from repro.oracle import assert_equivalent
from repro.tin import datasets as tin
from repro.tin.datasets import DATASETS, PAPER_AVG_Q, generate, random_tin, spec, to_spark

TEST_SF = {
    "bitcoin": 2e-4,
    "ctu": 2e-3,
    "prosper": 1e-3,
    "flights": 1e-3,
    "taxis": 2e-2,
}


@pytest.mark.parametrize("name", DATASETS)
def test_generator_is_deterministic(name):
    a = generate(name, sf=TEST_SF[name], seed=3)
    b = generate(name, sf=TEST_SF[name], seed=3)
    assert a.equals(b)


@pytest.mark.parametrize("name", DATASETS)
def test_generator_seed_changes_data(name):
    a = generate(name, sf=TEST_SF[name], seed=3)
    b = generate(name, sf=TEST_SF[name], seed=4)
    assert not a.equals(b)


@pytest.mark.parametrize("name", DATASETS)
def test_schema_and_basic_validity(name):
    pdf = generate(name, sf=TEST_SF[name])
    assert list(pdf.columns) == ["s", "d", "t", "q"]
    assert pdf["s"].dtype == np.int64 and pdf["d"].dtype == np.int64
    assert (pdf["q"] > 0).all()
    assert (pdf["s"] != pdf["d"]).all()  # no self-loops
    assert pdf["t"].is_monotonic_increasing
    assert pdf["t"].is_unique


@pytest.mark.parametrize("name", DATASETS)
def test_interaction_count_scales_with_sf(name):
    sp = spec(name, sf=TEST_SF[name])
    pdf = generate(name, sf=TEST_SF[name])
    assert len(pdf) == sp.n_interactions


@pytest.mark.parametrize("name", ["flights", "taxis"])
def test_hub_datasets_have_fixed_vertex_sets(name):
    """Airports/taxi zones do not multiply with the scale factor."""
    assert spec(name, sf=0.001).n_nodes == spec(name, sf=1.0).n_nodes


@pytest.mark.parametrize("name", ["bitcoin", "ctu", "prosper"])
def test_large_datasets_scale_vertices(name):
    assert spec(name, sf=0.001).n_nodes < spec(name, sf=0.01).n_nodes


@pytest.mark.parametrize("name", DATASETS)
def test_mean_quantity_tracks_paper(name):
    """The published average r.q (Table 6) is matched within 2× — exact
    for uniform/integer datasets, looser for the heavy-tailed ones."""
    pdf = generate(name, sf=TEST_SF[name])
    ratio = pdf["q"].mean() / PAPER_AVG_Q[name]
    assert 0.5 < ratio < 2.0, f"mean q off by {ratio}x"


def test_spec_rejects_unknown_dataset():
    with pytest.raises(ValueError, match="unknown dataset"):
        spec("enron", sf=0.1)


def test_random_tin_components_are_disjoint():
    pdf = random_tin(n_nodes=40, n_interactions=300, seed=9, n_components=4)
    blocks_s = pdf["s"] // 10
    blocks_d = pdf["d"] // 10
    assert (blocks_s == blocks_d).all()
    assert blocks_s.nunique() == 4


def test_zipf_endpoints_are_skewed():
    pdf = generate("bitcoin", sf=2e-4, seed=1)
    counts = pdf["s"].value_counts()
    # heavy tail: the busiest 1% of sources produce >10% of interactions
    top = counts.iloc[: max(1, len(counts) // 100)].sum()
    assert top / len(pdf) > 0.10


# ----------------------------------------------------------------------------
# Spark + DuckDB oracle
# ----------------------------------------------------------------------------
@pytest.mark.parametrize("name", DATASETS)
def test_table6_stats_match_duckdb_oracle(spark, name):
    """The Table 6 dataflow (distinct-vertex count, interaction count,
    mean quantity) is verified against DuckDB on identical input."""
    pdf = generate(name, sf=TEST_SF[name])
    sdf = to_spark(spark, pdf)
    assert_equivalent(
        dataset_stats(sdf),
        """
        SELECT
          (SELECT count(*) FROM (SELECT s AS v FROM inter UNION SELECT d FROM inter)) AS n_nodes,
          count(*) AS n_interactions,
          avg(q) AS avg_q
        FROM inter
        """,
        inter=pdf,
    )


def test_to_spark_schema(spark):
    sdf = to_spark(spark, random_tin(n_nodes=5, n_interactions=20, seed=1))
    assert [f.name for f in sdf.schema.fields] == ["s", "d", "t", "q"]
    assert sdf.count() == 20
