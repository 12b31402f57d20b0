"""Tests for the distributed per-component runner: Spark's answer must
equal a single-process sequential replay row-for-row, and provenance
rollups are oracle-checked in SQL.
"""
import pandas as pd
import pytest

from repro.core.api import run_policy
from repro.core.distributed import (
    generated_per_vertex,
    provenance_to_spark,
    rows_to_pandas,
    run_distributed,
    run_distributed_metrics,
)
from repro.graph.components import components_of_interactions
from repro.graph.stats import top_k_generators
from repro.oracle import assert_equivalent
from repro.scale.grouped import ModuloGroups
from repro.tin.datasets import random_tin, to_spark


@pytest.fixture(scope="module")
def tin_pdf():
    return random_tin(n_nodes=40, n_interactions=400, seed=17, n_components=4)


@pytest.fixture(scope="module")
def tin_sdf(spark, tin_pdf):
    return to_spark(spark, tin_pdf).cache()


@pytest.fixture(scope="module")
def comps(tin_sdf):
    return components_of_interactions(tin_sdf, num_partitions=4).cache()


def _canon(pdf: pd.DataFrame) -> pd.DataFrame:
    out = pdf.copy()
    out["origin"] = out["origin"].astype("float64")
    out["quantity"] = out["quantity"].round(6)
    out["birth_t"] = out["birth_t"].astype("float64")
    return out.sort_values(["vertex", "origin", "birth_t", "quantity"]).reset_index(
        drop=True
    )


POLICIES = [
    ("noprov", {}),
    ("lrb", {}),
    ("mrb", {}),
    ("fifo", {}),
    ("lifo", {}),
    ("prop_dense", {}),
    ("prop_sparse", {}),
    # NOTE: "windowed" with a small W is intentionally absent: its reset
    # schedule counts interactions, which is a *global* counter in the
    # sequential engine but a *per-component* counter when distributed,
    # so the α-attributions legitimately differ. The W=∞ case (no resets
    # fire) is covered by test_windowed_distributed_semantics_note.
    ("budget", {"capacity": 5}),
    ("grouped", {"m": 3, "group_of": ModuloGroups(3)}),
]


@pytest.mark.parametrize("policy,opts", POLICIES)
def test_distributed_equals_sequential(tin_pdf, tin_sdf, comps, policy, opts):
    """The core distribution claim: per-component parallel replay under
    applyInPandas produces exactly the sequential engine's provenance."""
    got = _canon(run_distributed(tin_sdf, policy, components=comps, **opts).toPandas())
    seq = run_policy(tin_pdf, policy, **opts)
    want = _canon(rows_to_pandas(seq.provenance_rows()))
    pd.testing.assert_frame_equal(got, want, check_dtype=False)


def test_windowed_distributed_semantics_note(tin_pdf, tin_sdf, comps):
    """Windowed provenance counts interactions *per component* when
    distributed; with W larger than any component's interaction count it
    must equal the global sequential answer (no resets fire anywhere)."""
    got = _canon(
        run_distributed(tin_sdf, "windowed", components=comps, window=10**6).toPandas()
    )
    want = _canon(
        rows_to_pandas(run_policy(tin_pdf, "prop_sparse").provenance_rows())
    )
    pd.testing.assert_frame_equal(got, want, check_dtype=False)


def test_selective_distributed_with_global_topk(tin_pdf, tin_sdf, comps):
    """End-to-end §5.1 pipeline: distributed NoProv → Spark top-k origin
    selection → distributed selective provenance == sequential."""
    gen = generated_per_vertex(tin_sdf, components=comps)
    tracked = [int(r.vertex) for r in top_k_generators(gen, 5).collect()]
    got = _canon(
        run_distributed(tin_sdf, "selective", components=comps, tracked=tracked).toPandas()
    )
    seq = run_policy(tin_pdf, "selective", tracked=tracked)
    want = _canon(rows_to_pandas(seq.provenance_rows()))
    pd.testing.assert_frame_equal(got, want, check_dtype=False)


def test_generated_per_vertex_matches_sequential(tin_pdf, tin_sdf, comps):
    got = generated_per_vertex(tin_sdf, components=comps).toPandas()
    seq = run_policy(tin_pdf, "noprov")
    want = pd.DataFrame(
        sorted(seq.generated.items()), columns=["vertex", "generated_q"]
    )
    got = got.sort_values("vertex").reset_index(drop=True)
    pd.testing.assert_frame_equal(got, want, check_dtype=False, atol=1e-9)


def test_metrics_aggregate_over_components(tin_pdf, tin_sdf, comps):
    m = run_distributed_metrics(tin_sdf, "lifo", components=comps).toPandas()
    seq = run_policy(tin_pdf, "lifo")
    total = m.groupby("metric")["value"].sum()
    assert total["n_interactions"] == len(tin_pdf)
    assert total["n_entries"] == seq.entry_count()
    assert total["total_generated"] == pytest.approx(
        sum(seq.generated.values()), rel=1e-9
    )
    assert m["component"].nunique() >= 4


def test_provenance_rollup_oracle(spark, tin_pdf, tin_sdf, comps):
    """Downstream analytics on the provenance DataFrame are ordinary
    Catalyst dataflows — oracle-check the per-vertex rollup."""
    prov = run_distributed(tin_sdf, "prop_sparse", components=comps)
    rollup = prov.groupBy("vertex").sum("quantity").withColumnRenamed(
        "sum(quantity)", "buffered"
    )
    assert_equivalent(
        rollup,
        "SELECT vertex, sum(quantity) AS buffered FROM prov GROUP BY vertex",
        prov=prov.toPandas(),
    )
    # and the rollup equals the sequential buffer totals
    seq = run_policy(tin_pdf, "prop_sparse")
    got = dict(zip(*rollup.toPandas().T.values)) if False else {
        int(r.vertex): r.buffered for r in rollup.collect()
    }
    for v, tot in seq.totals.items():
        if tot > 1e-9:
            assert got[v] == pytest.approx(tot, abs=1e-6)


def test_provenance_to_spark_roundtrip(spark, tin_pdf):
    seq = run_policy(tin_pdf, "fifo")
    sdf = provenance_to_spark(seq, spark)
    assert sdf.count() == len(seq.provenance_rows())
    assert [f.name for f in sdf.schema.fields] == [
        "vertex",
        "origin",
        "birth_t",
        "quantity",
    ]


def test_rows_to_pandas_handles_empty():
    pdf = rows_to_pandas([])
    assert len(pdf) == 0
    assert list(pdf.columns) == ["vertex", "origin", "birth_t", "quantity"]
