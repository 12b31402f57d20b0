"""Cross-policy invariants on random TINs.

The selection policy decides *which* units move, never *how many*, so:

* buffer totals |B_v| are identical across all policies at every prefix;
* the provenance entries at v always sum to |B_v| (Definition 2's
  Σ τ.q = |B_v| requirement);
* the total buffered quantity equals the total generated quantity
  (relay conservation: units are moved, never created or destroyed
  except by generation);
* per-origin provenance is identical between dense and sparse
  proportional, and aggregates of the full proportional answer match
  the selective/grouped/windowed/budget restrictions when those are
  unconstrained.

Checked both with fixed seeds (fast, deterministic) and with
hypothesis-generated interaction streams.
"""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.api import run_policy
from repro.core.engine import touched_vertices
from repro.tin.datasets import random_tin

ALL_POLICIES = [
    ("noprov", {}),
    ("lrb", {}),
    ("mrb", {}),
    ("fifo", {}),
    ("lifo", {}),
    ("fifo", {"track_paths": True}),
    ("lifo", {"track_paths": True}),
    ("prop_dense", {}),
    ("prop_sparse", {}),
    ("budget", {"capacity": 4, "keep_fraction": 0.6}),
    ("windowed", {"window": 7}),
]

SEEDS = [0, 1, 2]


@pytest.fixture(scope="module")
def tins():
    return {
        seed: random_tin(n_nodes=25, n_interactions=300, seed=seed, alpha=0.9)
        for seed in SEEDS
    }


@pytest.mark.parametrize("seed", SEEDS)
@pytest.mark.parametrize("policy,opts", ALL_POLICIES)
def test_buffer_totals_policy_independent(tins, seed, policy, opts):
    pdf = tins[seed]
    ref = run_policy(pdf, "noprov")
    eng = run_policy(pdf, policy, **opts)
    for v in touched_vertices(pdf):
        assert eng.buffer_total(v) == pytest.approx(ref.buffer_total(v), abs=1e-6)


@pytest.mark.parametrize("seed", SEEDS)
@pytest.mark.parametrize("policy,opts", [p for p in ALL_POLICIES if p[0] != "noprov"])
def test_provenance_sums_to_buffer_total(tins, seed, policy, opts):
    pdf = tins[seed]
    eng = run_policy(pdf, policy, **opts)
    per_vertex: dict[int, float] = {}
    for v, _o, _bt, q in eng.provenance_rows():
        per_vertex[v] = per_vertex.get(v, 0.0) + q
    for v in touched_vertices(pdf):
        assert per_vertex.get(v, 0.0) == pytest.approx(
            eng.buffer_total(v), abs=1e-6
        ), f"vertex {v}"


@pytest.mark.parametrize("seed", SEEDS)
@pytest.mark.parametrize("policy,opts", ALL_POLICIES)
def test_total_buffered_equals_total_generated(tins, seed, policy, opts):
    eng = run_policy(tins[seed], policy, **opts)
    assert sum(eng.totals.values()) == pytest.approx(
        sum(eng.generated.values()), rel=1e-9
    )


@pytest.mark.parametrize("seed", SEEDS)
@pytest.mark.parametrize("policy,opts", ALL_POLICIES)
def test_generated_identical_across_policies(tins, seed, policy, opts):
    """Generation happens whenever |B_s| < r.q — independent of the
    selection policy, so every engine reports the same per-vertex
    generated quantities."""
    pdf = tins[seed]
    ref = run_policy(pdf, "noprov").generated
    got = run_policy(pdf, policy, **opts).generated
    assert set(got) == set(ref)
    for v, g in ref.items():
        assert got[v] == pytest.approx(g, abs=1e-6)


@pytest.mark.parametrize("seed", SEEDS)
@pytest.mark.parametrize(
    "policy,opts",
    [("lrb", {}), ("mrb", {}), ("fifo", {}), ("lifo", {}),
     ("prop_dense", {}), ("prop_sparse", {})],
)
def test_origin_totals_bounded_by_generation(tins, seed, policy, opts):
    """Summed over all buffers, the quantity attributed to origin o must
    equal the total quantity o generated (exact policies only)."""
    pdf = tins[seed]
    eng = run_policy(pdf, policy, **opts)
    per_origin: dict[int, float] = {}
    for _v, o, _bt, q in eng.provenance_rows():
        per_origin[o] = per_origin.get(o, 0.0) + q
    for o, g in eng.generated.items():
        assert per_origin.get(o, 0.0) == pytest.approx(g, abs=1e-6), f"origin {o}"


@pytest.mark.parametrize("seed", SEEDS)
def test_dense_equals_sparse_proportional(tins, seed):
    pdf = tins[seed]
    dense = run_policy(pdf, "prop_dense")
    sparse = run_policy(pdf, "prop_sparse")
    for v in touched_vertices(pdf):
        dv = dict(zip(dense.ids, dense.vector(v)))
        sv = sparse.vector(v)
        for o in set(dv) | set(sv):
            assert dv.get(o, 0.0) == pytest.approx(sv.get(o, 0.0), abs=1e-6)


# ---------------------------------------------------------------------------
# hypothesis: arbitrary interaction streams
# ---------------------------------------------------------------------------
interactions_strategy = st.lists(
    st.tuples(
        st.integers(0, 7),  # s
        st.integers(0, 7),  # d
        st.floats(0.01, 100.0, allow_nan=False, allow_infinity=False),  # q
    ).filter(lambda r: r[0] != r[1]),
    min_size=1,
    max_size=60,
)


def _to_frame(rows):
    import pandas as pd

    return pd.DataFrame(
        [(s, d, float(i), q) for i, (s, d, q) in enumerate(rows)],
        columns=["s", "d", "t", "q"],
    )


@settings(max_examples=40, deadline=None)
@given(rows=interactions_strategy)
def test_hypothesis_conservation_all_policies(rows):
    pdf = _to_frame(rows)
    ref = run_policy(pdf, "noprov")
    for policy, opts in ALL_POLICIES:
        eng = run_policy(pdf, policy, **opts)
        assert sum(eng.totals.values()) == pytest.approx(
            sum(eng.generated.values()), rel=1e-6, abs=1e-6
        )
        if policy == "noprov":
            continue
        per_vertex: dict[int, float] = {}
        for v, _o, _bt, q in eng.provenance_rows():
            per_vertex[v] = per_vertex.get(v, 0.0) + q
        for v in touched_vertices(pdf):
            assert per_vertex.get(v, 0.0) == pytest.approx(
                ref.buffer_total(v), abs=1e-6
            )


@settings(max_examples=40, deadline=None)
@given(rows=interactions_strategy)
def test_hypothesis_dense_equals_sparse(rows):
    pdf = _to_frame(rows)
    dense = run_policy(pdf, "prop_dense")
    sparse = run_policy(pdf, "prop_sparse")
    for v in touched_vertices(pdf):
        dv = dict(zip(dense.ids, dense.vector(v)))
        sv = sparse.vector(v)
        for o in set(dv) | set(sv):
            assert dv.get(o, 0.0) == pytest.approx(sv.get(o, 0.0), abs=1e-6)


@settings(max_examples=25, deadline=None)
@given(rows=interactions_strategy)
def test_hypothesis_heap_and_queue_entry_growth_bound(rows):
    """Space analysis §4.1/§4.2: each interaction adds at most one entry
    (split or newborn), so entry counts are bounded by |R|."""
    pdf = _to_frame(rows)
    for policy in ("lrb", "mrb", "fifo", "lifo"):
        eng = run_policy(pdf, policy)
        assert eng.entry_count() <= len(pdf)
