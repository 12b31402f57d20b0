"""Unit tests for budget-based provenance (§5.3.2): per-vertex entry
capacity C with shrink-to-⌊f·C⌋ and the α (unknown-source) entry.
"""
import numpy as np
import pytest

from repro.core.api import run_policy
from repro.core.engine import touched_vertices
from repro.core.model import ALPHA
from repro.scale.budget import BudgetEngine
from repro.tin.datasets import random_tin


def test_rejects_bad_parameters():
    with pytest.raises(ValueError, match="capacity"):
        BudgetEngine(1)
    with pytest.raises(ValueError, match="keep_fraction"):
        BudgetEngine(10, keep_fraction=1.5)


def test_worked_example_from_section_5_3_2():
    """The paper's example: p_v = {(v,1),(u,3),(w,2),(z,1)}, C=5, f=0.6;
    merging {(x,2),(w,1),(y,4)} must yield {(u,3),(w,3),(y,4),(α,4)}."""
    v, u, w, z, x, y = 0, 1, 2, 3, 4, 5
    eng = BudgetEngine(capacity=5, keep_fraction=0.6)
    vec = [
        np.array([v, u, w, z], dtype=np.int64),
        np.array([1.0, 3.0, 2.0, 1.0]),
    ]
    eng.inner.vecs[9] = vec
    eng.inner._n_entries = 4
    eng.inner._merge_into(9, np.array([x, w, y], dtype=np.int64), np.array([2.0, 1.0, 4.0]))
    assert eng.vector(9) == {v: 1.0, u: 3.0, w: 3.0, x: 2.0, y: 4.0, z: 1.0}
    eng._shrink(9, eng.inner.vecs[9])
    assert eng.vector(9) == {u: 3.0, w: 3.0, y: 4.0, ALPHA: 4.0}
    assert eng.shrink_counts[9] == 1


def test_capacity_never_exceeded_after_processing():
    pdf = random_tin(n_nodes=15, n_interactions=400, seed=71, alpha=0.6)
    C = 6
    eng = run_policy(pdf, "budget", capacity=C, keep_fraction=0.6)
    for v, vec in eng.inner.vecs.items():
        assert len(vec[0]) <= C, f"vertex {v} holds {len(vec[0])} > C entries"


def test_alpha_mass_conserves_buffer_total():
    pdf = random_tin(n_nodes=15, n_interactions=400, seed=72, alpha=0.6)
    eng = run_policy(pdf, "budget", capacity=4, keep_fraction=0.6)
    for v in touched_vertices(pdf):
        vec = eng.vector(v)
        assert sum(vec.values()) == pytest.approx(eng.buffer_total(v), abs=1e-6)


def test_alpha_never_evicted():
    """α absorbs evicted mass and must survive every subsequent shrink."""
    pdf = random_tin(n_nodes=15, n_interactions=500, seed=73, alpha=0.5)
    eng = run_policy(pdf, "budget", capacity=4, keep_fraction=0.6)
    shrunk_twice = [v for v, n in eng.shrink_counts.items() if n >= 2]
    assert shrunk_twice, "test TIN must shrink some vertex twice"
    for v in shrunk_twice:
        assert ALPHA in eng.vector(v)


def test_kept_entries_are_the_largest():
    eng = BudgetEngine(capacity=3, keep_fraction=0.67)  # keep 2
    vec = [
        np.array([1, 2, 3, 4], dtype=np.int64),
        np.array([5.0, 1.0, 7.0, 2.0]),
    ]
    eng.inner.vecs[9] = vec
    eng.inner._n_entries = 4
    eng._shrink(9, vec)
    assert eng.vector(9) == {1: 5.0, 3: 7.0, ALPHA: 3.0}


def test_large_capacity_equals_sparse_proportional():
    pdf = random_tin(n_nodes=12, n_interactions=250, seed=74)
    bud = run_policy(pdf, "budget", capacity=10**6)
    full = run_policy(pdf, "prop_sparse")
    assert bud.shrink_counts == {}
    for v in touched_vertices(pdf):
        bv, fv = bud.vector(v), full.vector(v)
        for o in set(bv) | set(fv):
            assert bv.get(o, 0.0) == pytest.approx(fv.get(o, 0.0), abs=1e-8)


def test_larger_budget_means_fewer_shrinks():
    """Table 9's trend: avg shrinks decrease monotonically with C."""
    pdf = random_tin(n_nodes=20, n_interactions=600, seed=75, alpha=0.5)
    stats = {
        C: run_policy(pdf, "budget", capacity=C).shrink_stats() for C in (4, 8, 16)
    }
    assert stats[4]["avg_shrinks"] >= stats[8]["avg_shrinks"] >= stats[16]["avg_shrinks"]
    assert stats[4]["pct_shrunk"] >= stats[16]["pct_shrunk"]


def test_shrink_stats_empty_engine():
    eng = BudgetEngine(capacity=5)
    st = eng.shrink_stats()
    assert st == {"avg_shrinks": 0.0, "pct_shrunk": 0.0, "n_nonempty": 0.0}


def test_shrink_stats_counts_nonempty_buffers():
    pdf = random_tin(n_nodes=15, n_interactions=300, seed=76, alpha=0.6)
    eng = run_policy(pdf, "budget", capacity=4)
    st = eng.shrink_stats()
    assert 0.0 <= st["pct_shrunk"] <= 100.0
    assert st["n_nonempty"] > 0
    assert st["avg_shrinks"] * st["n_nonempty"] == pytest.approx(
        sum(eng.shrink_counts.values()), abs=1e-6
    )


def test_metrics_include_shrink_stats():
    pdf = random_tin(n_nodes=10, n_interactions=200, seed=77, alpha=0.6)
    m = run_policy(pdf, "budget", capacity=4).metrics()
    assert "avg_shrinks" in m and "pct_shrunk" in m and "total_shrinks" in m
