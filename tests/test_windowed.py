"""Unit tests for the windowing approach (§5.3.1): odd/even sparse
vector pairs reset every W interactions, guaranteeing exact provenance
for quantities born W..2W interactions ago.
"""
import pytest

from repro.core.api import run_policy
from repro.core.engine import touched_vertices
from repro.core.model import ALPHA
from repro.scale.windowed import WindowedEngine
from repro.tin.datasets import random_tin


def test_rejects_nonpositive_window():
    with pytest.raises(ValueError, match="window"):
        WindowedEngine(0)


def test_no_reset_before_first_window_boundary():
    eng = WindowedEngine(10)
    for i in range(9):
        eng.process(1, 2, float(i), 1.0)
    assert eng.n_resets == 0
    assert eng.vector(2) == {1: 9.0}


def test_odd_store_resets_at_first_boundary():
    eng = WindowedEngine(5)
    for i in range(5):
        eng.process(1, 2, float(i), 1.0)
    assert eng.n_resets == 1
    # odd store collapsed to α; queries now use the even store
    assert eng.odd.vector(2) == {ALPHA: 5.0}
    assert eng.active is eng.even
    assert eng.vector(2) == {1: 5.0}  # still exact from the even store


def test_even_store_resets_at_second_boundary():
    eng = WindowedEngine(5)
    for i in range(10):
        eng.process(1, 2, float(i), 1.0)
    assert eng.n_resets == 2
    assert eng.even.vector(2) == {ALPHA: 10.0}
    assert eng.active is eng.odd
    # odd tracks exactly since its reset at interaction 5
    assert eng.vector(2) == {ALPHA: 5.0, 1: 5.0}


def test_guarantee_quantities_born_within_w_are_exact():
    """§5.3.1: provenance of quantities born up to W interactions ago is
    always exact. Drive 3 window cycles and check the most recent
    births are never attributed to α."""
    W = 6
    eng = WindowedEngine(W)
    for i in range(3 * W + W // 2):
        origin = 100 + i  # distinct origin per interaction
        eng.process(origin, 7, float(i), 1.0)
    vec = eng.vector(7)
    n = eng.n_processed
    for j in range(W):  # last W births
        o = 100 + (n - 1 - j)
        assert vec.get(o, 0.0) == pytest.approx(1.0), f"recent birth {o} lost"


def test_alpha_mass_plus_tracked_mass_equals_buffer():
    pdf = random_tin(n_nodes=12, n_interactions=300, seed=61)
    eng = run_policy(pdf, "windowed", window=40)
    for v in touched_vertices(pdf):
        vec = eng.vector(v)
        assert sum(vec.values()) == pytest.approx(eng.buffer_total(v), abs=1e-6)


def test_infinite_window_equals_sparse_proportional():
    pdf = random_tin(n_nodes=12, n_interactions=200, seed=62)
    win = run_policy(pdf, "windowed", window=10**9)
    full = run_policy(pdf, "prop_sparse")
    for v in touched_vertices(pdf):
        wv, fv = win.vector(v), full.vector(v)
        for o in set(wv) | set(fv):
            assert wv.get(o, 0.0) == pytest.approx(fv.get(o, 0.0), abs=1e-8)


def test_smaller_window_bounds_memory():
    """Figure 7's trend: smaller W → fewer live entries (more resets)."""
    pdf = random_tin(n_nodes=15, n_interactions=400, seed=63, alpha=0.6)
    small = run_policy(pdf, "windowed", window=25)
    large = run_policy(pdf, "windowed", window=200)
    assert small.entry_count() <= large.entry_count()
    assert small.n_resets > large.n_resets


def test_both_stores_update_every_interaction():
    eng = WindowedEngine(1000)
    eng.process(1, 2, 1.0, 3.0)
    assert eng.odd.vector(2) == {1: 3.0}
    assert eng.even.vector(2) == {1: 3.0}


def test_reset_count_matches_processed_multiples():
    pdf = random_tin(n_nodes=10, n_interactions=105, seed=64)
    eng = run_policy(pdf, "windowed", window=10)
    assert eng.n_resets == 10
