"""Unit tests for selective provenance tracking (§5.1): k tracked
origin vertices + one "all others" overflow slot.
"""
import numpy as np
import pytest

from repro.core.api import run_policy
from repro.core.engine import touched_vertices
from repro.core.model import ALPHA
from repro.scale.selective import SelectiveEngine
from repro.tin.datasets import random_tin


def test_tracked_origin_lands_in_its_slot():
    eng = SelectiveEngine(tracked=[1, 2])
    eng.process(1, 5, 1.0, 3.0)
    np.testing.assert_allclose(eng.vector(5), [3.0, 0.0, 0.0])


def test_untracked_origin_lands_in_overflow_slot():
    eng = SelectiveEngine(tracked=[1, 2])
    eng.process(9, 5, 1.0, 3.0)
    np.testing.assert_allclose(eng.vector(5), [0.0, 0.0, 3.0])


def test_mixed_origins_split_proportionally():
    eng = SelectiveEngine(tracked=[1])
    eng.process(1, 4, 1.0, 6.0)  # tracked
    eng.process(9, 4, 2.0, 3.0)  # untracked
    eng.process(4, 5, 3.0, 3.0)  # move a third
    np.testing.assert_allclose(eng.vector(4), [4.0, 2.0])
    np.testing.assert_allclose(eng.vector(5), [2.0, 1.0])


def test_vector_length_is_k_plus_one():
    eng = SelectiveEngine(tracked=[3, 1, 2])
    assert eng.k == 3
    eng.process(1, 9, 1.0, 1.0)
    assert eng.vector(9).shape == (4,)


def test_provenance_rows_use_alpha_for_overflow():
    eng = SelectiveEngine(tracked=[1])
    eng.process(2, 5, 1.0, 4.0)
    rows = eng.provenance_rows()
    assert rows == [(5, ALPHA, None, 4.0)]


@pytest.mark.parametrize("seed", [41, 42])
def test_tracking_all_vertices_equals_full_proportional(seed):
    pdf = random_tin(n_nodes=15, n_interactions=200, seed=seed)
    verts = touched_vertices(pdf)
    sel = run_policy(pdf, "selective", tracked=verts)
    full = run_policy(pdf, "prop_sparse")
    for v in verts:
        vec = dict(zip(sel.tracked + [ALPHA], sel.vector(v)))
        fv = full.vector(v)
        for o in verts:
            assert vec.get(o, 0.0) == pytest.approx(fv.get(o, 0.0), abs=1e-8)
        assert vec[ALPHA] == pytest.approx(0.0, abs=1e-9)


@pytest.mark.parametrize("seed", [43, 44])
@pytest.mark.parametrize("k", [1, 3, 8])
def test_selective_equals_full_provenance_rolled_up(seed, k):
    """The defining property of §5.1: a tracked origin's slot equals the
    full proportional answer for that origin; the overflow slot equals
    the sum over all untracked origins."""
    pdf = random_tin(n_nodes=15, n_interactions=250, seed=seed)
    verts = touched_vertices(pdf)
    tracked = verts[:k]
    sel = run_policy(pdf, "selective", tracked=tracked)
    full = run_policy(pdf, "prop_sparse")
    for v in verts:
        fv = full.vector(v)
        vec = sel.vector(v)
        for i, o in enumerate(sel.tracked):
            assert vec[i] == pytest.approx(fv.get(o, 0.0), abs=1e-8), (v, o)
        other = sum(q for o, q in fv.items() if o not in set(tracked))
        assert vec[sel.k] == pytest.approx(other, abs=1e-8), v


def test_space_is_k_plus_one_per_touched_vertex():
    pdf = random_tin(n_nodes=15, n_interactions=200, seed=45)
    k = 4
    eng = run_policy(pdf, "selective", tracked=touched_vertices(pdf)[:k])
    assert eng.peak_entries() == len(eng.vecs) * (k + 1)


def test_duplicate_tracked_ids_are_deduplicated():
    eng = SelectiveEngine(tracked=[2, 2, 1])
    assert eng.tracked == [1, 2]
    assert eng.k == 2
