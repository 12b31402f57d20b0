"""Unit tests for grouped provenance tracking (§5.2): provenance from
m vertex groups instead of individual vertices.
"""
import numpy as np
import pytest

from repro.core.api import run_policy
from repro.core.engine import touched_vertices
from repro.scale.grouped import GroupedEngine, ModuloGroups
from repro.tin.datasets import random_tin


def test_newborn_attributed_to_source_group():
    eng = GroupedEngine(3, ModuloGroups(3))
    eng.process(7, 2, 1.0, 5.0)  # 7 % 3 == 1
    np.testing.assert_allclose(eng.vector(2), [0.0, 5.0, 0.0])


def test_accepts_mapping_and_callable():
    a = GroupedEngine(2, {1: 0, 2: 1, 3: 1})
    b = GroupedEngine(2, lambda v: 0 if v == 1 else 1)
    for eng in (a, b):
        eng.process(1, 3, 1.0, 2.0)
        eng.process(2, 3, 2.0, 2.0)
        np.testing.assert_allclose(eng.vector(3), [2.0, 2.0])


def test_rejects_zero_groups():
    with pytest.raises(ValueError, match="at least one group"):
        GroupedEngine(0, ModuloGroups(1))


def test_rejects_out_of_range_group():
    eng = GroupedEngine(2, {5: 7})
    with pytest.raises(ValueError, match="outside"):
        eng.process(5, 6, 1.0, 1.0)


def test_single_group_tracks_total_only():
    pdf = random_tin(n_nodes=10, n_interactions=100, seed=51)
    eng = run_policy(pdf, "grouped", m=1, group_of=ModuloGroups(1))
    for v in touched_vertices(pdf):
        np.testing.assert_allclose(
            eng.vector(v).sum(), eng.buffer_total(v), atol=1e-9
        )


@pytest.mark.parametrize("seed", [52, 53])
def test_singleton_groups_equal_full_proportional(seed):
    """m = |V| with one vertex per group is exactly Algorithm 3."""
    pdf = random_tin(n_nodes=12, n_interactions=200, seed=seed)
    verts = touched_vertices(pdf)
    gmap = {v: i for i, v in enumerate(verts)}
    grouped = run_policy(pdf, "grouped", m=len(verts), group_of=gmap)
    full = run_policy(pdf, "prop_sparse")
    for v in verts:
        vec = grouped.vector(v)
        fv = full.vector(v)
        for o in verts:
            assert vec[gmap[o]] == pytest.approx(fv.get(o, 0.0), abs=1e-8)


@pytest.mark.parametrize("seed", [54, 55])
@pytest.mark.parametrize("m", [2, 5])
def test_group_vector_equals_full_provenance_rolled_up(seed, m):
    """Defining property of §5.2: position j of p_v equals the sum of
    the full proportional provenance of v over origins in group j."""
    pdf = random_tin(n_nodes=14, n_interactions=250, seed=seed)
    groups = ModuloGroups(m)
    grouped = run_policy(pdf, "grouped", m=m, group_of=groups)
    full = run_policy(pdf, "prop_sparse")
    for v in touched_vertices(pdf):
        vec = grouped.vector(v)
        fv = full.vector(v)
        for j in range(m):
            expect = sum(q for o, q in fv.items() if groups(o) == j)
            assert vec[j] == pytest.approx(expect, abs=1e-8), (v, j)


def test_space_is_m_per_touched_vertex():
    pdf = random_tin(n_nodes=14, n_interactions=200, seed=56)
    m = 4
    eng = run_policy(pdf, "grouped", m=m, group_of=ModuloGroups(m))
    assert eng.peak_entries() == len(eng.vecs) * m


def test_modulo_groups_is_picklable():
    import pickle

    g = pickle.loads(pickle.dumps(ModuloGroups(5)))
    assert g(12) == 2
