"""Unit tests for proportional selection (§4.3, Algorithm 3): dense
vectors, sparse ordered lists, and their exact equivalence.
"""
import numpy as np
import pandas as pd
import pytest

from repro.core.model import EPS
from repro.core.proportional import (
    DENSE_MAX_VERTICES,
    DenseProportionalEngine,
    SparseProportionalEngine,
)
from repro.tin.datasets import random_tin


def frame(rows):
    return pd.DataFrame(rows, columns=["s", "d", "t", "q"])


def test_dense_refuses_huge_vertex_sets():
    with pytest.raises(MemoryError, match="dense proportional"):
        DenseProportionalEngine(range(DENSE_MAX_VERTICES + 1))


def test_dense_remaps_arbitrary_vertex_ids():
    eng = DenseProportionalEngine([100, 5, 42])
    eng.process(100, 5, 1.0, 4.0)
    assert eng.ids == [5, 42, 100]
    np.testing.assert_allclose(eng.vector(5), [0.0, 0.0, 4.0])


def test_full_relay_moves_whole_vector_and_adds_newborn():
    """Lines 5–7 of Algorithm 3: p_d ⊕= p_s ⊕ e_{s, q−|B_s|}; p_s = 0."""
    eng = DenseProportionalEngine([1, 2, 3])
    eng.process(1, 2, 1.0, 3.0)
    eng.process(2, 3, 2.0, 5.0)  # relays all 3 + births 2 at vertex 2
    np.testing.assert_allclose(eng.vector(2), [0.0, 0.0, 0.0])
    np.testing.assert_allclose(eng.vector(3), [3.0, 2.0, 0.0])


def test_partial_relay_moves_proportional_slice():
    """Lines 9–10: each origin contributes q·(r.q/|B_s|)."""
    eng = DenseProportionalEngine([1, 2, 3, 4])
    eng.process(1, 3, 1.0, 6.0)
    eng.process(2, 3, 2.0, 3.0)  # B_3 = 9: 6 from v1, 3 from v2
    eng.process(3, 4, 3.0, 3.0)  # third of the buffer moves
    np.testing.assert_allclose(eng.vector(3), [4.0, 2.0, 0.0, 0.0])
    np.testing.assert_allclose(eng.vector(4), [2.0, 1.0, 0.0, 0.0])


def test_exact_buffer_transfer_leaves_empty_vector():
    eng = DenseProportionalEngine([1, 2, 3])
    eng.process(1, 2, 1.0, 3.0)
    eng.process(2, 3, 2.0, 3.0)  # q == |B_s| exactly: full relay, no newborn
    np.testing.assert_allclose(eng.vector(2), 0.0)
    assert eng.generated == {1: 3.0}


def test_sparse_list_is_origin_sorted():
    eng = SparseProportionalEngine()
    eng.process(9, 5, 1.0, 1.0)
    eng.process(2, 5, 2.0, 1.0)
    eng.process(7, 5, 3.0, 1.0)
    assert [o for o, _q in eng.list_of(5)] == [2, 7, 9]


def test_sparse_merges_same_origin_on_arrival():
    """Proportional buffers mix same-origin quantity (unlike queues):
    two transfers originating at vertex 1 merge into one list entry."""
    eng = SparseProportionalEngine()
    eng.process(1, 2, 1.0, 2.0)
    eng.process(1, 3, 2.0, 2.0)
    eng.process(2, 3, 3.0, 2.0)
    assert eng.list_of(3) == [(1, 4.0)]
    assert eng.entry_count() == 1


def test_sparse_vector_example_from_section_4_3():
    """§4.3: after ⟨v1,v2,1,3⟩, p_{v2} is stored as [(v1, 3)]."""
    eng = SparseProportionalEngine()
    eng.process(1, 2, 1.0, 3.0)
    assert eng.list_of(2) == [(1, 3.0)]


def test_sparse_peak_entries_monotone():
    pdf = random_tin(n_nodes=20, n_interactions=300, seed=21)
    eng = SparseProportionalEngine().run(pdf)
    assert eng.peak_entries() >= eng.entry_count()
    assert eng.peak_entries() > 0


def test_sparse_prune_eps_drops_dust_but_keeps_mass():
    pdf = random_tin(n_nodes=20, n_interactions=400, seed=22)
    exact = SparseProportionalEngine().run(pdf)
    pruned = SparseProportionalEngine(prune_eps=1e-4).run(pdf)
    assert pruned.entry_count() <= exact.entry_count()
    # pruning loses at most (dropped entries × eps) of attributed mass
    exact_mass = sum(q for _v, _o, _bt, q in exact.provenance_rows())
    pruned_mass = sum(q for _v, _o, _bt, q in pruned.provenance_rows())
    assert pruned_mass <= exact_mass + 1e-9
    assert pruned_mass >= exact_mass * 0.99


@pytest.mark.parametrize("seed", [31, 32, 33, 34])
def test_dense_sparse_equivalence_random(seed):
    pdf = random_tin(n_nodes=18, n_interactions=250, seed=seed, alpha=0.8)
    dense = DenseProportionalEngine(
        sorted(set(pdf["s"]) | set(pdf["d"]))
    ).run(pdf)
    sparse = SparseProportionalEngine().run(pdf)
    for v in dense.ids:
        dv = dict(zip(dense.ids, dense.vector(v)))
        sv = sparse.vector(v)
        for o in set(dv) | set(sv):
            assert dv.get(o, 0.0) == pytest.approx(sv.get(o, 0.0), abs=1e-8)


def test_mean_list_length_grows_with_history():
    """§4.3/§7.4: ℓ grows as interactions accumulate — the reason sparse
    proportional eventually becomes infeasible."""
    pdf = random_tin(n_nodes=25, n_interactions=600, seed=35, alpha=0.6)
    short = SparseProportionalEngine().run(pdf.iloc[:150])
    long = SparseProportionalEngine().run(pdf)
    assert long.mean_list_length() > short.mean_list_length()


def test_proportionality_property():
    """After a partial transfer, source and destination shares per
    origin have the ratio (|B|-q)/q — the definition of proportional."""
    eng = SparseProportionalEngine()
    eng.process(1, 4, 1.0, 5.0)
    eng.process(2, 4, 2.0, 3.0)
    eng.process(3, 4, 3.0, 2.0)
    eng.process(4, 5, 4.0, 4.0)  # 40% of the 10-unit buffer moves
    src, dst = eng.vector(4), eng.vector(5)
    for o in (1, 2, 3):
        assert dst[o] / (src[o] + dst[o]) == pytest.approx(0.4)


def test_vector_of_untouched_vertex_is_empty():
    eng = SparseProportionalEngine()
    eng.process(1, 2, 1.0, 1.0)
    assert eng.vector(99) == {}
    assert eng.list_of(99) == []


def test_entry_count_tracks_clears():
    eng = SparseProportionalEngine()
    eng.process(1, 2, 1.0, 3.0)
    eng.process(3, 2, 2.0, 3.0)
    assert eng.entry_count() == 2
    eng.process(2, 4, 3.0, 10.0)  # full relay: v2's list drains into v4
    assert eng.entry_count() == 3  # v4 now holds origins {1, 3, 2}
    assert eng.list_of(2) == []


def test_tiny_quantities_below_eps_not_reported():
    eng = SparseProportionalEngine()
    eng.process(1, 2, 1.0, EPS / 10)
    assert eng.provenance_rows() == []
