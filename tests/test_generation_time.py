"""Unit tests for the generation-time selection policies (§4.1,
Algorithm 2): least-recently-born (LRB) and most-recently-born (MRB).
"""
import pandas as pd
import pytest

from repro.core.engine import HeapEngine
from repro.tin.datasets import random_tin


def frame(rows):
    return pd.DataFrame(rows, columns=["s", "d", "t", "q"])


def test_rejects_unknown_order():
    with pytest.raises(ValueError, match="order must be one of"):
        HeapEngine("oldest")


def test_newborn_triple_marks_origin_and_birth_time():
    eng = HeapEngine("lrb")
    eng.process(1, 2, 5.0, 3.0)
    assert eng.buffer_triples(2) == [(1, 5.0, 3.0)]
    assert eng.generated == {1: 3.0}


def test_lrb_selects_oldest_first():
    eng = HeapEngine("lrb")
    eng.process(1, 3, 1.0, 2.0)  # (1, t=1, 2) at v3
    eng.process(2, 3, 2.0, 2.0)  # (2, t=2, 2) at v3
    eng.process(3, 4, 3.0, 2.0)  # must move the t=1 triple
    assert eng.buffer_triples(4) == [(1, 1.0, 2.0)]
    assert eng.buffer_triples(3) == [(2, 2.0, 2.0)]


def test_mrb_selects_newest_first():
    eng = HeapEngine("mrb")
    eng.process(1, 3, 1.0, 2.0)
    eng.process(2, 3, 2.0, 2.0)
    eng.process(3, 4, 3.0, 2.0)  # must move the t=2 triple
    assert eng.buffer_triples(4) == [(2, 2.0, 2.0)]
    assert eng.buffer_triples(3) == [(1, 1.0, 2.0)]


def test_split_preserves_origin_and_birth_time():
    """Algorithm 2 lines 8–12: a partial transfer keeps a shrunken
    triple at the source and ships a new triple with the SAME origin and
    birth time (the corrected line 11: τ.q -= resq)."""
    eng = HeapEngine("lrb")
    eng.process(1, 2, 1.0, 10.0)
    eng.process(2, 3, 2.0, 4.0)
    assert eng.buffer_triples(2) == [(1, 1.0, 6.0)]
    assert eng.buffer_triples(3) == [(1, 1.0, 4.0)]
    assert eng.n_splits == 1


def test_split_then_exhaust_generates_residue():
    """Transfer larger than the buffer drains it and births the residue
    at the source with the interaction's timestamp (lines 18–21)."""
    eng = HeapEngine("lrb")
    eng.process(1, 2, 1.0, 3.0)
    eng.process(2, 3, 5.0, 5.0)
    assert eng.buffer_triples(2) == []
    assert sorted(eng.buffer_triples(3)) == [(1, 1.0, 3.0), (2, 5.0, 2.0)]
    assert eng.generated == {1: 3.0, 2: 2.0}


def test_multiple_whole_triples_transferred_in_birth_order():
    eng = HeapEngine("lrb")
    eng.process(1, 4, 1.0, 1.0)
    eng.process(2, 4, 2.0, 1.0)
    eng.process(3, 4, 3.0, 1.0)
    eng.process(4, 5, 4.0, 2.5)  # moves t=1, t=2 fully, splits t=3
    assert eng.buffer_triples(4) == [(3, 3.0, 0.5)]
    assert eng.buffer_triples(5) == [(1, 1.0, 1.0), (2, 2.0, 1.0), (3, 3.0, 0.5)]


def test_triples_with_equal_birth_times_drain_deterministically():
    eng = HeapEngine("lrb")
    eng.process(1, 3, 1.0, 1.0)
    eng.process(2, 3, 1.0, 1.0)  # same birth time, inserted later
    eng.process(3, 4, 2.0, 1.0)
    # seq tie-breaker: the first-inserted triple moves first
    assert eng.buffer_triples(4) == [(1, 1.0, 1.0)]


def test_lrb_and_mrb_agree_when_buffers_hold_single_origin():
    """When each buffer only ever holds one triple, selection order is
    irrelevant — both policies produce identical provenance."""
    rows = [(1, 2, 1.0, 5.0), (2, 3, 2.0, 5.0), (3, 4, 3.0, 5.0)]
    a = HeapEngine("lrb").run(frame(rows))
    b = HeapEngine("mrb").run(frame(rows))
    assert a.provenance_rows() == b.provenance_rows()


@pytest.mark.parametrize("order", ["lrb", "mrb"])
def test_heap_entry_count_equals_splits_plus_newborns(order):
    pdf = random_tin(n_nodes=12, n_interactions=150, seed=5)
    eng = HeapEngine(order).run(pdf)
    assert eng.entry_count() == eng.n_splits + eng.n_newborn


@pytest.mark.parametrize("order", ["lrb", "mrb"])
def test_heap_policy_space_is_order_R(order):
    """§4.1 complexity: space O(|R|) — one new triple per interaction max."""
    pdf = random_tin(n_nodes=12, n_interactions=150, seed=6)
    eng = HeapEngine(order).run(pdf)
    assert eng.entry_count() <= len(pdf)
    assert eng.peak_entries() == eng.entry_count()  # triples never merge


def test_run_rejects_time_travel():
    eng = HeapEngine("lrb")
    eng.run(frame([(1, 2, 5.0, 1.0)]))
    with pytest.raises(ValueError, match="time order"):
        eng.run(frame([(2, 3, 4.0, 1.0)]))


def test_metrics_reports_policy_and_counts():
    pdf = random_tin(n_nodes=10, n_interactions=80, seed=7)
    m = HeapEngine("lrb").run(pdf).metrics()
    assert m["policy_lrb"] == 1.0
    assert m["n_interactions"] == 80
    assert m["n_entries"] == m["n_splits"] + m["n_newborn"]
    assert m["total_buffered"] == pytest.approx(m["total_generated"])
