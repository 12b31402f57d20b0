"""Unit tests for the receipt-order selection policies (§4.2):
FIFO queues and LIFO stacks of (origin, quantity) pairs.
"""
import pandas as pd
import pytest

from repro.core.engine import NoProvEngine, QueueEngine
from repro.tin.datasets import random_tin


def frame(rows):
    return pd.DataFrame(rows, columns=["s", "d", "t", "q"])


def test_rejects_unknown_order():
    with pytest.raises(ValueError, match="order must be one of"):
        QueueEngine("queue")


def test_fifo_drains_front_first():
    eng = QueueEngine("fifo")
    eng.process(1, 3, 1.0, 2.0)
    eng.process(2, 3, 2.0, 2.0)
    eng.process(3, 4, 3.0, 2.0)
    assert eng.buffer_pairs(3) == [(2, 2.0)]
    assert eng.buffer_pairs(4) == [(1, 2.0)]


def test_lifo_drains_top_first():
    eng = QueueEngine("lifo")
    eng.process(1, 3, 1.0, 2.0)
    eng.process(2, 3, 2.0, 2.0)
    eng.process(3, 4, 3.0, 2.0)
    assert eng.buffer_pairs(3) == [(1, 2.0)]
    assert eng.buffer_pairs(4) == [(2, 2.0)]


def test_fifo_split_leaves_remainder_at_front():
    eng = QueueEngine("fifo")
    eng.process(1, 2, 1.0, 10.0)
    eng.process(2, 3, 2.0, 4.0)
    assert eng.buffer_pairs(2) == [(1, 6.0)]
    assert eng.buffer_pairs(3) == [(1, 4.0)]
    assert eng.n_splits == 1


def test_lifo_moved_block_preserves_relative_order():
    """Table 4 semantics: the moved top-block lands on the destination
    stack keeping its internal order (not flipped)."""
    eng = QueueEngine("lifo")
    eng.process(1, 4, 1.0, 3.0)  # stack v4: (1,3)
    eng.process(2, 4, 2.0, 2.0)  # stack v4: (1,3)(2,2)
    eng.process(3, 4, 3.0, 1.0)  # stack v4: (1,3)(2,2)(3,1)
    eng.process(4, 5, 4.0, 3.0)  # move top 3 units: (3,1)+(2,2)
    assert eng.buffer_pairs(4) == [(1, 3.0)]
    assert eng.buffer_pairs(5) == [(2, 2.0), (3, 1.0)]  # block order kept


def test_fifo_multi_element_transfer_keeps_receipt_order():
    eng = QueueEngine("fifo")
    eng.process(1, 4, 1.0, 3.0)
    eng.process(2, 4, 2.0, 2.0)
    eng.process(3, 4, 3.0, 1.0)
    eng.process(4, 5, 4.0, 4.0)  # moves (1,3) then (2,1 of 2)
    assert eng.buffer_pairs(4) == [(2, 1.0), (3, 1.0)]
    assert eng.buffer_pairs(5) == [(1, 3.0), (2, 1.0)]


def test_newborn_lands_on_top_of_destination():
    """When the source drains, the residue is born at the source and is
    the most recent arrival at the destination (Table 4, row 4)."""
    eng = QueueEngine("lifo")
    eng.process(1, 2, 1.0, 1.0)
    eng.process(2, 3, 2.0, 4.0)  # moves (1,1), births (2,3)
    assert eng.buffer_pairs(3) == [(1, 1.0), (2, 3.0)]


def test_pairs_do_not_store_birth_time():
    """§4.2: receipt-order provenance keeps 2-value entries; provenance
    rows have a null birth_t."""
    eng = QueueEngine("fifo")
    eng.process(1, 2, 9.0, 5.0)
    [(v, o, bt, q)] = eng.provenance_rows()
    assert (v, o, q) == (2, 1, 5.0)
    assert bt is None


@pytest.mark.parametrize("order", ["fifo", "lifo"])
def test_queue_buffer_totals_match_noprov(order):
    pdf = random_tin(n_nodes=15, n_interactions=200, seed=11)
    ref = NoProvEngine().run(pdf)
    eng = QueueEngine(order).run(pdf)
    for v, tot in ref.totals.items():
        assert sum(q for _o, q in eng.buffer_pairs(v)) == pytest.approx(tot, abs=1e-9)


@pytest.mark.parametrize("order", ["fifo", "lifo"])
def test_queue_entry_count_equals_splits_plus_newborns(order):
    pdf = random_tin(n_nodes=15, n_interactions=200, seed=12)
    eng = QueueEngine(order).run(pdf)
    assert eng.entry_count() == eng.n_splits + eng.n_newborn
    assert eng.entry_count() <= len(pdf)


def test_buffer_paths_requires_tracking_enabled():
    eng = QueueEngine("lifo")
    eng.process(1, 2, 1.0, 1.0)
    with pytest.raises(ValueError, match="track_paths"):
        eng.buffer_paths(2)


def test_same_origin_entries_stay_separate():
    """Receipt-order buffers never merge entries, even of equal origin
    (unlike proportional vectors) — Table 4 shows (1,1) and (1,2)
    coexisting in one buffer."""
    eng = QueueEngine("fifo")
    eng.process(1, 2, 1.0, 2.0)
    eng.process(2, 3, 2.0, 2.0)  # whole-element move, no new entry
    eng.process(1, 3, 3.0, 2.0)  # second newborn of origin 1
    assert eng.buffer_pairs(3) == [(1, 2.0), (1, 2.0)]
    assert eng.entry_count() == 2  # two newborns; the move created none
