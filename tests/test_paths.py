"""Unit tests for path tracking / how-provenance (§6)."""
import pytest

from repro.core.api import run_policy
from repro.core.engine import QueueEngine, touched_vertices
from repro.paths.tracking import path_rows, path_stats, run_path_tracking
from repro.tin.datasets import random_tin, running_example


def test_newborn_has_empty_path():
    eng = QueueEngine("lifo", track_paths=True)
    eng.process(1, 2, 1.0, 3.0)
    assert eng.buffer_paths(2) == [(1, 3.0, ())]


def test_relay_appends_transmitter():
    eng = QueueEngine("lifo", track_paths=True)
    eng.process(1, 2, 1.0, 3.0)
    eng.process(2, 3, 2.0, 3.0)
    eng.process(3, 4, 3.0, 3.0)
    assert eng.buffer_paths(4) == [(1, 3.0, (2, 3))]


def test_split_inherits_parent_path():
    eng = QueueEngine("lifo", track_paths=True)
    eng.process(1, 2, 1.0, 6.0)
    eng.process(2, 3, 2.0, 6.0)  # relay: path (2,)
    eng.process(3, 4, 3.0, 2.0)  # split: moved part inherits + extends
    assert eng.buffer_paths(3) == [(1, 4.0, (2,))]
    assert eng.buffer_paths(4) == [(1, 2.0, (2, 3))]


def test_cycle_revisits_are_recorded():
    eng = QueueEngine("fifo", track_paths=True)
    eng.process(1, 2, 1.0, 1.0)
    eng.process(2, 1, 2.0, 1.0)
    eng.process(1, 2, 3.0, 1.0)
    assert eng.buffer_paths(2) == [(1, 1.0, (2, 1))]


def test_path_elems_counts_total_stored_vertices():
    eng = QueueEngine("lifo", track_paths=True)
    eng.process(1, 2, 1.0, 3.0)  # path () → 0 elems
    eng.process(2, 3, 2.0, 3.0)  # path (2,) → 1
    eng.process(3, 4, 3.0, 1.0)  # split piece path (2,3) → +2
    assert eng.path_elems == 3


def test_path_tracking_does_not_change_provenance():
    """§6: paths are an annotation on top of the selection policy; the
    (origin, quantity) decomposition is untouched."""
    pdf = random_tin(n_nodes=12, n_interactions=300, seed=81)
    plain = run_policy(pdf, "lifo")
    tracked = run_policy(pdf, "lifo", track_paths=True)
    assert plain.provenance_rows() == tracked.provenance_rows()


@pytest.mark.parametrize("order", ["fifo", "lifo"])
def test_path_starts_where_origin_generated(order):
    """Every element's full route starts at its origin: the first relay
    transmitter is the vertex the newborn was first delivered to, and
    origin matches the entry's origin field."""
    pdf = random_tin(n_nodes=10, n_interactions=200, seed=82)
    eng = run_policy(pdf, order, track_paths=True)
    for v in touched_vertices(pdf):
        for o, _q, path in eng.buffer_paths(v):
            assert o in touched_vertices(pdf)
            for hop in path:
                assert hop in touched_vertices(pdf)


def test_run_path_tracking_on_running_example():
    eng = run_path_tracking(running_example(), order="lifo")
    st = path_stats(eng)
    assert st["n_entries"] == eng.entry_count()
    assert st["avg_path_len"] >= 0.0
    # Table 4 final state: v0 holds (1,2) relayed 2→0 and (1,1) relayed
    # 2→...→0; both elements of v0 carry at least one relay hop.
    for _o, _q, path in eng.buffer_paths(0):
        assert len(path) >= 1


def test_path_rows_frame_layout():
    pdf = running_example()
    eng = run_path_tracking(pdf, order="lifo")
    rows = path_rows(eng)
    assert list(rows.columns) == ["vertex", "origin", "quantity", "path_len", "path"]
    assert (rows["quantity"] > 0).all()
    assert len(rows) == eng.entry_count()
    # every path string starts with the origin
    for _i, r in rows.iterrows():
        assert r["path"].split("->")[0] == str(r["origin"])


def test_denser_traffic_longer_paths():
    """Table 10's driver: path length grows with |R|/|V| (quantities are
    relayed more often). Compare a dense and a sparse random TIN."""
    dense = run_path_tracking(
        random_tin(n_nodes=5, n_interactions=400, seed=83), order="lifo"
    )
    sparse = run_path_tracking(
        random_tin(n_nodes=80, n_interactions=400, seed=83), order="lifo"
    )
    assert path_stats(dense)["avg_path_len"] > path_stats(sparse)["avg_path_len"]


def test_avg_path_len_can_be_below_one():
    """Prosper-style TINs (few relays) must yield avg path length < 1 —
    the Table 10 sanity check for our path-length definition."""
    eng = QueueEngine("lifo", track_paths=True)
    for i in range(10):  # 10 newborns, one relay
        eng.process(i, 50 + i, float(i), 1.0)
    eng.process(50, 99, 99.0, 1.0)
    st = path_stats(eng)
    assert 0.0 < st["avg_path_len"] < 1.0
