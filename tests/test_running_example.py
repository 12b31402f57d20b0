"""Exact reproduction of the paper's running example (Figure 3):
Tables 2 (NoProv buffers), 3 (oldest-first triples), 4 (LIFO pairs) and
5 (proportional vectors), asserted value-for-value after every
interaction prefix.
"""
import numpy as np
import pytest

from repro.core.api import make_engine
from repro.core.engine import HeapEngine, NoProvEngine, QueueEngine
from repro.core.proportional import DenseProportionalEngine
from repro.tin.datasets import running_example

R = [(1, 2, 1.0, 3.0), (2, 0, 3.0, 5.0), (0, 1, 4.0, 3.0),
     (1, 2, 5.0, 7.0), (2, 1, 7.0, 2.0), (2, 0, 8.0, 1.0)]

# Table 2 — |B_v0|, |B_v1|, |B_v2| after each interaction, and the
# newborn quantity of that interaction (the parenthesised values).
TABLE2 = [
    ((0.0, 0.0, 3.0), 3.0),
    ((5.0, 0.0, 0.0), 2.0),
    ((2.0, 3.0, 0.0), 0.0),
    ((2.0, 0.0, 7.0), 4.0),
    ((2.0, 2.0, 5.0), 0.0),
    ((3.0, 2.0, 4.0), 0.0),
]

# Table 3 — buffer triples (origin, birth_t, quantity) per vertex,
# oldest-first (LRB) policy, as sets (the paper prints them as sets).
TABLE3 = [
    (set(), set(), {(1, 1, 3)}),
    ({(1, 1, 3), (2, 3, 2)}, set(), set()),
    ({(2, 3, 2)}, {(1, 1, 3)}, set()),
    ({(2, 3, 2)}, set(), {(1, 1, 3), (1, 5, 4)}),
    ({(2, 3, 2)}, {(1, 1, 2)}, {(1, 1, 1), (1, 5, 4)}),
    ({(1, 1, 1), (2, 3, 2)}, {(1, 1, 2)}, {(1, 5, 4)}),
]

# Table 4 — buffer (origin, quantity) pairs per vertex under LIFO, in
# stack order bottom→top exactly as printed in the paper.
TABLE4 = [
    ([], [], [(1, 3)]),
    ([(1, 3), (2, 2)], [], []),
    ([(1, 2)], [(1, 1), (2, 2)], []),
    ([(1, 2)], [], [(1, 1), (2, 2), (1, 4)]),
    ([(1, 2)], [(1, 2)], [(1, 1), (2, 2), (1, 2)]),
    ([(1, 2), (1, 1)], [(1, 2)], [(1, 1), (2, 2), (1, 1)]),
]

# Table 5 — proportional provenance vectors [from v0, from v1, from v2].
TABLE5 = [
    ([0, 0, 0], [0, 0, 0], [0, 3, 0]),
    ([0, 3, 2], [0, 0, 0], [0, 0, 0]),
    ([0, 1.2, 0.8], [0, 1.8, 1.2], [0, 0, 0]),
    ([0, 1.2, 0.8], [0, 0, 0], [0, 5.8, 1.2]),
    ([0, 1.2, 0.8], [0, 1.66, 0.34], [0, 4.14, 0.86]),
    ([0, 2.03, 0.97], [0, 1.66, 0.34], [0, 3.31, 0.69]),
]


def _replay(engine, n):
    for s, d, t, q in R[:n]:
        engine.process(s, d, t, q)
    return engine


@pytest.mark.parametrize("step", range(1, 7))
def test_table2_buffer_totals(step):
    eng = _replay(NoProvEngine(), step)
    assert [eng.buffer_total(v) for v in (0, 1, 2)] == list(TABLE2[step - 1][0])


@pytest.mark.parametrize("step", range(1, 7))
def test_table2_newborn_quantities(step):
    before = _replay(NoProvEngine(), step - 1)
    gen_before = dict(before.generated)
    after = _replay(NoProvEngine(), step)
    newborn = sum(after.generated.values()) - sum(gen_before.values())
    assert newborn == pytest.approx(TABLE2[step - 1][1])


@pytest.mark.parametrize("step", range(1, 7))
def test_table3_lrb_triples(step):
    eng = _replay(HeapEngine("lrb"), step)
    for v in (0, 1, 2):
        got = {(o, int(t), int(q)) for o, t, q in eng.buffer_triples(v)}
        assert got == TABLE3[step - 1][v], f"vertex {v} after step {step}"


@pytest.mark.parametrize("step", range(1, 7))
def test_table4_lifo_pairs(step):
    eng = _replay(QueueEngine("lifo"), step)
    for v in (0, 1, 2):
        got = [(o, int(q)) for o, q in eng.buffer_pairs(v)]
        assert got == TABLE4[step - 1][v], f"vertex {v} after step {step}"


@pytest.mark.parametrize("step", range(1, 7))
def test_table5_proportional_vectors(step):
    eng = _replay(DenseProportionalEngine([0, 1, 2]), step)
    for v in (0, 1, 2):
        np.testing.assert_allclose(
            eng.vector(v), TABLE5[step - 1][v], atol=0.005,
            err_msg=f"vertex {v} after step {step}",
        )


@pytest.mark.parametrize("policy,opts", [
    ("prop_sparse", {}),
    ("selective", {"tracked": [0, 1, 2]}),
    ("grouped", {"m": 3, "group_of": {0: 0, 1: 1, 2: 2}}),
    ("windowed", {"window": 1000}),
    ("budget", {"capacity": 100}),
])
@pytest.mark.parametrize("step", range(1, 7))
def test_table5_holds_for_all_proportional_variants(policy, opts, step):
    """Every proportional variant, unconstrained, must produce the exact
    Table 5 vectors (selective tracks all vertices; grouped uses
    singleton groups; windowing/budget limits are not hit)."""
    eng = _replay(make_engine(policy, **opts), step)
    for v in (0, 1, 2):
        vec = eng.vector(v)
        if isinstance(vec, dict):
            dense = [vec.get(o, 0.0) for o in (0, 1, 2)]
        else:
            dense = list(vec[:3])
        np.testing.assert_allclose(dense, TABLE5[step - 1][v], atol=0.005)


def test_running_example_frame_matches_figure3():
    pdf = running_example()
    assert list(map(tuple, pdf[["s", "d", "t", "q"]].to_numpy())) == R


def test_fifo_figure1_example():
    """Figure 1: B_v = FIFO[(w,4),(z,3)]; transfer 5 → u receives all 4
    from w plus 1 from z; v keeps (z,2)."""
    eng = QueueEngine("fifo")
    w, z, v, u = 10, 11, 12, 13
    eng.process(w, v, 1.0, 4.0)  # births 4 at w → v
    eng.process(z, v, 2.0, 3.0)  # births 3 at z → v
    eng.process(v, u, 3.0, 5.0)
    assert eng.buffer_pairs(v) == [(z, 2.0)]
    assert eng.buffer_pairs(u) == [(w, 4.0), (z, 1.0)]
