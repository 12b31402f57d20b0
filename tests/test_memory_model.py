"""The analytic memory model must reproduce the identities the paper's
own Table 8 numbers obey (see repro/bench/memory.py docstring).
"""
import pytest

from repro.bench.memory import (
    BYTES_DENSE_CELL,
    BYTES_PAIR,
    BYTES_TRIPLE,
    MB,
    fmt_bytes,
    noprov_bytes,
    policy_bytes,
)
from repro.bench.paper_numbers import PAPER_TABLE6, PAPER_TABLE8


@pytest.mark.parametrize(
    "dataset,paper_mb",
    [("bitcoin", 96.0), ("ctu", 4.864), ("prosper", 0.8)],
)
def test_noprov_is_8_bytes_per_vertex_matching_paper(dataset, paper_mb):
    """Table 8's NoProv column is exactly 8·|V| on the large datasets."""
    n_vertices = PAPER_TABLE6[dataset][0]
    assert noprov_bytes(n_vertices) / MB == pytest.approx(paper_mb, rel=0.02)


@pytest.mark.parametrize(
    "dataset,paper_mb", [("flights", 3.16), ("taxis", 0.52)]
)
def test_dense_is_8_v_squared_matching_paper(dataset, paper_mb):
    """Table 8's dense column is exactly 8·|V|² on Flights and Taxis."""
    n_vertices = PAPER_TABLE6[dataset][0]
    dense = policy_bytes("prop_dense", n_vertices=n_vertices)
    assert dense / MB == pytest.approx(paper_mb, rel=0.02)


def test_triple_vs_pair_ratio_matches_paper_observation():
    """§7.2: receipt-order memory is lower because entries are 2 values
    instead of 3 — our constants keep that 2:3 ratio."""
    assert BYTES_TRIPLE / BYTES_PAIR == pytest.approx(3 / 2)


def test_entry_memory_is_additive_in_entries():
    a = policy_bytes("lrb", n_vertices=100, entries=10)
    b = policy_bytes("lrb", n_vertices=100, entries=20)
    assert b - a == 10 * BYTES_TRIPLE


def test_path_memory_added_for_queue_policies():
    base = policy_bytes("lifo", n_vertices=10, entries=5)
    with_paths = policy_bytes("lifo", n_vertices=10, entries=5, path_elems=7)
    assert with_paths - base == 7 * 8


def test_selective_and_grouped_need_k():
    with pytest.raises(ValueError, match="needs k"):
        policy_bytes("selective", n_vertices=10)
    got = policy_bytes("grouped", n_vertices=10, k=4)
    assert got == noprov_bytes(10) + BYTES_DENSE_CELL * 5 * 10


def test_unknown_policy_rejected():
    with pytest.raises(ValueError, match="unknown policy"):
        policy_bytes("magic", n_vertices=1)


def test_paper_table8_availability_consistency():
    """'-' cells in Table 8 mirror Table 7: if a policy could not run it
    has neither a time nor a memory number."""
    from repro.bench.paper_numbers import PAPER_TABLE7

    for ds, mems in PAPER_TABLE8.items():
        for m, t in zip(mems, PAPER_TABLE7[ds]):
            assert (m is None) == (t is None), ds


def test_fmt_bytes_units():
    assert fmt_bytes(500) == "0.50KB"
    assert fmt_bytes(2.5 * MB) == "2.50MB"
    assert fmt_bytes(3e9) == "3.00GB"
