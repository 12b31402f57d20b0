"""Smoke tests for the per-table experiment harness at TEST_SF (10×
smaller than the benchmark scale) — shapes, feasibility masking and the
qualitative orderings the paper reports.
"""
import pytest

from repro.bench import paper_numbers as paper
from repro.bench.harness import (
    BENCH_SF,
    TEST_SF,
    bench_cell,
    cell_or_run,
    feasible,
    load,
    run_table6,
    run_table7_8,
    run_table9,
    run_table10,
)

DATASETS = list(paper.PAPER_TABLE6)


def test_bench_and_test_sf_cover_all_datasets():
    assert set(BENCH_SF) == set(DATASETS)
    assert set(TEST_SF) == set(DATASETS)
    for name in DATASETS:
        assert TEST_SF[name] < BENCH_SF[name]


def test_feasibility_matrix_matches_paper_blank_cells():
    for name, times in paper.PAPER_TABLE7.items():
        for pol, t in zip(paper.TABLE7_COLUMNS, times):
            assert feasible(pol, name) == (t is not None), (name, pol)


def test_load_caches(monkeypatch):
    a = load("taxis", TEST_SF["taxis"])
    b = load("taxis", TEST_SF["taxis"])
    assert a is b


def test_table6_shape_and_paper_columns():
    t6 = run_table6(TEST_SF)
    assert set(t6["dataset"]) == set(DATASETS)
    assert (t6["n_interactions"] > 0).all()
    assert (t6["paper_n_interactions"] >= t6["n_interactions"]).all()
    for _i, row in t6.iterrows():
        assert row["avg_q"] / row["paper_avg_q"] < 2.0


def test_table7_8_on_two_datasets():
    t7, t8 = run_table7_8(TEST_SF, datasets=["taxis", "prosper"])
    assert len(t7) == 2 * len(paper.TABLE7_COLUMNS)
    # infeasible cells stay blank, exactly as in the paper
    blank = t7[t7["seconds"].isna()]
    assert set(zip(blank["dataset"], blank["policy"])) == {("prosper", "prop_dense")}
    # qualitative ordering: NoProv is the fastest policy on every dataset
    for name in ("taxis", "prosper"):
        sub = t7[t7["dataset"] == name].dropna(subset=["seconds"])
        noprov = sub[sub["policy"] == "noprov"]["seconds"].iloc[0]
        assert noprov == sub["seconds"].min()
    # memory: NoProv is the smallest footprint on every dataset
    for name in ("taxis", "prosper"):
        sub = t8[t8["dataset"] == name].dropna(subset=["bytes"])
        noprov = sub[sub["policy"] == "noprov"]["bytes"].iloc[0]
        assert noprov == sub["bytes"].min()


def test_table7_receipt_order_cheaper_than_generation_time():
    """§7.2's headline shape: FIFO/LIFO beat LRB/MRB (no heap), and all
    are slower than NoProv."""
    t7, t8 = run_table7_8(TEST_SF, datasets=["flights"])
    t = {r["policy"]: r["seconds"] for _i, r in t7.iterrows()}
    assert t["lifo"] < t["lrb"] and t["fifo"] < t["lrb"]
    m = {r["policy"]: r["bytes"] for _i, r in t8.iterrows()}
    assert m["lifo"] < m["lrb"]  # pairs (16B) vs triples (24B)


def test_table9_shrinks_decrease_with_capacity():
    t9 = run_table9(
        TEST_SF,
        capacities={"prosper": (4, 16, 64)},
    )
    assert list(t9["C"]) == [4, 16, 64]
    avg = list(t9["avg_shrinks"])
    assert avg[0] >= avg[1] >= avg[2]
    assert (t9["pct_shrunk"].between(0, 100)).all()
    # memory grows with C (Figure 8's right panel)
    assert t9["bytes"].is_monotonic_increasing


def test_table10_shapes_and_flights_has_longest_paths():
    t10 = run_table10(TEST_SF)
    assert set(t10["dataset"]) == set(DATASETS)
    assert (t10["avg_path_len"] >= 0).all()
    by = dict(zip(t10["dataset"], t10["avg_path_len"]))
    # Table 10's shape: the dense-traffic hub networks (Flights, Taxis)
    # relay quantities far longer than the sparse Prosper network
    assert by["flights"] > by["prosper"]
    assert by["taxis"] > by["prosper"]
    assert (
        t10["total_bytes"] == t10["mem_entries_bytes"] + t10["mem_paths_bytes"]
    ).all()


def test_bench_cell_registry_roundtrip():
    cell = bench_cell("taxis", "noprov", sf=TEST_SF["taxis"])
    assert cell["seconds"] > 0
    again = cell_or_run("taxis", "noprov")
    assert again is cell  # cached, not re-run
