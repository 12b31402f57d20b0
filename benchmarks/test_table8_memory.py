"""Table 8 — peak provenance memory per (dataset, policy), from the
analytic memory model over in-kernel peak entry counts.

Runs after the Table 7 benchmarks (alphabetical file order) and reuses
their replays via ``CELL_RESULTS``; any missing cell is computed here.
"""
import pytest

from repro.bench import paper_numbers as paper
from repro.bench.harness import BENCH_SF, cell_or_run, feasible, tables_from_cells
from repro.bench.memory import fmt_bytes, noprov_bytes


@pytest.mark.parametrize("name", list(BENCH_SF))
def test_table8_noprov_floor(benchmark, name):
    """NoProv is the memory floor: every feasible policy's footprint is
    at least the 8·|V| baseline and at most ~dense (the ceiling)."""
    cell = benchmark.pedantic(
        cell_or_run, args=(name, "noprov"), rounds=1, iterations=1, warmup_rounds=0
    )
    base = noprov_bytes(int(cell["n_vertices"]))
    assert cell["bytes"] == base
    for pol in paper.TABLE7_COLUMNS:
        if pol == "noprov" or not feasible(pol, name):
            continue
        assert cell_or_run(name, pol)["bytes"] >= base


@pytest.mark.parametrize("name", list(BENCH_SF))
def test_table8_pair_vs_triple_shape(benchmark, name):
    """§7.2: receipt-order policies use less memory than generation-time
    policies (2-value vs 3-value entries) on every dataset."""
    lrb = benchmark.pedantic(
        cell_or_run, args=(name, "lrb"), rounds=1, iterations=1, warmup_rounds=0
    )["bytes"]
    lifo = cell_or_run(name, "lifo")["bytes"]
    assert lifo < lrb


def test_table8_dense_feasible_only_on_small_vertex_sets(benchmark):
    """The paper's feasibility cliff: dense proportional exists only for
    Flights and Taxis; on the three large TINs the model's 8·|V|² cost
    exceeds their machine's 32 GB at paper scale."""
    for name in ("bitcoin", "ctu", "prosper"):
        n_paper = paper.PAPER_TABLE6[name][0]
        assert 8.0 * n_paper * n_paper > 32e9
    for name in ("flights", "taxis"):
        assert feasible("prop_dense", name)
        cell = benchmark.pedantic(
            cell_or_run, args=(name, "prop_dense"),
            rounds=1, iterations=1, warmup_rounds=0,
        ) if name == "flights" else cell_or_run(name, "prop_dense")
        assert cell["bytes"] < 1e8


def test_zz_print_table8(benchmark, capsys):
    _, t8 = benchmark.pedantic(tables_from_cells, rounds=1, iterations=1, warmup_rounds=0)
    wide = t8.pivot(index="dataset", columns="policy", values="bytes")
    paper_wide = t8.pivot(index="dataset", columns="policy", values="paper_bytes")
    human = lambda x: fmt_bytes(x) if x == x and x is not None else "-"  # noqa: E731
    with capsys.disabled():
        print("\n== Table 8: peak memory (this reproduction, analytic model) ==")
        print(wide.map(human).to_string())
        print("== Table 8: peak memory (paper, C, full scale) ==")
        print(paper_wide.map(human).to_string())
