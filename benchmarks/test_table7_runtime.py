"""Table 7 — runtime of every selection policy on every synthetic TIN.

One pytest-benchmark cell per (dataset, policy); infeasible cells are
skipped exactly where the paper prints '-'. Measurements are recorded
in ``repro.bench.harness.CELL_RESULTS`` so the Table 8 memory report
(alphabetically later in this suite) reuses the same replays.
"""
import pytest

from repro.bench import paper_numbers as paper
from repro.bench.harness import BENCH_SF, bench_cell, feasible, load

CELLS = [
    (name, policy)
    for name in BENCH_SF
    for policy in paper.TABLE7_COLUMNS
]


@pytest.mark.parametrize("name,policy", CELLS, ids=[f"{n}-{p}" for n, p in CELLS])
def test_table7_cell(benchmark, name, policy):
    if not feasible(policy, name):
        pytest.skip(f"paper marks {policy} on {name} as infeasible ('-')")
    load(name, BENCH_SF[name])  # exclude generation from the timing
    cell = benchmark.pedantic(
        bench_cell, args=(name, policy), rounds=1, iterations=1, warmup_rounds=0
    )
    assert cell["seconds"] > 0


def test_zz_print_table7(benchmark, capsys):
    from repro.bench.harness import tables_from_cells

    # reuses the cells measured above (pedantic keeps this visible
    # under --benchmark-only, which skips fixtureless tests)
    t7, _ = benchmark.pedantic(tables_from_cells, rounds=1, iterations=1, warmup_rounds=0)
    wide = t7.pivot(index="dataset", columns="policy", values="seconds")
    paper_wide = t7.pivot(index="dataset", columns="policy", values="paper_seconds")
    with capsys.disabled():
        print("\n== Table 7: runtime seconds (this reproduction) ==")
        print(wide.to_string(float_format=lambda x: f"{x:.3f}"))
        print("== Table 7: runtime seconds (paper, C, full scale) ==")
        print(paper_wide.to_string(float_format=lambda x: f"{x:.4f}"))
