"""Table 9 — budget-based proportional provenance: one benchmark cell
per (dataset, capacity C) over the paper's sweep, collecting the shrink
statistics the table reports.
"""
import pytest

from repro.bench.harness import BENCH_SF, TABLE9_CAPACITIES, load, timed_run
from repro.bench.paper_numbers import PAPER_TABLE9

_results: dict[tuple[str, int], dict[str, float]] = {}

CELLS = [(name, C) for name, caps in TABLE9_CAPACITIES.items() for C in caps]


@pytest.mark.parametrize("name,C", CELLS, ids=[f"{n}-C{c}" for n, c in CELLS])
def test_table9_cell(benchmark, name, C):
    pdf = load(name, BENCH_SF[name])

    def run():
        engine, secs = timed_run(pdf, "budget", capacity=C, keep_fraction=0.7)
        return {**engine.shrink_stats(), "seconds": secs}

    stats = benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    _results[(name, C)] = stats
    assert 0.0 <= stats["pct_shrunk"] <= 100.0


@pytest.mark.parametrize("name", list(TABLE9_CAPACITIES))
def test_table9_shrinks_decrease_with_capacity(benchmark, name):
    """The table's monotone trend: larger C → fewer shrinks and fewer
    affected vertices (endpoints of the sweep)."""
    caps = TABLE9_CAPACITIES[name]
    lo, hi = benchmark.pedantic(
        lambda: (_results[(name, caps[0])], _results[(name, caps[-1])]),
        rounds=1, iterations=1, warmup_rounds=0,
    )
    assert lo["avg_shrinks"] >= hi["avg_shrinks"]
    assert lo["pct_shrunk"] >= hi["pct_shrunk"]


def test_zz_print_table9(benchmark, capsys):
    benchmark.pedantic(lambda: _results, rounds=1, iterations=1, warmup_rounds=0)
    with capsys.disabled():
        print("\n== Table 9: budget shrink stats (ours vs paper) ==")
        print(f"{'dataset':<9} {'C':>5} {'avg_shrinks':>12} {'%vertices':>10} "
              f"{'paper_avg':>10} {'paper_%':>8}")
        for (name, C), st in sorted(_results.items()):
            p_avg, p_pct = PAPER_TABLE9.get(name, {}).get(C, (None, None))
            print(
                f"{name:<9} {C:>5} {st['avg_shrinks']:>12.2f} "
                f"{st['pct_shrunk']:>10.2f} "
                f"{p_avg if p_avg is not None else '-':>10} "
                f"{p_pct if p_pct is not None else '-':>8}"
            )
