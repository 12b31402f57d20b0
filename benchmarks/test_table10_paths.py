"""Table 10 — path tracking (how-provenance) under LIFO on every
synthetic TIN: runtime, entry memory, path memory, average path length.
"""
import time

import pytest

from repro.bench.harness import BENCH_SF, load
from repro.bench.memory import policy_bytes
from repro.bench.paper_numbers import PAPER_TABLE10
from repro.core.engine import touched_vertices
from repro.paths.tracking import path_stats, run_path_tracking

_results: dict[str, dict[str, float]] = {}


@pytest.mark.parametrize("name", list(BENCH_SF))
def test_table10_cell(benchmark, name):
    pdf = load(name, BENCH_SF[name])
    n_vertices = len(touched_vertices(pdf))

    def run():
        t0 = time.perf_counter()
        engine = run_path_tracking(pdf, order="lifo")
        secs = time.perf_counter() - t0
        st = path_stats(engine)
        st["seconds"] = secs
        st["mem_entries"] = float(
            policy_bytes("lifo", n_vertices=n_vertices, entries=engine.peak_entries())
        )
        st["mem_paths"] = 8.0 * st["path_elems"]
        return st

    st = benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    _results[name] = st
    assert st["avg_path_len"] >= 0.0


def test_table10_shape_hub_networks_have_long_paths(benchmark):
    """Table 10's shape: the dense hub networks (Flights, Taxis,
    Bitcoin) relay quantities much further than the role-separated
    networks (CTU, Prosper), and Flights is the extreme."""
    a = benchmark.pedantic(
        lambda: {k: v["avg_path_len"] for k, v in _results.items()},
        rounds=1, iterations=1, warmup_rounds=0,
    )
    assert a["flights"] == max(a.values())
    assert min(a["flights"], a["taxis"], a["bitcoin"]) > max(a["ctu"], a["prosper"])
    assert a["prosper"] < 1.0 and a["ctu"] < 1.0  # sub-1, as in the paper


def test_zz_print_table10(benchmark, capsys):
    from repro.bench.memory import fmt_bytes

    benchmark.pedantic(lambda: _results, rounds=1, iterations=1, warmup_rounds=0)
    with capsys.disabled():
        print("\n== Table 10: LIFO path tracking (ours vs paper) ==")
        print(f"{'dataset':<9} {'sec':>8} {'entries':>10} {'paths':>10} "
              f"{'avg_len':>8} | paper: {'sec':>6} {'entriesMB':>9} "
              f"{'pathsMB':>8} {'avg_len':>8}")
        for name, st in _results.items():
            p = PAPER_TABLE10[name]
            print(
                f"{name:<9} {st['seconds']:>8.3f} "
                f"{fmt_bytes(st['mem_entries']):>10} "
                f"{fmt_bytes(st['mem_paths']):>10} {st['avg_path_len']:>8.2f} | "
                f"{p[0]:>13} {p[1]:>9} {p[2]:>8} {p[4]:>8}"
            )
