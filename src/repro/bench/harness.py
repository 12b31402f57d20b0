"""Experiment harness: one runner per evaluation table (Tables 6–10).

Every runner returns a tidy pandas DataFrame whose rows mirror the
paper's table, with our measurement next to the paper's published
number, and prints a readable table. Absolute values differ from the
paper by design — our TINs are seeded synthetic analogues at a reduced
scale factor and the kernels are Python/numpy, not C (see DESIGN.md §3)
— the point of the comparison is the *shape*: which policy wins, by
roughly what factor, and where feasibility cliffs fall.

``BENCH_SF`` holds the per-dataset scale factors used for Tables 6–10
(chosen so each replay is 10⁴–10⁵ interactions and the full benchmark
suite finishes in minutes); ``TEST_SF`` is a 10× smaller set for unit
tests.
"""
from __future__ import annotations

import time
from typing import Any, Iterable, Sequence

import pandas as pd

from repro.bench import paper_numbers as paper
from repro.bench.memory import fmt_bytes, policy_bytes
from repro.core.api import run_policy
from repro.core.engine import Engine, sort_interactions, touched_vertices
from repro.paths.tracking import path_stats, run_path_tracking
from repro.scale.budget import BudgetEngine
from repro.tin import datasets as tin

#: Scale factor per dataset for benchmark runs (1.0 = paper scale).
BENCH_SF = {
    "bitcoin": 0.002,
    "ctu": 0.02,
    "prosper": 0.01,
    "flights": 0.04,
    "taxis": 0.25,
}

#: 10× smaller scale for unit tests of the harness itself.
TEST_SF = {name: sf / 10.0 for name, sf in BENCH_SF.items()}

#: Policy availability per dataset, mirroring the paper's "-" cells:
#: dense proportional needs O(|V|²) memory (only the two small-vertex
#: networks); sparse proportional exhausted memory on Bitcoin and CTU.
FEASIBLE = {
    "prop_dense": {"flights", "taxis"},
    "prop_sparse": {"prosper", "flights", "taxis"},
}

_dataset_cache: dict[tuple[str, float], pd.DataFrame] = {}


def load(name: str, sf: float) -> pd.DataFrame:
    """Time-sorted synthetic TIN, cached per (name, sf) within a process."""
    key = (name, sf)
    if key not in _dataset_cache:
        _dataset_cache[key] = sort_interactions(tin.generate(name, sf=sf))
    return _dataset_cache[key]


def feasible(policy: str, dataset: str) -> bool:
    """Whether the paper could run ``policy`` on ``dataset`` (Table 7/8
    availability matrix) — we keep the same cells blank."""
    return dataset in FEASIBLE.get(policy, set(paper.PAPER_TABLE6))


def timed_run(pdf: pd.DataFrame, policy: str, **opts: Any) -> tuple[Engine, float]:
    """Replay ``pdf`` under ``policy``; return (engine, wall seconds).

    Only the replay itself is timed (the paper likewise excludes data
    loading)."""
    t0 = time.perf_counter()
    engine = run_policy(pdf, policy, **opts)
    return engine, time.perf_counter() - t0


#: (dataset, policy) → {"seconds", "peak_entries", "n_vertices", ...} —
#: filled by the Table 7 benchmark cells so the Table 8 memory report
#: reuses the same replays instead of re-running every policy.
CELL_RESULTS: dict[tuple[str, str], dict[str, float]] = {}


def bench_cell(name: str, policy: str, *, sf: float | None = None) -> dict[str, float]:
    """Run one (dataset, policy) Table 7/8 cell and record it in
    :data:`CELL_RESULTS`. Returns the recorded measurement."""
    sf = BENCH_SF[name] if sf is None else sf
    pdf = load(name, sf)
    engine, secs = timed_run(pdf, policy)
    n_vertices = len(touched_vertices(pdf))
    cell = {
        "seconds": secs,
        "peak_entries": float(engine.peak_entries()),
        "n_vertices": float(n_vertices),
        "bytes": float(
            policy_bytes(policy, n_vertices=n_vertices, entries=engine.peak_entries())
        ),
    }
    CELL_RESULTS[(name, policy)] = cell
    return cell


def cell_or_run(name: str, policy: str, *, sf: float | None = None) -> dict[str, float]:
    """Cached Table 7/8 cell, computing it on first use."""
    return CELL_RESULTS.get((name, policy)) or bench_cell(name, policy, sf=sf)


def tables_from_cells(
    datasets: Iterable[str] | None = None,
    policies: Sequence[str] = paper.TABLE7_COLUMNS,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Assemble the Table 7/8 frames from :data:`CELL_RESULTS`, running
    any cell not yet measured. Infeasible cells stay blank."""
    datasets = list(datasets) if datasets is not None else list(BENCH_SF)
    t_rows, m_rows = [], []
    for name in datasets:
        for i, pol in enumerate(policies):
            p_time = paper.PAPER_TABLE7[name][i]
            p_mem = paper.PAPER_TABLE8[name][i]
            if not feasible(pol, name):
                t_rows.append((name, pol, None, p_time))
                m_rows.append((name, pol, None, p_mem))
                continue
            cell = cell_or_run(name, pol)
            t_rows.append((name, pol, cell["seconds"], p_time))
            m_rows.append((name, pol, cell["bytes"], p_mem))
    t7 = pd.DataFrame(t_rows, columns=["dataset", "policy", "seconds", "paper_seconds"])
    t8 = pd.DataFrame(m_rows, columns=["dataset", "policy", "bytes", "paper_bytes"])
    return t7, t8


# --------------------------------------------------------------------------
# Table 6 — dataset characteristics
# --------------------------------------------------------------------------
def run_table6(sf_map: dict[str, float] | None = None) -> pd.DataFrame:
    """Characteristics of the synthetic datasets at their bench SF, next
    to the paper's full-scale characteristics."""
    sf_map = sf_map or BENCH_SF
    rows = []
    for name, sf in sf_map.items():
        pdf = load(name, sf)
        nodes = len(touched_vertices(pdf))
        p_nodes, p_inter, p_avg = paper.PAPER_TABLE6[name]
        rows.append(
            {
                "dataset": name,
                "sf": sf,
                "n_nodes": nodes,
                "n_interactions": len(pdf),
                "avg_q": float(pdf["q"].mean()),
                "paper_n_nodes": p_nodes,
                "paper_n_interactions": p_inter,
                "paper_avg_q": p_avg,
            }
        )
    return pd.DataFrame(rows)


# --------------------------------------------------------------------------
# Tables 7 & 8 — runtime and peak memory per selection policy
# --------------------------------------------------------------------------
def run_table7_8(
    sf_map: dict[str, float] | None = None,
    datasets: Iterable[str] | None = None,
    policies: Sequence[str] = paper.TABLE7_COLUMNS,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """One replay per (dataset, feasible policy); returns the runtime
    table and the memory table (long format: one row per cell, with the
    paper's corresponding number)."""
    sf_map = sf_map or BENCH_SF
    datasets = list(datasets) if datasets is not None else list(sf_map)
    t_rows, m_rows = [], []
    for name in datasets:
        pdf = load(name, sf_map[name])
        n_vertices = len(touched_vertices(pdf))
        for i, pol in enumerate(policies):
            p_time = paper.PAPER_TABLE7[name][i]
            p_mem = paper.PAPER_TABLE8[name][i]
            if not feasible(pol, name):
                t_rows.append((name, pol, None, p_time))
                m_rows.append((name, pol, None, p_mem))
                continue
            engine, secs = timed_run(pdf, pol)
            mem = policy_bytes(
                pol, n_vertices=n_vertices, entries=engine.peak_entries()
            )
            t_rows.append((name, pol, secs, p_time))
            m_rows.append((name, pol, float(mem), p_mem))
    t7 = pd.DataFrame(t_rows, columns=["dataset", "policy", "seconds", "paper_seconds"])
    t8 = pd.DataFrame(m_rows, columns=["dataset", "policy", "bytes", "paper_bytes"])
    return t7, t8


# --------------------------------------------------------------------------
# Table 9 — budget-based provenance shrink statistics
# --------------------------------------------------------------------------
#: The paper could not run C > 100 on Bitcoin (32 GB limit); we keep the
#: same sweep shape.
TABLE9_CAPACITIES = {
    "bitcoin": (10, 50, 100),
    "ctu": (10, 50, 100, 200, 500, 1000),
    "prosper": (10, 50, 100, 200, 500, 1000),
}


def run_table9(
    sf_map: dict[str, float] | None = None,
    capacities: dict[str, tuple[int, ...]] | None = None,
    keep_fraction: float = 0.7,
) -> pd.DataFrame:
    """Budget-based proportional provenance on the three large TINs:
    average shrinks per non-empty buffer and % of vertices shrunk, per
    capacity C — plus runtime/memory (the Figure 8 measurements)."""
    sf_map = sf_map or BENCH_SF
    capacities = capacities or TABLE9_CAPACITIES
    rows = []
    for name, caps in capacities.items():
        pdf = load(name, sf_map[name])
        n_vertices = len(touched_vertices(pdf))
        for cap in caps:
            engine, secs = timed_run(
                pdf, "budget", capacity=cap, keep_fraction=keep_fraction
            )
            assert isinstance(engine, BudgetEngine)
            stats = engine.shrink_stats()
            p_avg, p_pct = paper.PAPER_TABLE9.get(name, {}).get(cap, (None, None))
            rows.append(
                {
                    "dataset": name,
                    "C": cap,
                    "avg_shrinks": stats["avg_shrinks"],
                    "pct_shrunk": stats["pct_shrunk"],
                    "seconds": secs,
                    "bytes": float(
                        policy_bytes(
                            "budget",
                            n_vertices=n_vertices,
                            entries=engine.peak_entries(),
                        )
                    ),
                    "paper_avg_shrinks": p_avg,
                    "paper_pct_shrunk": p_pct,
                }
            )
    return pd.DataFrame(rows)


# --------------------------------------------------------------------------
# Table 10 — path tracking (how-provenance) under LIFO
# --------------------------------------------------------------------------
def run_table10(sf_map: dict[str, float] | None = None) -> pd.DataFrame:
    """LIFO replay with relay-path tracking on all five TINs: runtime,
    entry memory, path memory and average path length."""
    sf_map = sf_map or BENCH_SF
    rows = []
    for name, sf in sf_map.items():
        pdf = load(name, sf)
        n_vertices = len(touched_vertices(pdf))
        t0 = time.perf_counter()
        engine = run_path_tracking(pdf, order="lifo")
        secs = time.perf_counter() - t0
        st = path_stats(engine)
        entries_b = policy_bytes(
            "lifo", n_vertices=n_vertices, entries=engine.peak_entries()
        )
        paths_b = 8.0 * st["path_elems"]
        p_time, p_me, p_mp, p_tot, p_len = paper.PAPER_TABLE10[name]
        rows.append(
            {
                "dataset": name,
                "seconds": secs,
                "mem_entries_bytes": float(entries_b),
                "mem_paths_bytes": paths_b,
                "total_bytes": entries_b + paths_b,
                "avg_path_len": st["avg_path_len"],
                "paper_seconds": p_time,
                "paper_mem_entries_mb": p_me,
                "paper_mem_paths_mb": p_mp,
                "paper_avg_path_len": p_len,
            }
        )
    return pd.DataFrame(rows)


# --------------------------------------------------------------------------
# presentation helpers
# --------------------------------------------------------------------------
def fmt_table(df: pd.DataFrame, title: str) -> str:
    """Markdown-ish rendering with byte columns humanised."""
    shown = df.copy()
    for col in shown.columns:
        if col.endswith("bytes"):
            shown[col] = shown[col].map(
                lambda b: fmt_bytes(b) if pd.notna(b) else "-"
            )
    return f"## {title}\n\n{shown.to_string(index=False)}\n"
