"""Engine factory — one entry point for every selection policy.

``make_engine(policy, ...)`` builds the right engine for a policy name
from :data:`repro.core.model.POLICIES`; ``run_policy`` is the one-shot
batch convenience used by tests, benchmarks and the distributed runner.
"""
from __future__ import annotations

from typing import Any

import pandas as pd

from repro.core.engine import (
    Engine,
    HeapEngine,
    NoProvEngine,
    QueueEngine,
    sort_interactions,
    touched_vertices,
)
from repro.core.model import POLICIES
from repro.core.proportional import DenseProportionalEngine, SparseProportionalEngine
from repro.scale.budget import BudgetEngine
from repro.scale.grouped import GroupedEngine
from repro.scale.selective import SelectiveEngine
from repro.scale.windowed import WindowedEngine


def make_engine(policy: str, **opts: Any) -> Engine:
    """Build an engine for ``policy``.

    Policy-specific options: ``vertices`` (prop_dense), ``prune_eps``
    (prop_sparse), ``tracked`` (selective), ``m``/``group_of``
    (grouped), ``window`` (windowed), ``capacity``/``keep_fraction``
    (budget), ``track_paths`` (fifo/lifo).
    """
    if policy == "noprov":
        return NoProvEngine(**opts)
    if policy in ("lrb", "mrb"):
        return HeapEngine(policy, **opts)
    if policy in ("fifo", "lifo"):
        return QueueEngine(policy, **opts)
    if policy == "prop_dense":
        return DenseProportionalEngine(**opts)
    if policy == "prop_sparse":
        return SparseProportionalEngine(**opts)
    if policy == "selective":
        return SelectiveEngine(**opts)
    if policy == "grouped":
        return GroupedEngine(**opts)
    if policy == "windowed":
        return WindowedEngine(**opts)
    if policy == "budget":
        return BudgetEngine(**opts)
    raise ValueError(f"unknown policy {policy!r}; expected one of {POLICIES}")


def run_policy(pdf: pd.DataFrame, policy: str, **opts: Any) -> Engine:
    """Replay the whole interaction frame under ``policy`` and return
    the finished engine. ``prop_dense`` infers the vertex universe from
    the data when ``vertices`` is not given."""
    pdf = sort_interactions(pdf)
    if policy == "prop_dense" and "vertices" not in opts:
        opts = {**opts, "vertices": touched_vertices(pdf)}
    return make_engine(policy, **opts).run(pdf, presorted=True)
