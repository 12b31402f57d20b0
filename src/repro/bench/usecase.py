"""§7.6 use case — provenance-based alerting ("smurfing" detection).

The paper's demonstration: replay the TIN under proportional selection
and, after every interaction, alert if the receiving vertex's buffer
exceeds a threshold while *none* of the buffered quantity originates
from its direct in-neighbours (neighbours merely relay to it). Alerts
where fewer than ``few_contributors`` origins contribute are flagged
separately (the paper's red dots); the rest — amounts assembled from
many origins — are the smurfing suspects (blue dots).
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd

from repro.core.model import EPS
from repro.core.proportional import SparseProportionalEngine
from repro.core.engine import sort_interactions


@dataclass(frozen=True)
class Alert:
    """One provenance alert: at interaction ``step`` (1-based), vertex
    ``vertex`` held ``buffered`` units from ``n_contributors`` origins,
    none of which is a direct in-neighbour."""

    step: int
    vertex: int
    buffered: float
    n_contributors: int
    few: bool


def smurfing_alerts(
    pdf: pd.DataFrame,
    *,
    threshold: float,
    few_contributors: int = 5,
) -> list[Alert]:
    """Replay ``pdf`` under sparse proportional provenance and collect
    the §7.6 alerts. In-neighbour sets are accumulated online, exactly
    as a streaming monitor would."""
    engine = SparseProportionalEngine()
    in_neighbors: dict[int, set[int]] = {}
    alerts: list[Alert] = []
    ordered = sort_interactions(pdf)
    for step, (s, d, t, q) in enumerate(
        zip(ordered["s"], ordered["d"], ordered["t"], ordered["q"]), start=1
    ):
        s, d = int(s), int(d)
        engine.process(s, d, float(t), float(q))
        in_neighbors.setdefault(d, set()).add(s)
        total = engine.buffer_total(d)
        if total <= threshold:
            continue
        vec = engine.vector(d)
        contributors = [o for o, x in vec.items() if x > EPS]
        if any(o in in_neighbors[d] for o in contributors):
            continue  # some quantity originates from a direct neighbour
        alerts.append(
            Alert(
                step=step,
                vertex=d,
                buffered=total,
                n_contributors=len(contributors),
                few=len(contributors) < few_contributors,
            )
        )
    return alerts
