"""§6 — Tracking the paths of quantities (how-provenance).

The paper implements path tracking on top of the LIFO policy and
reports (Table 10) runtime, memory split into provenance entries vs
stored paths, and the average path length per buffered element. The
kernel itself lives in :class:`repro.core.engine.QueueEngine`
(``track_paths=True``); this module adds the analysis layer: a runner
plus path statistics.

Path semantics (see DESIGN.md §5): an element's path is the sequence of
*transmitter* vertices it was relayed through after its birth hop —
newborn elements have an empty path (their origin is stored in the
entry), split elements inherit the parent's path, and every relay
appends the transmitting vertex. Proportional selection mixes
same-origin quantities from different paths, so path tracking is not
meaningful there (§6) and is deliberately unsupported.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.engine import QueueEngine, sort_interactions
from repro.core.model import EPS


def path_tracking_engine(order: str = "lifo") -> QueueEngine:
    """A receipt-order engine that records relay paths (§6)."""
    return QueueEngine(order, track_paths=True)


def run_path_tracking(pdf: pd.DataFrame, *, order: str = "lifo") -> QueueEngine:
    """Replay ``pdf`` under the given receipt-order policy with path
    tracking enabled and return the finished engine."""
    return path_tracking_engine(order).run(sort_interactions(pdf), presorted=True)


def path_rows(engine: QueueEngine) -> pd.DataFrame:
    """All live buffer elements with their paths, as a pandas frame with
    columns ``vertex, origin, quantity, path_len, path`` (path is a
    '->'-joined string, origin first — the element's full route)."""
    rows = []
    for v in sorted(engine.queues):
        for o, q, path in engine.buffer_paths(v):
            rows.append((v, o, q, len(path), "->".join(map(str, (o, *path)))))
    return pd.DataFrame(rows, columns=["vertex", "origin", "quantity", "path_len", "path"])


def path_stats(engine: QueueEngine) -> dict[str, float]:
    """Table 10 statistics: live entries, total stored path elements and
    the average path length over live buffer elements."""
    lens = [
        len(e[2])
        for dq in engine.queues.values()
        for e in dq
        if e[1] > EPS
    ]
    return {
        "n_entries": float(engine.entry_count()),
        "path_elems": float(engine.path_elems),
        "avg_path_len": float(np.mean(lens)) if lens else 0.0,
        "max_path_len": float(max(lens)) if lens else 0.0,
    }
