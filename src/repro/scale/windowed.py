"""§5.3.1 — Windowing approach for limiting provenance scope.

Each vertex keeps *two* sparse provenance lists, ``p^odd`` and
``p^even``. Every interaction updates both. Whenever the running
interaction count reaches an odd multiple of W, every ``p^odd`` is
reset to ``[(α, |B_v|)]`` ("entire buffer of unknown provenance"); at
even multiples, every ``p^even`` is reset. Queries read whichever list
was *least recently* reset, which guarantees exact provenance for
quantities born between W and 2W interactions ago (Figure 4).
"""
from __future__ import annotations

import numpy as np

from repro.core.engine import Engine
from repro.core.model import ALPHA, EPS
from repro.core.proportional import SparseProportionalEngine


class _Store(SparseProportionalEngine):
    """One of the two half-window sparse stores. Reuses the sparse
    proportional kernel; totals/generated are maintained by the outer
    engine, so `_settle` here only updates this store's own (identical)
    copy of the totals — cheap and keeps the kernel unchanged."""


class WindowedEngine(Engine):
    """Proportional provenance, exact for the last W..2W interactions."""

    policy = "windowed"

    def __init__(self, window: int) -> None:
        super().__init__()
        if window < 1:
            raise ValueError("window must be >= 1")
        self.window = window
        self.odd = _Store()
        self.even = _Store()
        # Both stores maintain identical |B_v| / generation state; alias
        # the odd store's dicts so this engine exposes them for free.
        self.totals = self.odd.totals
        self.generated = self.odd.generated
        self._last_reset: str | None = None
        self.n_resets = 0

    def process(self, s: int, d: int, t: float, q: float) -> None:
        self.odd.process(s, d, t, q)
        self.even.process(s, d, t, q)
        self.n_processed += 1
        self.n_newborn = self.odd.n_newborn
        if self.n_processed % self.window == 0:
            multiple = self.n_processed // self.window
            store = self.odd if multiple % 2 == 1 else self.even
            self._reset(store)
            self._last_reset = "odd" if multiple % 2 == 1 else "even"
            self.n_resets += 1

    def _reset(self, store: _Store) -> None:
        """Collapse every vertex's ordered list in ``store`` to
        [(α, |B_v|)] — "the entire quantity in B_v has unknown provenance"."""
        n = 0
        for v, vec in store.vecs.items():
            tot = store.totals.get(v, 0.0)
            if tot > EPS:
                vec[0] = np.array([ALPHA], dtype=np.int64)
                vec[1] = np.array([tot])
                n += 1
            else:
                vec[0] = vec[0][:0]
                vec[1] = vec[1][:0]
        store._n_entries = n

    @property
    def active(self) -> _Store:
        """The store that was least recently reset — the one queries use."""
        if self._last_reset == "odd":
            return self.even
        return self.odd

    def vector(self, v: int) -> dict[int, float]:
        """Sparse provenance of ``v`` from the active store; the α key
        (:data:`ALPHA`) is quantity older than the tracking horizon."""
        return self.active.vector(v)

    def provenance_rows(self) -> list[tuple]:
        return self.active.provenance_rows()

    def entry_count(self) -> int:
        """Live entries across *both* stores (both occupy memory)."""
        return self.odd.entry_count() + self.even.entry_count()

    def peak_entries(self) -> int:
        return self.odd.peak_entries() + self.even.peak_entries()
