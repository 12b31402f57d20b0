"""§5.1 — Selective proportional provenance.

Provenance is tracked only from a designated subset of k origin
vertices (e.g. the top-k generators, or suspects chosen by an analyst).
Every vertex keeps a (k+1)-length vector: positions 0..k−1 are the
tracked origins, position k accumulates quantity originating from *any*
other vertex. Space drops from O(|V|²) to O(k·|V|) and time to O(k)
per interaction — Algorithm 3 applies unchanged, with untracked origins
folded into the overflow slot.
"""
from __future__ import annotations

from typing import Iterable

import numpy as np

from repro.core.engine import Engine
from repro.core.model import ALPHA, EPS


class SelectiveEngine(Engine):
    """Proportional selection with k tracked origins + an "other" slot.

    Vectors are allocated lazily (only vertices that ever buffer
    quantity pay for one), matching the O(k·|V|) bound.
    """

    policy = "selective"

    def __init__(self, tracked: Iterable[int]) -> None:
        super().__init__()
        self.tracked = sorted(set(int(v) for v in tracked))
        self.k = len(self.tracked)
        self._pos = {v: i for i, v in enumerate(self.tracked)}
        self._other = self.k  # index of the (k+1)-th overflow position
        self.vecs: dict[int, np.ndarray] = {}

    def _vec(self, v: int) -> np.ndarray:
        vec = self.vecs.get(v)
        if vec is None:
            vec = self.vecs[v] = np.zeros(self.k + 1, dtype=np.float64)
        return vec

    def process(self, s: int, d: int, t: float, q: float) -> None:
        pd_ = self._vec(d)
        ps = self.vecs.get(s)
        bs = self.totals.get(s, 0.0)
        if q >= bs - EPS:
            if ps is not None:
                pd_ += ps
                ps[:] = 0.0
            newborn = q - bs
            if newborn > EPS:
                pd_[self._pos.get(s, self._other)] += newborn
            else:
                newborn = 0.0
        else:
            frac = q / bs
            moved = ps * frac
            pd_ += moved
            ps -= moved
            newborn = 0.0
        self._settle(s, d, q, newborn)

    def vector(self, v: int) -> np.ndarray:
        """(k+1)-vector of ``v``: tracked origins in ``self.tracked``
        order, then the "all other vertices" slot."""
        return self._vec(v).copy()

    def provenance_rows(self) -> list[tuple]:
        """Rows use the real origin id for tracked origins and
        :data:`ALPHA` for the aggregated "other" slot."""
        rows = []
        for v in sorted(self.vecs):
            vec = self.vecs[v]
            for i in np.nonzero(vec > EPS)[0]:
                o = self.tracked[int(i)] if int(i) < self.k else ALPHA
                rows.append((v, o, None, float(vec[i])))
        return rows

    def entry_count(self) -> int:
        return sum(int((vec > EPS).sum()) for vec in self.vecs.values())

    def peak_entries(self) -> int:
        return len(self.vecs) * (self.k + 1)
