"""§5.2 — Grouped proportional provenance.

Vertices are partitioned into m groups (attributes, METIS clusters, or
— as in the paper's experiments — random round-robin); provenance is
tracked per *group* of origins. Each vertex keeps an m-length vector
whose j-th position is the buffered quantity originating from group j.
Space O(m·|V|), time O(m) per interaction.
"""
from __future__ import annotations

from typing import Callable, Mapping

import numpy as np

from repro.core.engine import Engine
from repro.core.model import EPS


class ModuloGroups:
    """Picklable round-robin grouping ``v ↦ v mod m`` — the paper's
    random round-robin allocation, made deterministic. Safe to ship to
    Spark workers (unlike a lambda)."""

    def __init__(self, m: int) -> None:
        self.m = m

    def __call__(self, v: int) -> int:
        return int(v) % self.m


class GroupedEngine(Engine):
    """Proportional selection with origins aggregated by group.

    ``group_of`` maps a vertex id to its group id in ``[0, m)``; it may
    be a dict or any callable (e.g. ``lambda v: v % m`` for round-robin).
    """

    policy = "grouped"

    def __init__(self, m: int, group_of: Mapping[int, int] | Callable[[int], int]) -> None:
        super().__init__()
        if m < 1:
            raise ValueError("need at least one group")
        self.m = m
        self._group = group_of.__getitem__ if isinstance(group_of, Mapping) else group_of
        self.vecs: dict[int, np.ndarray] = {}

    def group_of(self, v: int) -> int:
        g = self._group(v)
        if not 0 <= g < self.m:
            raise ValueError(f"group {g} of vertex {v} outside [0, {self.m})")
        return g

    def _vec(self, v: int) -> np.ndarray:
        vec = self.vecs.get(v)
        if vec is None:
            vec = self.vecs[v] = np.zeros(self.m, dtype=np.float64)
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
                pd_[self.group_of(s)] += newborn
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
        """m-length group-provenance vector of ``v``."""
        return self._vec(v).copy()

    def provenance_rows(self) -> list[tuple]:
        """Rows report the *group id* in the origin column."""
        rows = []
        for v in sorted(self.vecs):
            vec = self.vecs[v]
            for g in np.nonzero(vec > EPS)[0]:
                rows.append((v, int(g), None, float(vec[g])))
        return rows

    def entry_count(self) -> int:
        return sum(int((vec > EPS).sum()) for vec in self.vecs.values())

    def peak_entries(self) -> int:
        return len(self.vecs) * self.m
