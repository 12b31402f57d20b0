"""§5.3.2 — Budget-based proportional provenance.

Every vertex's sparse provenance list has a maximum capacity C. When a
merge would leave more than C entries, the list is *shrunk*: the
``⌊f·C⌋`` non-α entries with the largest quantities are kept and the
remainder is folded into the artificial origin α (unknown source). The
α entry itself is never evicted (it absorbs evicted mass), matching the
worked example in §5.3.2. Space is O(|V|·C); accuracy grows with C.

Table 9 reports, per (dataset, C): the average number of shrinks per
vertex with a non-empty buffer, and the percentage of such vertices
shrunk at least once — both exposed via :meth:`BudgetEngine.shrink_stats`.
"""
from __future__ import annotations

import numpy as np

from repro.core.engine import Engine
from repro.core.model import ALPHA, EPS
from repro.core.proportional import SparseProportionalEngine


class BudgetEngine(Engine):
    """Sparse proportional provenance under a per-vertex entry budget."""

    policy = "budget"

    def __init__(self, capacity: int, keep_fraction: float = 0.7) -> None:
        super().__init__()
        if capacity < 2:
            raise ValueError("capacity must be >= 2 (one data entry plus α)")
        if not 0.0 < keep_fraction < 1.0:
            raise ValueError("keep_fraction must be in (0, 1); paper suggests 0.6–0.8")
        self.capacity = capacity
        self.keep_fraction = keep_fraction
        self._keep_n = max(1, int(keep_fraction * capacity))
        self.inner = SparseProportionalEngine()
        # Alias the inner kernel's buffer/generation state.
        self.totals = self.inner.totals
        self.generated = self.inner.generated
        self.shrink_counts: dict[int, int] = {}

    def process(self, s: int, d: int, t: float, q: float) -> None:
        inner = self.inner
        inner.process(s, d, t, q)
        # Only the destination list can have grown past the budget.
        vec = inner.vecs.get(d)
        if vec is not None and len(vec[0]) > self.capacity:
            self._shrink(d, vec)
        self.n_processed += 1
        self.n_newborn = inner.n_newborn

    def _shrink(self, v: int, vec: list) -> None:
        keys, vals = vec
        before = len(keys)
        # α is never evicted; it absorbs the evicted quantity.
        data = keys != ALPHA
        alpha_q = float(vals[~data].sum())
        dk, dv = keys[data], vals[data]
        if len(dk) > self._keep_n:
            part = np.argpartition(dv, len(dv) - self._keep_n)
            kept = part[len(dv) - self._keep_n :]
            evicted_q = float(dv[part[: len(dv) - self._keep_n]].sum())
            dk, dv = dk[kept], dv[kept]
        else:  # only the α entry pushed us over; nothing to evict
            evicted_q = 0.0
        new_alpha = alpha_q + evicted_q
        if new_alpha > EPS:
            dk = np.concatenate((dk, np.array([ALPHA], dtype=np.int64)))
            dv = np.concatenate((dv, np.array([new_alpha])))
        order = np.argsort(dk)  # restore the ordered-list invariant
        vec[0], vec[1] = dk[order], dv[order]
        self.inner._n_entries -= before - len(vec[0])
        self.shrink_counts[v] = self.shrink_counts.get(v, 0) + 1

    # -- inspection -------------------------------------------------------
    def vector(self, v: int) -> dict[int, float]:
        return self.inner.vector(v)

    def provenance_rows(self) -> list[tuple]:
        return self.inner.provenance_rows()

    def entry_count(self) -> int:
        return self.inner.entry_count()

    def peak_entries(self) -> int:
        return self.inner.peak_entries()

    def shrink_stats(self) -> dict[str, float]:
        """Table 9 statistics over vertices that ever buffered quantity:
        ``avg_shrinks`` (mean shrink count) and ``pct_shrunk`` (share of
        vertices shrunk at least once, in percent)."""
        nonempty = [v for v, vec in self.inner.vecs.items() if len(vec[0])] or list(
            self.shrink_counts
        )
        n = len(nonempty)
        if n == 0:
            return {"avg_shrinks": 0.0, "pct_shrunk": 0.0, "n_nonempty": 0.0}
        total = sum(self.shrink_counts.get(v, 0) for v in nonempty)
        shrunk = sum(1 for v in nonempty if self.shrink_counts.get(v, 0) > 0)
        return {
            "avg_shrinks": total / n,
            "pct_shrunk": 100.0 * shrunk / n,
            "n_nonempty": float(n),
        }

    def metrics(self) -> dict[str, float]:
        m = super().metrics()
        m.update(
            total_shrinks=float(sum(self.shrink_counts.values())),
            **self.shrink_stats(),
        )
        return m
