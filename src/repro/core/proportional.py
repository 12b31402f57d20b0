"""Algorithm 3 — proportional selection (§4.3).

Each vertex ``v`` carries a provenance vector ``p_v``; position ``o``
holds the fraction of ``|B_v|`` that was generated at origin ``o``. A
transfer of ``r.q < |B_{r.s}|`` moves the slice ``(r.q/|B_{r.s}|)·p_{r.s}``
vertex-wise; a transfer of ``r.q ≥ |B_{r.s}|`` moves the whole vector and
adds a newborn ``e_{r.s, r.q−|B_{r.s}|}``.

Two representations, exactly as evaluated in Tables 7/8:

* :class:`DenseProportionalEngine` — one |V|-length float64 numpy row
  per vertex (a |V|×|V| matrix). numpy's vectorised axpy is the
  Python-world equivalent of the paper's SIMD implementation. Space is
  O(|V|²): feasible only for small vertex sets (Flights, Taxis).
* :class:`SparseProportionalEngine` — per-vertex ``{origin: quantity}``
  maps, the paper's ordered (u, q) lists. Space is O(|V|·ℓ) where ℓ is
  the mean list length; the engine tracks the live entry count and its
  peak, which drives the Table 8 memory model.
"""
from __future__ import annotations

from typing import Iterable

import numpy as np

from repro.core.engine import Engine
from repro.core.model import EPS

#: Refuse to allocate a dense matrix beyond this vertex count — at 8
#: bytes/cell, 20k vertices is already 3.2 GB. The paper likewise could
#: not run dense on Bitcoin/CTU/Prosper (Table 7 "-").
DENSE_MAX_VERTICES = 20_000


class DenseProportionalEngine(Engine):
    """Proportional selection over dense per-vertex vectors.

    ``vertices`` fixes the vertex universe up front (dense vectors need
    a position per possible origin). Arbitrary vertex ids are remapped
    to matrix indices internally; all public output uses original ids.
    """

    policy = "prop_dense"

    def __init__(self, vertices: Iterable[int]) -> None:
        super().__init__()
        ids = sorted(set(int(v) for v in vertices))
        if len(ids) > DENSE_MAX_VERTICES:
            raise MemoryError(
                f"dense proportional needs a {len(ids)}x{len(ids)} float64 "
                f"matrix; limit is {DENSE_MAX_VERTICES} vertices — use "
                "SparseProportionalEngine or the §5 scalable variants"
            )
        self.ids = ids
        self._pos = {v: i for i, v in enumerate(ids)}
        self.P = np.zeros((len(ids), len(ids)), dtype=np.float64)

    def process(self, s: int, d: int, t: float, q: float) -> None:
        si, di = self._pos[s], self._pos[d]
        P = self.P
        bs = self.totals.get(s, 0.0)
        if q >= bs - EPS:  # whole buffer relayed (+ possible newborn)
            P[di] += P[si]
            P[si] = 0.0
            newborn = q - bs
            if newborn > EPS:
                P[di, si] += newborn
            else:
                newborn = 0.0
        else:  # proportional slice
            frac = q / bs
            row = P[si]
            moved = row * frac
            P[di] += moved
            row -= moved
            newborn = 0.0
        self._settle(s, d, q, newborn)

    def vector(self, v: int) -> np.ndarray:
        """Copy of ``p_v`` in the order of ``self.ids`` (Table 5 layout)."""
        return self.P[self._pos[v]].copy()

    def provenance_rows(self) -> list[tuple]:
        rows = []
        for v in self.ids:
            row = self.P[self._pos[v]]
            for i in np.nonzero(row > EPS)[0]:
                rows.append((v, self.ids[int(i)], None, float(row[i])))
        return rows

    def entry_count(self) -> int:
        return int((self.P > EPS).sum())

    def peak_entries(self) -> int:  # dense storage is fixed-size
        return self.P.size


_EMPTY_K = np.empty(0, dtype=np.int64)
_EMPTY_V = np.empty(0, dtype=np.float64)


class SparseProportionalEngine(Engine):
    """Proportional selection over sparse ordered ``(origin, quantity)``
    lists — exactly the paper's sparse representation: each vertex's
    vector is a pair of parallel arrays (sorted origin ids, quantities),
    and every transfer *merges* the moved slice into the destination's
    ordered list (vectorised with numpy, the SIMD analogue).

    ``prune_eps``: entries whose quantity falls below this threshold
    after a proportional split are dropped (0 disables pruning — the
    paper keeps all entries, which is why ℓ grows monotonically; our
    default matches the paper).
    """

    policy = "prop_sparse"

    def __init__(self, *, prune_eps: float = 0.0) -> None:
        super().__init__()
        # vertex -> [sorted origin ids (int64), quantities (float64)]
        self.vecs: dict[int, list[np.ndarray]] = {}
        self.prune_eps = prune_eps
        self._n_entries = 0
        self._peak_entries = 0

    # -- ordered-list arithmetic -------------------------------------------
    def _merge_into(self, d: int, keys: np.ndarray, vals: np.ndarray) -> None:
        """Merge an (origin, quantity) list into vertex ``d``'s ordered
        list, summing quantities of equal origins."""
        if len(keys) == 0:
            return
        pd_ = self.vecs.get(d)
        if pd_ is None or len(pd_[0]) == 0:
            uk, inv = np.unique(keys, return_inverse=True)
            uv = np.bincount(inv, weights=vals)
            self.vecs[d] = [uk, uv]
            self._n_entries += len(uk)
        else:
            k = np.concatenate((pd_[0], keys))
            v = np.concatenate((pd_[1], vals))
            uk, inv = np.unique(k, return_inverse=True)
            uv = np.bincount(inv, weights=v)
            self._n_entries += len(uk) - len(pd_[0])
            pd_[0], pd_[1] = uk, uv
        if self._n_entries > self._peak_entries:
            self._peak_entries = self._n_entries

    def process(self, s: int, d: int, t: float, q: float) -> None:
        ps = self.vecs.get(s)
        bs = self.totals.get(s, 0.0)
        if q >= bs - EPS:  # full relay (+ possible newborn at s)
            newborn = q - bs
            if newborn <= EPS:
                newborn = 0.0
            if ps is not None and len(ps[0]):
                keys, vals = ps[0], ps[1]
                if newborn > 0.0:
                    keys = np.concatenate((keys, np.array([s], dtype=np.int64)))
                    vals = np.concatenate((vals, np.array([newborn])))
                self._n_entries -= len(ps[0])
                ps[0], ps[1] = _EMPTY_K, _EMPTY_V
                self._merge_into(d, keys, vals)
            elif newborn > 0.0:
                self._merge_into(
                    d, np.array([s], dtype=np.int64), np.array([newborn])
                )
        else:  # proportional slice
            frac = q / bs
            moved = ps[1] * frac
            ps[1] -= moved
            keys = ps[0]
            if self.prune_eps > 0.0:
                live = ps[1] >= self.prune_eps
                if not live.all():
                    self._n_entries -= int((~live).sum())
                    ps[0], ps[1] = ps[0][live], ps[1][live]
            self._merge_into(d, keys, moved)
            newborn = 0.0
        self._settle(s, d, q, newborn)

    # -- inspection ----------------------------------------------------------
    def vector(self, v: int) -> dict[int, float]:
        vec = self.vecs.get(v)
        if vec is None:
            return {}
        return dict(zip(vec[0].tolist(), vec[1].tolist()))

    def list_of(self, v: int) -> list[tuple[int, float]]:
        """The ordered (origin, quantity) list of ``v`` — the paper's
        sparse representation, origin-sorted."""
        vec = self.vecs.get(v)
        if vec is None:
            return []
        return list(zip(vec[0].tolist(), vec[1].tolist()))

    def provenance_rows(self) -> list[tuple]:
        rows = []
        for v in sorted(self.vecs):
            keys, vals = self.vecs[v]
            for o, quan in zip(keys.tolist(), vals.tolist()):
                if quan > EPS:
                    rows.append((v, o, None, quan))
        return rows

    def entry_count(self) -> int:
        return self._n_entries

    def peak_entries(self) -> int:
        return self._peak_entries

    def mean_list_length(self) -> float:
        """ℓ — mean ordered-list length over vertices with entries."""
        lens = [len(p[0]) for p in self.vecs.values() if len(p[0])]
        return float(np.mean(lens)) if lens else 0.0
