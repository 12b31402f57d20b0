"""Sequential provenance engines: Algorithms 1–2 and the receipt-order
policies (§4.1, §4.2 of the paper).

Each engine consumes interactions ``(s, d, t, q)`` strictly in time
order and maintains, per vertex, the buffer ``B_v`` decomposed into
provenance entries according to its selection policy. Engines are
*incremental*: :meth:`Engine.process` applies one interaction, so the
same object serves one-shot batch runs, the streaming micro-batch
runner (``repro.stream``) and the per-component distributed runner
(``repro.core.distributed``).

Engines deliberately mirror the paper's data structures:

* :class:`NoProvEngine` — Algorithm 1; a scalar ``|B_v|`` per vertex.
* :class:`HeapEngine` — Algorithm 2; a binary heap of
  ``(origin, birth_time, quantity)`` triples per vertex, keyed on birth
  time (min-heap for least-recently-born, max-heap for
  most-recently-born). Partial transfers split the boundary triple.
* :class:`QueueEngine` — §4.2; a FIFO queue or LIFO stack of
  ``(origin, quantity)`` pairs per vertex. Optionally tracks the relay
  path of every element (§6 how-provenance; see
  ``repro.paths.tracking`` for the Table 10 harness).
"""
from __future__ import annotations

import heapq
from collections import deque
from typing import Iterable

import numpy as np
import pandas as pd

from repro.core.model import EPS


def sort_interactions(pdf: pd.DataFrame) -> pd.DataFrame:
    """Return ``pdf`` sorted by time (stable, so equal timestamps keep
    input order — the paper processes R "in order of time")."""
    return pdf.sort_values("t", kind="stable", ignore_index=True)


class Engine:
    """Base class: buffer totals (Algorithm 1 state) + bookkeeping.

    Subclasses implement :meth:`process` and :meth:`provenance_rows`.
    ``totals[v]`` is ``|B_v|`` and is maintained identically by every
    policy — the selection policy decides *which* units move, never
    *how many* (a key invariant the tests rely on).
    """

    policy = "base"

    def __init__(self) -> None:
        self.totals: dict[int, float] = {}
        self.generated: dict[int, float] = {}
        self.n_processed = 0
        self.n_newborn = 0
        self.n_splits = 0
        self._last_t = float("-inf")

    # -- driving ---------------------------------------------------------
    def process(self, s: int, d: int, t: float, q: float) -> None:
        raise NotImplementedError

    def run(self, pdf: pd.DataFrame, *, presorted: bool = False) -> "Engine":
        """Apply every interaction of ``pdf`` in time order.

        May be called repeatedly with consecutive micro-batches; time
        must not go backwards across calls (streaming contract).
        """
        if not presorted:
            pdf = sort_interactions(pdf)
        s_a = pdf["s"].to_numpy(np.int64)
        d_a = pdf["d"].to_numpy(np.int64)
        t_a = pdf["t"].to_numpy(np.float64)
        q_a = pdf["q"].to_numpy(np.float64)
        if len(t_a) and t_a[0] < self._last_t:
            raise ValueError(
                f"interaction batch starts at t={t_a[0]} before already "
                f"processed t={self._last_t}; TINs are replayed in time order"
            )
        process = self.process
        for s, d, t, q in zip(s_a, d_a, t_a, q_a):
            process(int(s), int(d), float(t), float(q))
        if len(t_a):
            self._last_t = float(t_a[-1])
        return self

    # -- shared buffer arithmetic ---------------------------------------
    def _settle(self, s: int, d: int, q: float, newborn: float) -> None:
        """Update |B_s|, |B_d| and generation stats for one interaction
        that relayed ``q - newborn`` units and generated ``newborn``."""
        relayed = q - newborn
        tot = self.totals
        if relayed > 0.0:
            left = tot.get(s, 0.0) - relayed
            tot[s] = left if left > EPS else 0.0
        elif s not in tot:
            tot[s] = 0.0
        tot[d] = tot.get(d, 0.0) + q
        if newborn > 0.0:
            self.generated[s] = self.generated.get(s, 0.0) + newborn
            self.n_newborn += 1
        self.n_processed += 1

    # -- inspection ------------------------------------------------------
    def buffer_total(self, v: int) -> float:
        """``|B_v|`` — total quantity currently buffered at ``v``."""
        return self.totals.get(v, 0.0)

    def provenance_rows(self) -> list[tuple]:
        """Current provenance as ``(vertex, origin, birth_t, quantity)``
        rows — the engine's answer to Definition 2 at the current time."""
        raise NotImplementedError

    def provenance_frame(self) -> pd.DataFrame:
        rows = self.provenance_rows()
        return pd.DataFrame(rows, columns=["vertex", "origin", "birth_t", "quantity"])

    def origins(self, v: int) -> dict[int, float]:
        """``O(t, B_v)`` aggregated by origin: origin → total quantity."""
        out: dict[int, float] = {}
        for vertex, origin, _bt, quan in self.provenance_rows():
            if vertex == v and origin is not None:
                out[origin] = out.get(origin, 0.0) + quan
        return out

    def entry_count(self) -> int:
        """Number of provenance entries currently held across all buffers."""
        raise NotImplementedError

    def metrics(self) -> dict[str, float]:
        return {
            "policy_" + self.policy: 1.0,
            "n_interactions": float(self.n_processed),
            "n_entries": float(self.entry_count()),
            "peak_entries": float(self.peak_entries()),
            "n_splits": float(self.n_splits),
            "n_newborn": float(self.n_newborn),
            "n_vertices": float(len(self.totals)),
            "total_buffered": float(sum(self.totals.values())),
            "total_generated": float(sum(self.generated.values())),
        }

    def peak_entries(self) -> int:
        """Peak simultaneous entry count (== final count for policies
        whose entries are never merged or dropped)."""
        return self.entry_count()


class NoProvEngine(Engine):
    """Algorithm 1 — quantity propagation without provenance tracking.

    The reference baseline (``NoProv`` in Tables 7/8): O(1) per
    interaction, 8 bytes of state per vertex.
    """

    policy = "noprov"

    def process(self, s: int, d: int, t: float, q: float) -> None:
        bs = self.totals.get(s, 0.0)
        newborn = q - bs if q > bs else 0.0
        self._settle(s, d, q, newborn)

    def provenance_rows(self) -> list[tuple]:
        return [
            (v, None, None, tot) for v, tot in sorted(self.totals.items()) if tot > EPS
        ]

    def entry_count(self) -> int:
        return 0


class HeapEngine(Engine):
    """Algorithm 2 — selection by generation time (§4.1).

    ``order='lrb'`` = least-recently-born (min-heap on birth time,
    oldest quantities leave first); ``order='mrb'`` = most-recently-born
    (max-heap). Buffers hold mutable ``[key, seq, origin, birth_t,
    quantity]`` entries; ``key`` is ``birth_t`` (lrb) or ``-birth_t``
    (mrb) and ``seq`` is a global tie-breaker making replay
    deterministic. A partial transfer splits the boundary triple
    exactly as lines 8–12 of Algorithm 2 (with the line-11 typo
    corrected: the kept triple shrinks by ``resq``, not ``r.q``).
    """

    policy_orders = ("lrb", "mrb")

    def __init__(self, order: str = "lrb") -> None:
        super().__init__()
        if order not in self.policy_orders:
            raise ValueError(f"order must be one of {self.policy_orders}, got {order!r}")
        self.order = order
        self.policy = order
        self._sign = 1.0 if order == "lrb" else -1.0
        self.heaps: dict[int, list[list]] = {}
        self._seq = 0
        self._n_entries = 0

    def _next_seq(self) -> int:
        self._seq += 1
        return self._seq

    def process(self, s: int, d: int, t: float, q: float) -> None:
        resq = q
        src = self.heaps.get(s)
        dst = self.heaps.get(d)
        if dst is None:
            dst = self.heaps[d] = []
        if src:
            while resq > EPS and src:
                top = src[0]
                if top[4] <= resq + EPS:  # transfer the entire triple
                    heapq.heappop(src)
                    heapq.heappush(dst, top)
                    resq -= top[4]
                else:  # split: part of the triple moves, the rest stays
                    top[4] -= resq
                    heapq.heappush(dst, [top[0], self._next_seq(), top[2], top[3], resq])
                    self._n_entries += 1
                    self.n_splits += 1
                    resq = 0.0
        if resq > EPS:  # newborn quantity at the source (lines 18–21)
            heapq.heappush(dst, [self._sign * t, self._next_seq(), s, t, resq])
            self._n_entries += 1
            newborn = resq
        else:
            newborn = 0.0
        self._settle(s, d, q, newborn)

    def provenance_rows(self) -> list[tuple]:
        rows = []
        for v in sorted(self.heaps):
            for _k, _seq, o, bt, quan in sorted(self.heaps[v], key=lambda e: e[1]):
                if quan > EPS:
                    rows.append((v, o, bt, quan))
        return rows

    def buffer_triples(self, v: int) -> list[tuple[int, float, float]]:
        """Buffer contents as ``(origin, birth_t, quantity)`` triples in
        selection (heap key, then seq) order — the Table 3 layout."""
        return [
            (e[2], e[3], e[4])
            for e in sorted(self.heaps.get(v, []), key=lambda e: (e[0], e[1]))
            if e[4] > EPS
        ]

    def entry_count(self) -> int:
        return self._n_entries


class QueueEngine(Engine):
    """Receipt-order selection (§4.2): FIFO queue or LIFO stack of
    ``(origin, quantity)`` pairs per vertex.

    With ``track_paths=True`` every element additionally carries the
    tuple of transmitter vertices it was relayed through (§6
    how-provenance). A newborn element's path is empty — its origin is
    stored separately and the birth hop is not a relay — which matches
    Table 10's sub-1 average path lengths. Split elements inherit the
    parent path; every relayed element gets the transmitting vertex
    appended.

    LIFO block order: Table 4 shows multi-element transfers landing on
    the destination stack preserving the moved block's internal order
    (the top-block is lifted as a block, not flipped), with newborn
    quantity on top; we reproduce that exactly.
    """

    policy_orders = ("fifo", "lifo")

    def __init__(self, order: str = "fifo", *, track_paths: bool = False) -> None:
        super().__init__()
        if order not in self.policy_orders:
            raise ValueError(f"order must be one of {self.policy_orders}, got {order!r}")
        self.order = order
        self.policy = order
        self.track_paths = track_paths
        self.queues: dict[int, deque] = {}
        self._n_entries = 0
        self.path_elems = 0  # total vertices stored across all paths

    def _queue(self, v: int) -> deque:
        dq = self.queues.get(v)
        if dq is None:
            dq = self.queues[v] = deque()
        return dq

    def process(self, s: int, d: int, t: float, q: float) -> None:
        resq = q
        src = self.queues.get(s)
        dst = self._queue(d)
        fifo = self.order == "fifo"
        paths = self.track_paths
        if src:
            moved: list[list] = []
            while resq > EPS and src:
                top = src[0] if fifo else src[-1]
                if top[1] <= resq + EPS:  # move whole element
                    (src.popleft() if fifo else src.pop())
                    resq -= top[1]
                    if paths:
                        top[2] = top[2] + (s,)  # relay: extend path
                        self.path_elems += 1
                    moved.append(top)
                else:  # split the boundary element
                    top[1] -= resq
                    if paths:
                        piece = [top[0], resq, top[2] + (s,)]
                        self.path_elems += len(piece[2])
                    else:
                        piece = [top[0], resq]
                    moved.append(piece)
                    self._n_entries += 1
                    self.n_splits += 1
                    resq = 0.0
            if fifo:
                dst.extend(moved)  # arrival order = departure order
            else:
                dst.extend(reversed(moved))  # block keeps its stack order
        if resq > EPS:
            dst.append([s, resq, ()] if paths else [s, resq])
            self._n_entries += 1
            newborn = resq
        else:
            newborn = 0.0
        self._settle(s, d, q, newborn)

    def provenance_rows(self) -> list[tuple]:
        rows = []
        for v in sorted(self.queues):
            for e in self.queues[v]:
                if e[1] > EPS:
                    rows.append((v, e[0], None, e[1]))
        return rows

    def buffer_pairs(self, v: int) -> list[tuple[int, float]]:
        """Buffer contents as ``(origin, quantity)`` pairs in insertion
        order (front → back / bottom → top) — the Table 4 layout."""
        return [(e[0], e[1]) for e in self.queues.get(v, ()) if e[1] > EPS]

    def buffer_paths(self, v: int) -> list[tuple[int, float, tuple]]:
        """``(origin, quantity, relay_path)`` per element (requires
        ``track_paths=True``)."""
        if not self.track_paths:
            raise ValueError("engine was built with track_paths=False")
        return [(e[0], e[1], e[2]) for e in self.queues.get(v, ()) if e[1] > EPS]

    def entry_count(self) -> int:
        return self._n_entries

    def metrics(self) -> dict[str, float]:
        m = super().metrics()
        if self.track_paths:
            m["path_elems"] = float(self.path_elems)
            live = [e for dq in self.queues.values() for e in dq if e[1] > EPS]
            m["avg_path_len"] = (
                float(np.mean([len(e[2]) for e in live])) if live else 0.0
            )
        return m


def touched_vertices(pdf: pd.DataFrame) -> list[int]:
    """Sorted distinct vertex ids appearing as source or destination."""
    return sorted(
        set(pdf["s"].astype(np.int64).tolist()) | set(pdf["d"].astype(np.int64).tolist())
    )


def iter_batches(pdf: pd.DataFrame, batch_size: int) -> Iterable[pd.DataFrame]:
    """Split a time-sorted frame into consecutive micro-batches."""
    pdf = sort_interactions(pdf)
    for lo in range(0, len(pdf), batch_size):
        yield pdf.iloc[lo : lo + batch_size]
