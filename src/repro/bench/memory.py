"""Analytic memory model for Table 8/9/10-style measurements.

The paper reports peak RSS of a C implementation. Python object
overhead would swamp those numbers, so we reproduce the *methodology*:
count live provenance entries in-kernel and convert to bytes with the C
struct sizes the paper's own figures obey:

* NoProv: one 8-byte double per vertex — Table 8's NoProv column is
  exactly 8·|V| for all three large datasets (96MB/12M, 4.85MB/608K,
  800KB/100K).
* generation-time triple (origin, birth_t, quantity): 24 bytes; the
  receipt-order pair (origin, quantity): 16 bytes — the paper notes
  the 3-value vs 2-value difference is why LIFO/FIFO use less memory.
* dense proportional: 8·|V|² — Table 8 shows exactly 3.16MB for
  Flights (629²·8) and 0.52MB for Taxis (255²·8).
* sparse proportional entry (origin, quantity) list cell: 16 bytes.
* stored path element (one vertex id): 8 bytes.

These constants are asserted against the published table in
``tests/test_memory_model.py``.
"""
from __future__ import annotations

BYTES_PER_VERTEX_TOTAL = 8  # |B_v| double — the NoProv baseline state
BYTES_TRIPLE = 24  # (origin, birth_t, quantity) heap entry
BYTES_PAIR = 16  # (origin, quantity) queue/stack entry
BYTES_SPARSE_ENTRY = 16  # (origin, quantity) sparse-list cell
BYTES_DENSE_CELL = 8  # one float64 vector position
BYTES_PATH_ELEM = 8  # one vertex id in a stored path

#: The paper reports decimal units (Table 8's NoProv column is exactly
#: 8·|V| only in decimal MB: 12M vertices → 96MB), so we follow suit.
KB = 1e3
MB = 1e6
GB = 1e9


def noprov_bytes(n_vertices: int) -> int:
    """Algorithm 1 state: one buffered-total double per vertex."""
    return BYTES_PER_VERTEX_TOTAL * n_vertices


def policy_bytes(
    policy: str,
    *,
    n_vertices: int,
    entries: int = 0,
    k: int | None = None,
    path_elems: int = 0,
) -> int:
    """Estimated peak bytes for a policy run.

    ``entries`` is the peak live provenance-entry count reported by the
    engine; ``k`` is the tracked-vertex / group count for
    selective/grouped; ``path_elems`` the total stored path elements.
    """
    base = noprov_bytes(n_vertices)
    if policy == "noprov":
        return base
    if policy in ("lrb", "mrb"):
        return base + BYTES_TRIPLE * entries
    if policy in ("fifo", "lifo"):
        return base + BYTES_PAIR * entries + BYTES_PATH_ELEM * path_elems
    if policy == "prop_dense":
        return base + BYTES_DENSE_CELL * n_vertices * n_vertices
    if policy in ("prop_sparse", "windowed", "budget"):
        return base + BYTES_SPARSE_ENTRY * entries
    if policy in ("selective", "grouped"):
        if k is None:
            raise ValueError(f"{policy} memory needs k")
        return base + BYTES_DENSE_CELL * (k + 1) * n_vertices
    raise ValueError(f"unknown policy {policy!r}")


def fmt_bytes(n: float) -> str:
    """Human format matching the paper's table units (decimal KB/MB/GB)."""
    if n >= GB:
        return f"{n / GB:.2f}GB"
    if n >= MB:
        return f"{n / MB:.2f}MB"
    return f"{n / KB:.2f}KB"
