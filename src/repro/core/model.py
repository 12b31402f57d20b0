"""Shared model types and constants for the provenance engines.

The canonical provenance output row is ``(vertex, origin, birth_t,
quantity)``: ``quantity`` units currently buffered at ``vertex`` were
generated at ``origin`` (at time ``birth_t`` for the generation-time
policies; ``birth_t`` is null for order/proportional policies, and
``origin`` is null for NoProv, which tracks no provenance at all).

``ALPHA`` is the artificial origin vertex α of §5.3 — "unknown
provenance" mass produced by window resets and budget shrinks.
"""
from __future__ import annotations

from pyspark.sql import types as T

#: Artificial origin vertex α ("all vertices / unknown source", §5.3).
ALPHA: int = -1

#: Numeric slack for quantity comparisons: quantities are float64 and
#: proportional splits accumulate rounding error.
EPS: float = 1e-9

#: Spark schema of the provenance output of every engine.
PROVENANCE_SCHEMA = T.StructType(
    [
        T.StructField("vertex", T.LongType(), False),
        T.StructField("origin", T.LongType(), True),
        T.StructField("birth_t", T.DoubleType(), True),
        T.StructField("quantity", T.DoubleType(), False),
    ]
)

#: Spark schema for per-component engine metrics (long/narrow layout so
#: one schema serves every policy).
METRICS_SCHEMA = T.StructType(
    [
        T.StructField("component", T.LongType(), False),
        T.StructField("metric", T.StringType(), False),
        T.StructField("value", T.DoubleType(), False),
    ]
)

#: All selection-policy names accepted by :func:`repro.core.api.make_engine`.
POLICIES = (
    "noprov",
    "lrb",
    "mrb",
    "fifo",
    "lifo",
    "prop_dense",
    "prop_sparse",
    "selective",
    "grouped",
    "windowed",
    "budget",
)
