"""Distributed provenance tracking: per-component kernels under Spark.

Provenance propagation is sequential within a weakly connected
component and independent across components (quantities are relayed,
never copied — see ``repro.graph.components``). The distributed runner
therefore:

1. labels vertices with their component (iterative hash-min message
   passing over DataFrames),
2. tags each interaction with its component id (a Catalyst join),
3. runs the sequential policy kernel per component in parallel via
   ``groupBy(component).applyInPandas`` — Spark's vertex-program
   execution layer in this design,
4. returns the union of all components' provenance as one DataFrame in
   the canonical ``(vertex, origin, birth_t, quantity)`` schema.

``tests/test_distributed.py`` proves the result equals a single-process
sequential replay, row for row.
"""
from __future__ import annotations

from typing import Any

import pandas as pd
from pyspark.sql import DataFrame

from repro.core.api import make_engine
from repro.core.engine import Engine, touched_vertices
from repro.core.model import METRICS_SCHEMA, PROVENANCE_SCHEMA
from repro.graph.components import components_of_interactions, tag_interactions


def rows_to_pandas(rows: list[tuple]) -> pd.DataFrame:
    """Engine provenance rows → pandas frame with Arrow-friendly dtypes
    (nullable Int64 origin, float64 birth_t with NaN for null)."""
    if rows:
        v, o, bt, q = zip(*rows)
    else:
        v = o = bt = q = ()
    return pd.DataFrame(
        {
            "vertex": pd.Series(v, dtype="int64"),
            "origin": pd.Series(o, dtype="Int64"),
            "birth_t": pd.Series(bt, dtype="float64"),
            "quantity": pd.Series(q, dtype="float64"),
        }
    )


def provenance_to_spark(engine: Engine, spark) -> DataFrame:
    """Lift a finished engine's provenance state to a Spark DataFrame."""
    return spark.createDataFrame(
        rows_to_pandas(engine.provenance_rows()), schema=PROVENANCE_SCHEMA
    )


def _run_component(policy: str, opts: dict[str, Any], pdf: pd.DataFrame) -> Engine:
    pdf = pdf.sort_values("t", kind="stable", ignore_index=True)
    o = dict(opts)
    if policy == "prop_dense" and "vertices" not in o:
        # The dense vector universe of a component is its own vertex set.
        o["vertices"] = touched_vertices(pdf)
    return make_engine(policy, **o).run(pdf, presorted=True)


def _provenance_kernel(policy: str, opts: dict[str, Any]):
    """applyInPandas kernel factory (a closure, because Spark's UDF
    validator requires a plain ``(key, data)`` signature — class
    instances with ``__call__`` are rejected): replay one component's
    interactions and emit its provenance rows."""

    def kernel(key: tuple, pdf: pd.DataFrame) -> pd.DataFrame:
        engine = _run_component(policy, opts, pdf)
        return rows_to_pandas(engine.provenance_rows())

    return kernel


def _metrics_kernel(policy: str, opts: dict[str, Any]):
    """Kernel factory emitting per-component engine metrics in the long
    ``(component, metric, value)`` layout."""

    def kernel(key: tuple, pdf: pd.DataFrame) -> pd.DataFrame:
        engine = _run_component(policy, opts, pdf)
        comp = int(key[0])
        items = sorted(engine.metrics().items())
        return pd.DataFrame(
            {
                "component": pd.Series([comp] * len(items), dtype="int64"),
                "metric": [k for k, _ in items],
                "value": pd.Series([v for _, v in items], dtype="float64"),
            }
        )

    return kernel


def _tagged(interactions: DataFrame, components: DataFrame | None) -> DataFrame:
    if components is None:
        components = components_of_interactions(interactions)
    return tag_interactions(interactions, components)


def run_distributed(
    interactions: DataFrame,
    policy: str,
    *,
    components: DataFrame | None = None,
    **opts: Any,
) -> DataFrame:
    """Provenance of the whole TIN, computed per-component in parallel.

    ``components`` may be precomputed (and reused across policies);
    otherwise it is derived from the interactions. Engine options in
    ``opts`` must be picklable (use e.g. ``ModuloGroups`` instead of a
    lambda for grouped provenance).
    """
    tagged = _tagged(interactions, components)
    return tagged.groupBy("component").applyInPandas(
        _provenance_kernel(policy, opts), schema=PROVENANCE_SCHEMA
    )


def run_distributed_metrics(
    interactions: DataFrame,
    policy: str,
    *,
    components: DataFrame | None = None,
    **opts: Any,
) -> DataFrame:
    """Per-component engine metrics (entry counts, peaks, generation
    totals, …) as a long-format DataFrame — the distributed source for
    the Table 7/8 measurements."""
    tagged = _tagged(interactions, components)
    return tagged.groupBy("component").applyInPandas(
        _metrics_kernel(policy, opts), schema=METRICS_SCHEMA
    )


def generated_per_vertex(
    interactions: DataFrame, *, components: DataFrame | None = None
) -> DataFrame:
    """Total quantity generated by every vertex ``(vertex, generated_q)``,
    from a distributed NoProv pass — the input to §5.1's top-k tracked
    vertex selection."""
    tagged = _tagged(interactions, components)

    def kernel(key: tuple, pdf: pd.DataFrame) -> pd.DataFrame:
        engine = _run_component("noprov", {}, pdf)
        items = sorted(engine.generated.items())
        return pd.DataFrame(
            {
                "vertex": pd.Series([v for v, _ in items], dtype="int64"),
                "generated_q": pd.Series([g for _, g in items], dtype="float64"),
            }
        )

    return tagged.groupBy("component").applyInPandas(
        kernel, schema="vertex long, generated_q double"
    )
