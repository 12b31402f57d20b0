"""Synthetic temporal interaction networks (TINs) for the reproduction.

The paper evaluates on five real TINs (Table 6):

=============  ========  ==============  ===========
dataset        #nodes    #interactions   average r.q
=============  ========  ==============  ===========
Bitcoin        12M       45.5M           34.4 BTC
CTU            608K      2.8M            19.2 KB
Prosper Loans  100K      3.08M           $76
Flights        629       5.7M            125
Taxis          255       231K            1.53
=============  ========  ==============  ===========

None of these is downloadable offline, so each is replaced by a seeded
synthetic generator with the same *shape*: node and interaction counts
scaled by a scale factor ``sf``, Zipf-skewed endpoint selection (real
transaction/traffic graphs are heavy-tailed), monotone timestamps, and
a per-dataset quantity distribution whose mean matches the published
average ``r.q``. The algorithms' cost drivers — |V|, |R|, density
|R|/|V| and endpoint skew — are what Tables 7–10 exercise, and all are
preserved under this substitution (see DESIGN.md §3).

Every generator returns a pandas DataFrame with columns
``s`` (int64 source), ``d`` (int64 destination), ``t`` (float64
timestamp, strictly increasing), ``q`` (float64 quantity > 0) sorted by
``t``. ``to_spark`` lifts it to a Spark DataFrame with the canonical
schema.
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

#: Canonical Spark schema of an interaction stream.
INTERACTION_SCHEMA = T.StructType(
    [
        T.StructField("s", T.LongType(), False),
        T.StructField("d", T.LongType(), False),
        T.StructField("t", T.DoubleType(), False),
        T.StructField("q", T.DoubleType(), False),
    ]
)

#: Paper-scale (sf=1.0) node / interaction counts per dataset (Table 6).
PAPER_SCALE = {
    "bitcoin": (12_000_000, 45_500_000),
    "ctu": (608_000, 2_800_000),
    "prosper": (100_000, 3_080_000),
    "flights": (629, 5_700_000),
    "taxis": (255, 231_000),
}

#: Published average interaction quantity per dataset (Table 6).
PAPER_AVG_Q = {
    "bitcoin": 34.4,
    "ctu": 19_200.0,  # bytes (19.2 KB)
    "prosper": 76.0,
    "flights": 125.0,
    "taxis": 1.53,
}

#: Datasets whose vertex set is a fixed small hub set (airports / taxi
#: zones) — node count does not scale with sf.
_FIXED_NODE_SETS = {"flights", "taxis"}

DATASETS = tuple(PAPER_SCALE)


@dataclass(frozen=True)
class TinSpec:
    """Resolved size of a synthetic TIN at a given scale factor."""

    name: str
    n_nodes: int
    n_interactions: int
    avg_q: float

    @property
    def density(self) -> float:
        """Interactions per node — drives buffer sizes and path lengths."""
        return self.n_interactions / self.n_nodes


def spec(name: str, *, sf: float) -> TinSpec:
    """Resolve dataset ``name`` at scale factor ``sf`` (1.0 = paper scale)."""
    if name not in PAPER_SCALE:
        raise ValueError(f"unknown dataset {name!r}; expected one of {DATASETS}")
    nodes, inters = PAPER_SCALE[name]
    if name not in _FIXED_NODE_SETS:
        nodes = max(8, int(nodes * sf))
    return TinSpec(
        name=name,
        n_nodes=nodes,
        n_interactions=max(8, int(inters * sf)),
        avg_q=PAPER_AVG_Q[name],
    )


def _zipf_endpoints(
    g: np.random.Generator,
    n: int,
    n_nodes: int,
    alpha: float,
    *,
    separate_roles: bool = False,
) -> tuple[np.ndarray, np.ndarray]:
    """Draw (source, destination) pairs with Zipf-skewed marginals and no
    self-loops. Collisions are re-drawn by shifting d one slot (cheap,
    preserves the marginal shape).

    ``separate_roles=True`` uses *different* rank→vertex permutations
    for sources and destinations, so the heavy senders are mostly not
    the heavy receivers — the structure of lender→borrower (Prosper)
    and scanner→victim (CTU) networks, where received quantities are
    rarely relayed onward (the paper's sub-1 average path lengths in
    Table 10). Hub networks (Flights, Taxis, Bitcoin) share one
    permutation: hubs both receive and resend, producing long relay
    chains."""
    ranks = np.arange(1, n_nodes + 1, dtype=np.float64)
    w = ranks**-alpha
    w /= w.sum()
    # Random rank→vertex permutation so hubs are not always ids 0..k.
    perm_s = g.permutation(n_nodes)
    perm_d = g.permutation(n_nodes) if separate_roles else perm_s
    s = perm_s[g.choice(n_nodes, size=n, p=w)]
    d = perm_d[g.choice(n_nodes, size=n, p=w)]
    clash = s == d
    d[clash] = (d[clash] + 1) % n_nodes
    return s.astype(np.int64), d.astype(np.int64)


def _timestamps(g: np.random.Generator, n: int, horizon: float) -> np.ndarray:
    """Strictly increasing float timestamps over ``[0, horizon]``."""
    t = np.sort(g.random(n) * horizon)
    # Break exact ties deterministically so interaction order is total.
    return t + np.arange(n) * 1e-9


def _lognormal_mean(g: np.random.Generator, n: int, mean: float, sigma: float) -> np.ndarray:
    """Lognormal sample with the requested arithmetic mean (heavy tail,
    like BTC amounts / flow bytes / loan sizes)."""
    mu = np.log(mean) - sigma * sigma / 2.0
    return g.lognormal(mu, sigma, n)


def generate(name: str, *, sf: float, seed: int = 7) -> pd.DataFrame:
    """Generate the synthetic analogue of ``name`` at scale factor ``sf``.

    Deterministic in ``(name, sf, seed)``. See module docstring for the
    schema and DESIGN.md §3 for the substitution rationale.
    """
    sp = spec(name, sf=sf)
    g = np.random.default_rng((seed, zlib.crc32(name.encode())))
    n, v = sp.n_interactions, sp.n_nodes
    if name == "bitcoin":
        # Large sparse transaction graph, heavy-tailed amounts and hubs
        # (exchanges). Min flow 0.0001 BTC per the paper's preprocessing.
        s, d = _zipf_endpoints(g, n, v, alpha=1.4)
        q = np.maximum(1e-4, _lognormal_mean(g, n, sp.avg_q, sigma=2.0))
    elif name == "ctu":
        # Botnet traffic: few talkers dominate, byte counts heavy-tailed;
        # scanners and victims are largely disjoint roles (short paths).
        s, d = _zipf_endpoints(g, n, v, alpha=1.2, separate_roles=True)
        q = np.maximum(1.0, _lognormal_mean(g, n, sp.avg_q, sigma=1.5))
    elif name == "prosper":
        # Loans between users: milder skew, moderate amounts; lenders and
        # borrowers are largely disjoint roles (loans are rarely re-lent).
        s, d = _zipf_endpoints(g, n, v, alpha=1.1, separate_roles=True)
        q = np.maximum(1.0, _lognormal_mean(g, n, sp.avg_q, sigma=1.0))
    elif name == "flights":
        # 629 airports, dense traffic; passengers uniform in [50, 200]
        # exactly as the paper synthesised them.
        s, d = _zipf_endpoints(g, n, v, alpha=0.9)
        q = g.integers(50, 201, n).astype(np.float64)
    elif name == "taxis":
        # 255 zones; 1–6 passengers per trip, mean ≈ 1.53.
        s, d = _zipf_endpoints(g, n, v, alpha=0.7)
        q = 1.0 + np.minimum(5, g.poisson(0.53, n)).astype(np.float64)
    else:  # pragma: no cover - guarded by spec()
        raise ValueError(name)
    return pd.DataFrame(
        {"s": s, "d": d, "t": _timestamps(g, n, horizon=float(n)), "q": q}
    )


def running_example() -> pd.DataFrame:
    """The paper's running example (Figure 3): 3 vertices, 6 interactions.

    Tables 2–5 show the exact buffer states produced by each policy on
    this input; `tests/test_running_example.py` asserts them.
    """
    rows = [
        (1, 2, 1.0, 3.0),
        (2, 0, 3.0, 5.0),
        (0, 1, 4.0, 3.0),
        (1, 2, 5.0, 7.0),
        (2, 1, 7.0, 2.0),
        (2, 0, 8.0, 1.0),
    ]
    return pd.DataFrame(rows, columns=["s", "d", "t", "q"]).astype(
        {"s": np.int64, "d": np.int64, "t": np.float64, "q": np.float64}
    )


def random_tin(
    *,
    n_nodes: int,
    n_interactions: int,
    seed: int = 0,
    alpha: float = 1.0,
    max_q: float = 10.0,
    n_components: int = 1,
) -> pd.DataFrame:
    """Small random TIN for tests and property checks.

    ``n_components`` > 1 partitions the vertex set into that many
    disjoint blocks with no cross-block interactions — used to test the
    distributed per-component runner against the sequential engine.
    """
    g = np.random.default_rng(seed)
    n, v = n_interactions, n_nodes
    block = g.integers(0, n_components, n)
    per_block = max(2, v // n_components)
    s, d = _zipf_endpoints(g, n, per_block, alpha)
    base = block * per_block
    q = np.round(g.random(n) * max_q, 3) + 0.001
    return pd.DataFrame(
        {"s": base + s, "d": base + d, "t": _timestamps(g, n, float(n)), "q": q}
    )


def to_spark(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Lift a pandas interaction frame to Spark with the canonical schema."""
    return spark.createDataFrame(pdf[["s", "d", "t", "q"]], schema=INTERACTION_SCHEMA)
