"""Tests for the §7.6 provenance-alerting use case."""
import pandas as pd
import pytest

from repro.bench.usecase import smurfing_alerts
from repro.tin.datasets import generate


def frame(rows):
    return pd.DataFrame(rows, columns=["s", "d", "t", "q"])


def test_alert_fires_for_relayed_only_quantity():
    """1 births at 2, 2 relays everything to 3: 3's buffer originates
    from 1, which is NOT 3's direct in-neighbour (only 2 is) → alert."""
    rows = [(1, 2, 1.0, 100.0), (2, 3, 2.0, 100.0)]
    alerts = smurfing_alerts(frame(rows), threshold=50.0)
    assert len(alerts) == 1
    a = alerts[0]
    assert (a.step, a.vertex, a.buffered) == (2, 3, 100.0)
    assert a.n_contributors == 1 and a.few


def test_no_alert_when_neighbor_contributes():
    """Direct newborn from the sender: origin == in-neighbour → silent."""
    alerts = smurfing_alerts(frame([(1, 2, 1.0, 100.0)]), threshold=50.0)
    assert alerts == []


def test_no_alert_below_threshold():
    rows = [(1, 2, 1.0, 10.0), (2, 3, 2.0, 10.0)]
    assert smurfing_alerts(frame(rows), threshold=50.0) == []


def test_many_contributors_not_flagged_few():
    rows = [(i, 10 + i, float(i), 20.0) for i in range(6)]  # 6 births
    rows += [(10 + i, 99, 10.0 + i, 20.0) for i in range(6)]  # all relayed to 99
    alerts = smurfing_alerts(frame(rows), threshold=90.0, few_contributors=5)
    assert alerts, "expected an alert for vertex 99"
    assert alerts[-1].vertex == 99
    assert alerts[-1].n_contributors == 6
    assert not alerts[-1].few


def test_bitcoin_lite_alert_scan_runs():
    """Smoke the full use case on the synthetic Bitcoin network (the
    paper scans the first 100K interactions; we scan the test-scale
    stream) — alerts must be well-formed and ordered by step."""
    pdf = generate("bitcoin", sf=2e-4, seed=7)
    alerts = smurfing_alerts(pdf, threshold=float(pdf["q"].quantile(0.99)))
    steps = [a.step for a in alerts]
    assert steps == sorted(steps)
    for a in alerts:
        assert a.buffered > 0 and a.n_contributors >= 1
