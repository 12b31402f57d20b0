"""Engine factory and policy registry tests."""
import pytest

from repro.core.api import make_engine, run_policy
from repro.core.engine import HeapEngine, NoProvEngine, QueueEngine
from repro.core.model import POLICIES
from repro.core.proportional import DenseProportionalEngine, SparseProportionalEngine
from repro.scale.budget import BudgetEngine
from repro.scale.grouped import GroupedEngine, ModuloGroups
from repro.scale.selective import SelectiveEngine
from repro.scale.windowed import WindowedEngine
from repro.tin.datasets import random_tin

EXPECTED_TYPES = {
    "noprov": NoProvEngine,
    "lrb": HeapEngine,
    "mrb": HeapEngine,
    "fifo": QueueEngine,
    "lifo": QueueEngine,
    "prop_dense": DenseProportionalEngine,
    "prop_sparse": SparseProportionalEngine,
    "selective": SelectiveEngine,
    "grouped": GroupedEngine,
    "windowed": WindowedEngine,
    "budget": BudgetEngine,
}

OPTS = {
    "prop_dense": {"vertices": [1, 2, 3]},
    "selective": {"tracked": [1]},
    "grouped": {"m": 2, "group_of": ModuloGroups(2)},
    "windowed": {"window": 5},
    "budget": {"capacity": 4},
}


@pytest.mark.parametrize("policy", POLICIES)
def test_factory_builds_every_registered_policy(policy):
    eng = make_engine(policy, **OPTS.get(policy, {}))
    assert isinstance(eng, EXPECTED_TYPES[policy])
    assert eng.policy == policy


def test_factory_rejects_unknown_policy():
    with pytest.raises(ValueError, match="unknown policy"):
        make_engine("nope")


def test_registry_and_factory_agree():
    assert set(EXPECTED_TYPES) == set(POLICIES)


def test_run_policy_infers_dense_vertex_universe():
    pdf = random_tin(n_nodes=9, n_interactions=50, seed=91)
    eng = run_policy(pdf, "prop_dense")
    assert set(eng.ids) == set(pdf["s"]) | set(pdf["d"])


def test_run_policy_sorts_unsorted_input():
    pdf = random_tin(n_nodes=9, n_interactions=60, seed=92)
    shuffled = pdf.sample(frac=1.0, random_state=0)
    a = run_policy(pdf, "fifo")
    b = run_policy(shuffled, "fifo")
    assert a.provenance_rows() == b.provenance_rows()


@pytest.mark.parametrize("policy", ["lrb", "fifo", "prop_sparse"])
def test_run_policy_is_deterministic(policy):
    pdf = random_tin(n_nodes=9, n_interactions=80, seed=93)
    assert (
        run_policy(pdf, policy).provenance_rows()
        == run_policy(pdf, policy).provenance_rows()
    )
