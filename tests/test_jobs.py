"""Smoke tests for the jobs/ entrypoints.

The jobs are thin wrappers over the fully-tested harness, so these
tests only verify each script parses, imports, and exposes a ``main``
— executing them spins up a second SparkSession / a full benchmark
replay, which belongs to the benchmark run, not the unit suite.
"""
import importlib.util
import pathlib

import pytest

JOBS_DIR = pathlib.Path(__file__).resolve().parent.parent / "jobs"
JOB_FILES = sorted(JOBS_DIR.glob("*.py"))


def _load(path: pathlib.Path):
    spec = importlib.util.spec_from_file_location(f"job_{path.stem}", path)
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


def test_every_table_has_a_job():
    names = {p.stem for p in JOB_FILES}
    for expected in (
        "table2_5_running_example",
        "table6_datasets",
        "table7_runtime",
        "table8_memory",
        "table9_budget",
        "table10_paths",
        "distributed_provenance",
    ):
        assert expected in names, f"missing jobs/{expected}.py"


@pytest.mark.parametrize("path", JOB_FILES, ids=[p.stem for p in JOB_FILES])
def test_job_imports_and_has_main(path):
    mod = _load(path)
    assert callable(getattr(mod, "main", None)), f"{path.name} lacks main()"
