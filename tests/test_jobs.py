"""Sanity tests for the spark-submit job entrypoints (they must at least
parse and wire up the right harness; full runs happen via spark-submit)."""
import ast
import pathlib

import pytest

JOBS = pathlib.Path(__file__).resolve().parent.parent / "jobs"


@pytest.mark.parametrize("n", [2, 3, 4, 5, 6, 7, 8, 9])
def test_table_job_references_its_harness(n):
    src = (JOBS / f"table{n}.py").read_text()
    tree = ast.parse(src)  # valid python
    assert f"table{n}" in src
    assert "run_table" in src


def test_fig9_job_parses():
    ast.parse((JOBS / "fig9.py").read_text())


def test_distributed_build_job_parses():
    src = (JOBS / "distributed_build.py").read_text()
    ast.parse(src)
    assert "assign_partitions" in src
    assert "build_summary_spark" in src
    assert "strq_spark" in src


def test_runner_parses():
    ast.parse((JOBS / "_runner.py").read_text())


def test_all_jobs_have_docstrings():
    for p in JOBS.glob("*.py"):
        mod = ast.parse(p.read_text())
        assert ast.get_docstring(mod), f"{p.name} missing module docstring"
