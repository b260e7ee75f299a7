"""Smoke checks for the spark-submit job entrypoints.

Job mains own their SparkSession lifecycle (they call ``stop()``), so
we do not execute them inside the shared-session test suite; instead we
verify each compiles and wires the expected harness function. The jobs
themselves are exercised end-to-end by the benchmark suite and by the
recorded runs in EXPERIMENTS.md.
"""
import ast
import pathlib
import py_compile

import pytest

JOBS = sorted(
    p
    for p in (pathlib.Path(__file__).parent.parent / "jobs").glob("*.py")
    if not p.name.startswith("_")
)


def test_expected_jobs_exist():
    names = {p.stem for p in JOBS}
    assert names == {
        "table1_nodes", "table2_edges", "table3_concepts", "table4_events",
        "table5_concept_mining", "table6_event_mining", "table7_key_elements",
        "table8_ctr",
    }


@pytest.mark.parametrize("job", JOBS, ids=lambda p: p.stem)
def test_job_compiles(job):
    py_compile.compile(str(job), doraise=True)


@pytest.mark.parametrize("job", JOBS, ids=lambda p: p.stem)
def test_job_has_main_guard(job):
    tree = ast.parse(job.read_text())
    has_main = any(
        isinstance(n, ast.FunctionDef) and n.name == "main" for n in ast.walk(tree)
    )
    assert has_main
    assert "__main__" in job.read_text()


@pytest.mark.parametrize("job", JOBS, ids=lambda p: p.stem)
def test_job_documents_paper_numbers(job):
    """Every table job's docstring records the paper's numbers or the
    qualitative rows it reproduces."""
    tree = ast.parse(job.read_text())
    doc = ast.get_docstring(tree) or ""
    assert "paper" in doc.lower() or "reproduc" in doc.lower()
