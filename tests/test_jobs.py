"""Jobs are thin spark-submit wrappers; verify they compile and wire the
right harnesses. They are not *executed* here because ``job_main`` owns
(and stops) a SparkSession, which would tear down the shared fixture —
the sweeps themselves are exercised in test_experiments.py."""
import ast
import pathlib

import pytest

JOBS = sorted(pathlib.Path(__file__).resolve().parents[1].glob("jobs/*.py"))


def test_jobs_exist():
    names = {p.name for p in JOBS}
    for t in range(1, 10):
        assert any(n.startswith(f"t{t}_") for n in names), f"missing job for T{t}"
    assert "run_all.py" in names


@pytest.mark.parametrize("path", JOBS, ids=[p.name for p in JOBS])
def test_job_compiles(path):
    tree = ast.parse(path.read_text())
    if path.name.startswith(("t", "run_all")):
        funcs = {n.name for n in ast.walk(tree) if isinstance(n, ast.FunctionDef)}
        assert "main" in funcs


@pytest.mark.parametrize("path", [p for p in JOBS if p.name.startswith("t")],
                         ids=[p.name for p in JOBS if p.name.startswith("t")])
def test_job_references_experiment_harness(path):
    src = path.read_text()
    assert "repro.experiments" in src
