"""Smoke tests for the spark-submit job wrappers.

The experiment logic itself is tested in test_experiments.py; here we
verify each wrapper imports, exposes ``main``, and documents usage.
(The wrappers are not executed: their ``main`` stops the SparkSession,
which tests share.)
"""
import importlib.util
import pathlib

import pytest

JOBS_DIR = pathlib.Path(__file__).resolve().parent.parent / "jobs"
JOB_FILES = sorted(p.name for p in JOBS_DIR.glob("*.py"))

EXPECTED_JOBS = [
    "figure1_cd_example.py",
    "figure2_iterations.py",
    "figure3_real_world.py",
    "figure4_histogram.py",
    "figure5_mc_grid.py",
    "figure6_convergence.py",
    "table1_exact_runtimes.py",
]


def _load(name: str):
    spec = importlib.util.spec_from_file_location(name.removesuffix(".py"), JOBS_DIR / name)
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


def test_one_job_per_artifact():
    assert JOB_FILES == EXPECTED_JOBS


@pytest.mark.parametrize("name", EXPECTED_JOBS)
def test_job_has_main_and_doc(name):
    mod = _load(name)
    assert callable(mod.main)
    assert mod.__doc__ and "entry point" in mod.__doc__.lower()


def test_figure2_job_runs_standalone(capsys):
    # figure2 needs no SparkSession; safe to execute end to end.
    mod = _load("figure2_iterations.py")
    mod.main()
    out = capsys.readouterr().out
    assert "conf_0.999" in out
