"""Smoke tests for the driver-only job entrypoints (the Spark-session
jobs are exercised through the benchmark harness instead, because a job
main() owns — and stops — its session)."""
import importlib.util
import pathlib

import pytest

JOBS = pathlib.Path(__file__).resolve().parent.parent / "jobs"


def load_job(name):
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


def test_rounds_study_runs(capsys):
    mod = load_job("rounds_study")
    assert mod.main(["--scale", "0.02"]) == 0
    out = capsys.readouterr().out
    assert "LAT-SQR'" in out and "avg y/x" in out


def test_tau_sweep_runs(capsys):
    mod = load_job("tau_sweep")
    assert mod.main(["--scale", "0.02", "--graphs", "LAT-SQR'"]) == 0
    out = capsys.readouterr().out
    assert "tau=512" in out


@pytest.mark.parametrize("name", ["table2_scc", "table3_cc", "table3_lelists"])
def test_spark_jobs_importable(name):
    mod = load_job(name)
    assert callable(mod.main)
