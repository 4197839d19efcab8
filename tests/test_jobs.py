"""Smoke tests for the spark-submit job entrypoints (jobs/)."""
import importlib.util
import sys
from pathlib import Path

import pytest

import repro.core.tables as T

from .test_tables import MINI2, MINI5

JOBS_DIR = Path(__file__).resolve().parents[1] / "jobs"


def _load_job(name):
    spec = importlib.util.spec_from_file_location(name, JOBS_DIR / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    sys.modules[name] = mod
    spec.loader.exec_module(mod)
    return mod


@pytest.fixture(autouse=True)
def mini_registry(monkeypatch):
    monkeypatch.setattr(T, "TABLE2", MINI2)
    monkeypatch.setattr(T, "TABLE5", MINI5)
    monkeypatch.setattr(T, "_SYSTEMS", {})
    yield


@pytest.mark.parametrize(
    "job,args",
    [
        ("table2_datasets", []),
        ("table5_synth_stats", []),
        ("table3_engines", ["--datasets", "mini_social"]),
        ("table4_loading", ["--datasets", "mini_web"]),
        ("table6_synth", ["--datasets", "mini_dense"]),
        ("table7_first_order", ["--datasets", "mini_social"]),
        ("table8_scheduling", ["--datasets", "mini_social"]),
        ("e2e_performance", ["--datasets", "mini_social"]),
    ],
)
def test_job_main_runs(spark, capsys, tmp_path, job, args):
    mod = _load_job(job)
    out = tmp_path / f"{job}.txt"
    mod.main(args + ["--out", str(out)])
    captured = capsys.readouterr().out
    assert "##" in captured  # the formatted table header
    assert out.exists() and out.read_text().strip()


def test_all_jobs_have_main():
    for f in JOBS_DIR.glob("table*.py"):
        mod = _load_job(f.stem)
        assert hasattr(mod, "main")
