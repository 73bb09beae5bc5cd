"""Smoke tests for the job entrypoints (driver-side pieces only — full
runs are exercised by the benchmarks and the EXPERIMENTS.md refresh)."""
import importlib.util
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def load_job(name: str):
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    sys.path.insert(0, str(JOBS))
    try:
        spec.loader.exec_module(mod)
    finally:
        sys.path.remove(str(JOBS))
    return mod


class TestFig9Job:
    def test_worked_example_matches_paper(self):
        mod = load_job("fig9_ilp")
        text = mod.worked_example()
        assert "individual = 950" in text
        assert "MQO = 800" in text

    def test_module_has_main(self):
        mod = load_job("fig9_ilp")
        assert callable(mod.main)


class TestJobFiles:
    @pytest.mark.parametrize(
        "name", ["fig7_multiquery", "fig8_adaptive", "fig9_ilp"]
    )
    def test_job_file_exists(self, name):
        assert (JOBS / f"{name}.py").exists()
