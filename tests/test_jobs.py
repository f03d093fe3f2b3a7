"""Smoke tests: every job entrypoint runs end to end at tiny scale."""
from __future__ import annotations

import importlib
import os
import subprocess
import sys

import pytest

JOBS_DIR = os.path.join(os.path.dirname(__file__), "..", "jobs")

PURE_PYTHON_JOBS = [
    "fig4_frames",
    "fig5_duration",
    "fig6_window",
    "fig7_occlusion",
    "fig8_queries",
    "fig9_nmin",
    "gen_datasets",
]


@pytest.mark.parametrize("job", PURE_PYTHON_JOBS)
def test_job_runs(job, tmp_path):
    env = dict(
        os.environ,
        REPRO_BENCH_SCALE="0.04",
        REPRO_RESULTS_DIR=str(tmp_path),
    )
    proc = subprocess.run(
        [sys.executable, os.path.join(JOBS_DIR, f"{job}.py")],
        capture_output=True,
        text=True,
        env=env,
        timeout=600,
    )
    assert proc.returncode == 0, proc.stderr[-2000:]
    assert "===" in proc.stdout or job == "gen_datasets"


def test_all_jobs_importable():
    sys.path.insert(0, os.path.abspath(os.path.join(JOBS_DIR, "..")))
    for job in PURE_PYTHON_JOBS + ["table6_stats", "fig10_end2end"]:
        mod = importlib.import_module(f"jobs.{job}")
        assert hasattr(mod, "main")
