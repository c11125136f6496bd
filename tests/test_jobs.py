"""Smoke tests for the spark-submit job entrypoints (tiny scale, subprocess —
each job owns its SparkSession, so they must not share this suite's JVM)."""
import os
import subprocess
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parents[1] / "jobs"


def _run(job: str, *args: str) -> str:
    env = dict(os.environ)
    env.pop("PYSPARK_SUBMIT_ARGS", None)  # job sets its own
    env["SPARK_MASTER"] = "local[2]"
    out = subprocess.run(
        [sys.executable, str(JOBS / job), *args],
        capture_output=True,
        text=True,
        timeout=420,
        env=env,
    )
    assert out.returncode == 0, out.stderr[-3000:]
    return out.stdout


@pytest.mark.slow
def test_run_exact_job():
    out = _run("run_exact.py", "--dataset", "moons", "--scale", "0.05")
    assert "clusters=" in out and "ARI=" in out


@pytest.mark.slow
def test_run_approx_job():
    out = _run("run_approx.py", "--dataset", "moons", "--scale", "0.05", "--rho", "0.5")
    assert "|S*|=" in out


@pytest.mark.slow
def test_run_streaming_job():
    out = _run(
        "run_streaming.py", "--dataset", "session_stream", "--scale", "0.02",
        "--chunk", "128",
    )
    assert "mem_ratio=" in out and "ARI=" in out


def test_table_jobs_importable():
    """The table jobs are plain wrappers over repro.experiments.tables; their
    heavy paths are covered by tests/test_experiments.py and benchmarks/."""
    import importlib.util

    for name in (
        "table2_gonzalez_share", "table3_quality", "table4_streaming",
        "fig3_runtime", "fig6_memory",
    ):
        spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
        assert spec is not None
