"""Smoke tests for the spark-submit job entrypoints.

Jobs own their SparkSession, so they run in a subprocess (tiny scale,
isolated cache) — these are integration tests of the full offline +
online pipeline as a user would launch it.
"""
import subprocess
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parents[1] / "jobs"


def run_job(tmp_path, script: str, *extra: str) -> str:
    import os

    env = {
        **os.environ,
        "REPRO_CACHE": str(tmp_path),
        "SPARK_DRIVER_MEM": "4g",
        "SPARK_SHUFFLE_PARTITIONS": "4",
    }
    env.pop("PYSPARK_SUBMIT_ARGS", None)  # job builds its own
    proc = subprocess.run(
        [sys.executable, str(JOBS / script), "--scale", "0.05",
         "--n-queries", "2", "--k", "3", "--no-cache", *extra],
        capture_output=True, text=True, timeout=420, env=env,
    )
    assert proc.returncode == 0, proc.stderr[-3000:]
    return proc.stdout


@pytest.mark.slow
def test_table1_job_smoke(tmp_path):
    out = run_job(tmp_path, "table1_query_stats.py")
    assert "Table 1" in out
    assert "WT (10)" in out and "School" in out


@pytest.mark.slow
def test_table2_job_smoke(tmp_path):
    out = run_job(
        tmp_path, "table2_runtime.py", "--sets", "WT (10)"
    )
    assert "Table 2" in out
    assert "xash_128" in out


def test_all_jobs_parse_help():
    for script in JOBS.glob("*.py"):
        # report_markdown.py is a Spark-free CSV renderer without the
        # standard --scale interface.
        if script.name.startswith("_") or script.name == "report_markdown.py":
            continue
        proc = subprocess.run(
            [sys.executable, str(script), "--help"],
            capture_output=True, text=True, timeout=60,
        )
        assert proc.returncode == 0, script.name
        assert "--scale" in proc.stdout
