"""Smoke tests for the spark-submit entrypoints that need no Spark session
(the Spark-based jobs' logic is covered by test_experiments / test_exchange_runner)."""
import subprocess
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parents[1] / "jobs"

NON_SPARK_JOBS = [
    "table1_invocation.py",
    "table3_exchange_runtime.py",
    "figure1_intro_sim.py",
    "figure4_cpu_model.py",
    "figure7_chunking.py",
]


@pytest.mark.parametrize("job", NON_SPARK_JOBS)
def test_job_runs_and_prints_table(job):
    out = subprocess.run(
        [sys.executable, str(JOBS / job)],
        capture_output=True,
        text=True,
        timeout=180,
        cwd=JOBS,
    )
    assert out.returncode == 0, out.stderr[-2000:]
    assert "==" in out.stdout  # at least one table header


def test_spark_jobs_importable():
    """The Spark jobs must at least parse (their mains run under spark-submit)."""
    import ast

    for job in ("table2_exchange_costs.py", "figure10_worker_config.py",
                "figure11_pushdown.py", "figure12_qaas.py"):
        ast.parse((JOBS / job).read_text())
