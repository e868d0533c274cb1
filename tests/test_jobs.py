"""Smoke tests for the spark-submit job entrypoints (driver-side mains)."""
import subprocess
import sys
from pathlib import Path

JOBS = Path(__file__).resolve().parents[1] / "jobs"


def _run(name: str, *args: str) -> str:
    out = subprocess.run(
        [sys.executable, str(JOBS / name), *args],
        capture_output=True,
        text=True,
        timeout=120,
        cwd=JOBS,
    )
    assert out.returncode == 0, out.stderr[-2000:]
    return out.stdout


class TestSparklessJobs:
    """Jobs that need no Spark session run end-to-end in a subprocess."""

    def test_table1_job(self):
        out = _run("table1_config_space.py")
        assert "140 total" in out
        assert "24 functions" in out

    def test_table3_job(self):
        out = _run("table3_datasets.py")
        assert "Baby Product" in out
        assert "FZ" in out and "BB" in out


class TestJobImports:
    """Spark-dependent jobs must at least parse (full runs are the
    responsibility of the jobs themselves; see EXPERIMENTS.md)."""

    def test_all_jobs_compile(self):
        import py_compile

        for f in JOBS.glob("table*.py"):
            py_compile.compile(str(f), doraise=True)
