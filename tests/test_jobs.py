"""The spark-submit entrypoints must at least compile and the cheap ones
must run end-to-end."""
import pathlib
import py_compile
import subprocess
import sys

import pytest

JOBS = sorted(pathlib.Path(__file__).resolve().parent.parent.joinpath("jobs").glob("*.py"))


@pytest.mark.parametrize("path", JOBS, ids=lambda p: p.name)
def test_job_compiles(path):
    py_compile.compile(str(path), doraise=True)


def test_table2_job_runs():
    out = subprocess.run(
        [sys.executable, "jobs/table2_source_rates.py"],
        capture_output=True,
        text=True,
        timeout=120,
        cwd=str(JOBS[0].parent.parent),
    )
    assert out.returncode == 0, out.stderr
    assert "nexmark_q1" in out.stdout
    assert "700000" in out.stdout
