"""Job entry points are importable and runnable at tiny scale."""
import subprocess
import sys

import pytest

JOBS_DIR = "jobs"

CHEAP_JOBS = ["table2_queries.py", "table3_labels.py"]


@pytest.mark.parametrize("job", CHEAP_JOBS)
def test_cheap_job_runs(job):
    out = subprocess.run(
        [sys.executable, job],
        cwd=JOBS_DIR,
        capture_output=True,
        text=True,
        timeout=120,
    )
    assert out.returncode == 0, out.stderr[-2000:]
    assert "Table" in out.stdout


def test_fig5_job_small_scale():
    out = subprocess.run(
        [sys.executable, "fig5_index_size.py", "--scale", "0.1"],
        cwd=JOBS_DIR,
        capture_output=True,
        text=True,
        timeout=300,
    )
    assert out.returncode == 0, out.stderr[-2000:]
    assert "Q11" in out.stdout


def test_all_jobs_importable():
    """Every job module compiles (syntax + import-graph sanity)."""
    import pathlib
    import py_compile

    for path in pathlib.Path(JOBS_DIR).glob("*.py"):
        py_compile.compile(str(path), doraise=True)
