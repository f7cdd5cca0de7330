"""The jobs entrypoints run end-to-end (tiny scale, serial)."""
from __future__ import annotations

import subprocess
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


@pytest.mark.parametrize("table", ["table3", "table7"])
def test_job_runs_serial(table):
    out = subprocess.run(
        [sys.executable, str(JOBS / f"{table}.py"), "--scale", "0.02", "--serial"],
        capture_output=True,
        text=True,
        timeout=900,
    )
    assert out.returncode == 0, out.stderr[-2000:]
    assert len(out.stdout.strip().splitlines()) >= 2  # header + rows


def test_job_table5_rows():
    out = subprocess.run(
        [
            sys.executable,
            str(JOBS / "table5.py"),
            "--scale",
            "0.02",
            "--serial",
        ],
        capture_output=True,
        text=True,
        timeout=900,
    )
    assert out.returncode == 0, out.stderr[-2000:]
    assert "rand_index" in out.stdout


def test_all_tables_have_jobs():
    for n in (2, 3, 4, 5, 6, 7):
        assert (JOBS / f"table{n}.py").exists()
