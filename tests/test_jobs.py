"""The spark-submit entrypoints under jobs/ (non-Spark paths, subprocess)."""
import os
import subprocess
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parents[1] / "jobs"


@pytest.mark.slow
def test_run_table_t19_cli(tmp_path):
    env = dict(os.environ, REPRO_RESULTS_DIR=str(tmp_path))
    out = subprocess.run(
        [sys.executable, str(JOBS / "run_table.py"), "--table", "T19"],
        capture_output=True,
        text=True,
        env=env,
        timeout=300,
    )
    assert out.returncode == 0, out.stderr[-2000:]
    assert "Timing-N" in out.stdout
    assert (tmp_path / "T19_speedup_vs_window.md").exists()


def test_run_table_rejects_unknown_table():
    out = subprocess.run(
        [sys.executable, str(JOBS / "run_table.py"), "--table", "T99"],
        capture_output=True,
        text=True,
        timeout=60,
    )
    assert out.returncode != 0
