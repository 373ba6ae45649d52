"""Smoke tests for the spark-submit job entrypoints (run in-process at
test scale against the shared session)."""
import subprocess
import sys

import pytest

JOBS = [
    ["jobs/summarize.py", "--scale", "test", "--T", "2", "--dataset", "ppi_like"],
    ["jobs/table3_iterations.py", "--scale", "test", "--Ts", "1", "2",
     "--datasets", "ppi_like"],
    ["jobs/table4_pruning.py", "--scale", "test", "--T", "2",
     "--datasets", "collab_cliques"],
    ["jobs/table5_height.py", "--scale", "test", "--T", "2", "--hbs", "2", "0",
     "--datasets", "ppi_like"],
    ["jobs/fig6_composition.py", "--scale", "test", "--T", "2",
     "--datasets", "ppi_like"],
]


@pytest.mark.parametrize("cmd", JOBS, ids=[c[0].split("/")[-1] for c in JOBS])
def test_job_runs(cmd, tmp_path):
    env = {"SPARK_SHUFFLE_PARTITIONS": "4"}
    import os

    full_env = {**os.environ, **env}
    proc = subprocess.run(
        [sys.executable, *cmd],
        capture_output=True,
        text=True,
        timeout=600,
        cwd="/root/repo",
        env=full_env,
    )
    assert proc.returncode == 0, proc.stderr[-3000:]
    assert proc.stdout.strip(), "job printed nothing"
