"""Job entrypoint tests: all four compile; one runs end to end."""
import os
import py_compile
import subprocess
import sys

import pytest

JOBS = os.path.join(os.path.dirname(__file__), "..", "jobs")


@pytest.mark.parametrize(
    "name",
    [
        "table1_dataset_stats.py",
        "table2_join_times.py",
        "table3_parameters.py",
        "table4_candidates.py",
        "_session.py",
    ],
)
def test_job_compiles(name):
    py_compile.compile(os.path.join(JOBS, name), doraise=True)


def test_table1_job_runs():
    """Run one job in a subprocess (its own SparkSession) end to end."""
    env = dict(os.environ)
    env["SPARK_SHUFFLE_PARTITIONS"] = "8"
    env.pop("PYSPARK_SUBMIT_ARGS", None)
    out = subprocess.run(
        [
            sys.executable,
            os.path.join(JOBS, "table1_dataset_stats.py"),
            "--scale", "0.1",
            "--datasets", "DBLP,UNIFORM005",
        ],
        capture_output=True,
        text=True,
        timeout=420,
        env=env,
    )
    assert out.returncode == 0, out.stderr[-3000:]
    assert "DBLP" in out.stdout and "UNIFORM005" in out.stdout
    assert "paper_n_sets" in out.stdout
