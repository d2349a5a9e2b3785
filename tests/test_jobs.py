"""Every spark-submit entrypoint runs end-to-end on the tiny suite."""
import importlib
import sys
from pathlib import Path

import pytest

JOBS_DIR = str(Path(__file__).resolve().parent.parent / "jobs")

JOBS = [
    ("table2_stats", ["--datasets", "HA-tiny", "WB-tiny"]),
    ("table3_speedup", ["--datasets", "HA-tiny", "--k", "2"]),
    ("table4_quality", ["--datasets", "HA-tiny", "--k", "2"]),
    ("table5_clustering", ["--datasets", "HA-tiny", "--k", "2"]),
    ("fig9_verify", ["--datasets", "HA-tiny"]),
    ("fig12_ldsflow", ["--datasets", "HA-tiny", "--k", "2"]),
    ("fig14_greedy", ["--datasets", "GQ-tiny", "--k", "2"]),
]


@pytest.fixture(scope="module", autouse=True)
def _jobs_on_path():
    sys.path.insert(0, JOBS_DIR)
    yield
    sys.path.remove(JOBS_DIR)


@pytest.mark.parametrize("name,argv", JOBS, ids=[j[0] for j in JOBS])
def test_job_runs(spark, name, argv, capsys):
    mod = importlib.import_module(name)
    mod.main(argv)
    out = capsys.readouterr().out
    assert "==" in out and "|" in out  # a rendered table reached stdout
    # the shared pytest session must survive the job
    assert spark.sparkContext._jsc is not None
