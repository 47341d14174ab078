"""Job entrypoints: importable, documented, and argument-parsing sanity."""
import importlib.util
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parents[1] / "jobs"
JOB_FILES = sorted(p.name for p in JOBS.glob("*.py") if p.name != "common.py")


def _load(name):
    sys.path.insert(0, str(JOBS))
    try:
        spec = importlib.util.spec_from_file_location(name, JOBS / name)
        mod = importlib.util.module_from_spec(spec)
        spec.loader.exec_module(mod)
        return mod
    finally:
        sys.path.remove(str(JOBS))


def test_one_job_per_experiment_table():
    expected = {
        "table1_datasets.py",
        "scheduling_experiment.py",
        "query_scalability.py",
        "datasize_scalability.py",
        "throughput.py",
        "index_size.py",
        "replication_tradeoff.py",
        "index_scalability.py",
        "competitors.py",
        "knn_experiment.py",
        "dtw_experiment.py",
    }
    assert expected == set(JOB_FILES)


@pytest.mark.parametrize("name", JOB_FILES)
def test_job_importable_with_main(name):
    mod = _load(name)
    assert callable(mod.main)
    assert mod.__doc__ and "spark-submit" in mod.__doc__


def test_table1_job_runs_without_spark(capsys):
    mod = _load("table1_datasets.py")
    old_argv = sys.argv
    sys.argv = ["table1_datasets.py", "--sf", "0.05"]
    try:
        mod.main()
    finally:
        sys.argv = old_argv
    out = capsys.readouterr().out
    assert "Seismic" in out and "Random" in out
