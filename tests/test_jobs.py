"""spark-submit entrypoints: importability + harness wiring.

The jobs build their own SparkSession when run standalone; here we only
exercise the argument plumbing and the table dispatch against the
already-running session's Runner (running full tables is the
benchmarks' job).
"""
import importlib.util
import pathlib

import pytest

JOBS = sorted(pathlib.Path(__file__).resolve().parents[1].glob("jobs/table*.py"))


def _load(path):
    spec = importlib.util.spec_from_file_location(path.stem, path)
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


@pytest.mark.parametrize("path", JOBS, ids=[p.stem for p in JOBS])
def test_job_modules_importable(path):
    mod = _load(path)
    assert hasattr(mod, "main")


def test_job_count_matches_tables():
    assert len(JOBS) == 10


def test_jobs_reference_each_table_number():
    nums = set()
    for p in JOBS:
        body = p.read_text()
        nums.add(int(body.split("main(")[1].split(")")[0]))
    assert nums == set(range(1, 11))


def test_make_experiments_md_importable():
    p = pathlib.Path(__file__).resolve().parents[1] / "jobs" / "make_experiments_md.py"
    mod = _load(p)
    assert hasattr(mod, "main")
