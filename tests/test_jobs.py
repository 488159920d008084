"""The spark-submit entrypoints must at least compile and parse args."""
import py_compile
import pathlib

import pytest

JOBS = sorted(pathlib.Path(__file__).parent.parent.glob("jobs/*.py"))


@pytest.mark.parametrize("path", JOBS, ids=[p.name for p in JOBS])
def test_job_compiles(path):
    py_compile.compile(str(path), doraise=True)


def test_all_expected_jobs_present():
    names = {p.name for p in JOBS}
    assert {"run_maxrfc.py", "run_table1.py", "run_table2.py",
            "run_reduction.py", "_session.py"} <= names
