"""The spark-submit entrypoints stay importable/compilable."""
import pathlib
import py_compile

import pytest

JOBS = sorted((pathlib.Path(__file__).resolve().parent.parent / "jobs").glob("*.py"))


@pytest.mark.parametrize("job", JOBS, ids=[j.name for j in JOBS])
def test_job_compiles(job, tmp_path):
    py_compile.compile(str(job), cfile=str(tmp_path / "out.pyc"), doraise=True)


def test_expected_jobs_exist():
    names = {j.name for j in JOBS}
    for required in [
        "table4_wide_add.py",
        "table5_sparse_add.py",
        "table6_qqr_scaling.py",
        "table7_vs_arraydb.py",
        "covariance_demo.py",
        "ols_demo.py",
    ]:
        assert required in names
