"""Benchmark: Table 7 — ``add`` + selection, RMA+ vs array DB (scaled ÷10).

Paper: RMA+ beats SciDB by >10× because SciDB needs an array join.
Full grid + paper numbers: ``jobs/table7_vs_arraydb.py``.
"""
import pytest

from repro.experiments import table7

SIZES = [100_000, 500_000, 1_000_000]
IDS = [f"{n//1000}K" for n in SIZES]


@pytest.mark.parametrize("n_rows", SIZES, ids=IDS)
def test_rma_add_select(benchmark, spark, n_rows):
    benchmark.extra_info["paper_rma_sec"] = table7.PAPER[n_rows * table7.SCALE]["RMA+"]
    benchmark.pedantic(
        table7.rma_add_select_seconds, args=(spark, n_rows), rounds=1, iterations=1, warmup_rounds=0
    )


@pytest.mark.parametrize("n_rows", SIZES, ids=IDS)
def test_arraydb_add_select(benchmark, spark, n_rows):
    benchmark.extra_info["paper_scidb_sec"] = table7.PAPER[n_rows * table7.SCALE]["SciDB"]
    benchmark.pedantic(
        table7.arraydb_add_select_seconds, args=(spark, n_rows), rounds=1, iterations=1, warmup_rounds=0
    )
