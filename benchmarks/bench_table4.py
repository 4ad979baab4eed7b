"""Benchmark: Table 4 — ``add`` over wide relations (scaled ÷10).

Paper: 1000 tuples, 1K…10K application attributes, 0.6 s → 62 s.
Each case times one fully-evaluated wide ``add``; the full sweep (and
the paper-vs-measured table) is produced by ``jobs/table4_wide_add.py``.
"""
import pytest

from repro.experiments import table4

ATTRS = [100, 200, 400, 600, 800, 1000]


@pytest.mark.parametrize("n_attrs", ATTRS)
def test_wide_add(benchmark, spark, n_attrs):
    benchmark.extra_info["paper"] = "Table 4 (1K-10K attrs: 0.6-62 s)"
    benchmark.pedantic(
        table4.wide_add_seconds, args=(spark, n_attrs), rounds=1, iterations=1, warmup_rounds=0
    )
