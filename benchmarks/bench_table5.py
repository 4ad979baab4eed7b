"""Benchmark: Table 5 — ``add`` over sparse relations.

Paper: 5M×10, zeros 0…100%, 1.68 s → 0.76 s (MonetDB compression).
Here: dense columnwise kernel vs the sparse (non-zero index) kernel.
Full grid at 5M rows: ``jobs/table5_sparse_add.py``.
"""
import numpy as np
import pytest

from repro.batops import kernels, sparse
from repro.experiments.table5 import _gen

N_ROWS = 2_000_000
ZEROS = [0, 50, 90]


def _bats(zero_pct, seed):
    return kernels.as_bats(_gen(zero_pct / 100.0, N_ROWS, 10, seed))


@pytest.mark.parametrize("zero_pct", ZEROS)
def test_dense_add(benchmark, zero_pct):
    a, b = _bats(zero_pct, 0), _bats(zero_pct, 1)
    benchmark.extra_info["paper"] = "Table 5 (0%: 1.68 s ... 100%: 0.76 s)"
    benchmark.pedantic(kernels.col_add, args=(a, b), rounds=3, iterations=1, warmup_rounds=1)


@pytest.mark.parametrize("zero_pct", ZEROS)
def test_sparse_add(benchmark, zero_pct):
    a = [sparse.from_dense(c) for c in _bats(zero_pct, 0)]
    b = [sparse.from_dense(c) for c in _bats(zero_pct, 1)]
    benchmark.extra_info["paper"] = "Table 5 — compressed-representation analogue"
    benchmark.pedantic(sparse.sparse_add_cols, args=(a, b), rounds=3, iterations=1, warmup_rounds=1)


def test_sparse_speedup_shape():
    """Non-timing assertion of the table's shape: more zeros → faster sparse add."""
    dense0 = [sparse.from_dense(c) for c in _bats(0, 2)]
    dense0b = [sparse.from_dense(c) for c in _bats(0, 3)]
    sparse90 = [sparse.from_dense(c) for c in _bats(90, 4)]
    sparse90b = [sparse.from_dense(c) for c in _bats(90, 5)]
    import time

    t0 = time.perf_counter(); sparse.sparse_add_cols(dense0, dense0b); t_dense = time.perf_counter() - t0
    t0 = time.perf_counter(); sparse.sparse_add_cols(sparse90, sparse90b); t_sparse = time.perf_counter() - t0
    assert t_sparse < t_dense
    assert np.isfinite(t_sparse)
