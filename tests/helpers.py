"""Shared helpers for RMA tests (importable as ``helpers``)."""
import numpy as np
import pandas as pd


def make_rel(spark, n_rows, n_app, *, seed=0, key="id", prefix="a", square=False, spd=False):
    """Random matrix-relation; app names a00.. sort identically to their order."""
    g = np.random.default_rng(seed)
    if spd:
        assert square and n_rows == n_app
        b = g.random((n_rows, n_app))
        m = b @ b.T + n_app * np.eye(n_app)
    else:
        m = g.random((n_rows, n_app)) * 10 - 5
        if square:
            m += np.eye(n_rows, n_app) * n_app  # diagonally dominant: invertible
    pdf = pd.DataFrame(m, columns=[f"{prefix}{j:02d}" for j in range(n_app)])
    pdf.insert(0, key, [f"k{i:03d}" for i in range(n_rows)])
    return spark.createDataFrame(pdf), m


def sorted_matrix(df, by, app):
    """Collect ``df`` sorted by ``by`` and return the ``app`` columns as a matrix."""
    pdf = df.orderBy(*by).toPandas()
    return pdf[app].to_numpy(dtype=np.float64)
