"""Matrix/relation constructors and casts (Sections 3 and 4.1).

- column cast ``∇U`` (:func:`column_cast`): ordered list of the sorted
  values of a single key attribute — used to *name result columns* for
  ``tra``, ``usv``, ``opd``.
- schema cast ``ΔU`` (:func:`schema_cast`): single-column matrix of
  attribute names — used as the row-origin column ``C``.
- matrix constructor ``μ_U(r)`` (:func:`matrix_constructor`): the values
  of ``r.U`` sorted by ``U``; complement ``μ̄_U(r)``
  (:func:`matrix_constructor_complement`) takes the application part.
- relation constructor ``γ(m, R)`` (:func:`relation_constructor`): turns
  a matrix plus a schema back into a relation (Spark DataFrame).

The constructors are the bridge between unordered relations and ordered
matrices; every relational matrix operation in :mod:`repro.core.ops` is
defined through them exactly as in Table 2 of the paper.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def application_schema(r: DataFrame, by: Sequence[str]) -> list[str]:
    """``Ū = R - U``: the attributes of ``r`` not in order schema ``by``.

    Order of the remaining attributes follows the relation schema, as in
    the paper (schemas are ordered sets).
    """
    missing = [c for c in by if c not in r.columns]
    if missing:
        raise ValueError(f"order schema attributes {missing} not in schema {r.columns}")
    if len(set(by)) != len(by):
        raise ValueError(f"order schema has duplicate attributes: {list(by)}")
    return [c for c in r.columns if c not in set(by)]


def split_sorted(r: DataFrame, by: Sequence[str]) -> tuple[pd.DataFrame, np.ndarray]:
    """Split ``r`` into (order part, application part) sorted by ``by``.

    Returns the order part as a pandas frame (contextual values, kept as
    relation columns) and the application part as a float64 matrix — the
    results of ``μ_U(r)`` and ``μ̄_U(r)`` in one sorted collect. This is
    the "copy to MKL format" step of the paper's RMA+MKL backend; its
    cost is what §8.5 measures.
    """
    app = application_schema(r, by)
    pdf = r.orderBy(*[r[c].asc() for c in by]).toPandas()
    order_part = pdf[list(by)]
    m = pdf[app].to_numpy(dtype=np.float64, copy=False) if app else np.empty((len(pdf), 0))
    if m.ndim == 1:  # pandas collapses a single column
        m = m.reshape(-1, 1)
    return order_part, m


def matrix_constructor(r: DataFrame, by: Sequence[str]) -> np.ndarray:
    """``μ_U(r)``: matrix of the values of ``r.U`` sorted by ``U`` (Def. 4.2)."""
    pdf = r.orderBy(*[r[c].asc() for c in by]).select(*by).toPandas()
    return pdf.to_numpy()


def matrix_constructor_complement(r: DataFrame, by: Sequence[str]) -> np.ndarray:
    """``μ̄_U(r)``: matrix of the values of ``r.Ū`` sorted by ``U``."""
    return split_sorted(r, by)[1]


def column_cast(r: DataFrame, attr: str) -> list[str]:
    """``∇U``: sorted values of key attribute ``attr``, as column names (Eq. 2).

    Applicable only when the order schema has exactly one attribute; the
    values must be unique after stringification because they become
    attribute names of the result schema.
    """
    vals = [row[0] for row in r.select(attr).orderBy(attr).collect()]
    names = [_to_name(v) for v in vals]
    if len(set(names)) != len(names):
        raise ValueError(
            f"column cast of {attr!r} yields duplicate attribute names; "
            "the order schema must be a key with distinct printable values"
        )
    return names


def schema_cast(attrs: Sequence[str]) -> np.ndarray:
    """``ΔU``: single-column matrix of the attribute names of ``U`` (Eq. 4)."""
    return np.array(list(attrs), dtype=object).reshape(-1, 1)


def _to_name(v) -> str:
    """Render an order-part value as a result attribute name."""
    if isinstance(v, float) and v.is_integer():
        return str(int(v))
    return str(v)


def relation_constructor(
    spark: SparkSession,
    parts: Sequence[np.ndarray | pd.DataFrame],
    schema: Sequence[str],
) -> DataFrame:
    """``γ(m, R)``: build a relation from concatenated matrices (Def. 4.4).

    ``parts`` are matrices/frames with equal row counts; their columnwise
    concatenation (the ``□`` of Eq. 3) is zipped with attribute names
    ``schema``. Numeric parts become doubles; contextual parts keep
    their values. Raises if attribute names collide — the relation
    constructor requires a well-formed schema.
    """
    names = list(schema)
    if len(set(names)) != len(names):
        dupes = sorted({n for n in names if names.count(n) > 1})
        raise ValueError(
            f"result schema has duplicate attributes {dupes}; rename "
            "(ρ) argument attributes so origins stay distinguishable"
        )
    cols: dict[str, object] = {}
    n_rows = None
    i = 0
    for part in parts:
        if isinstance(part, pd.DataFrame):
            block = part.reset_index(drop=True)
            block_cols = [block[c] for c in block.columns]
        else:
            arr = np.asarray(part)
            if arr.ndim == 1:
                arr = arr.reshape(-1, 1)
            block_cols = [arr[:, j] for j in range(arr.shape[1])]
        for col in block_cols:
            if n_rows is None:
                n_rows = len(col)
            elif len(col) != n_rows:
                raise ValueError("matrix concatenation requires equal row counts")
            cols[names[i]] = col
            i += 1
    if i != len(names):
        raise ValueError(f"schema has {len(names)} attributes but parts supply {i} columns")
    pdf = pd.DataFrame(cols if cols else {}, columns=names)
    for c in pdf.columns:
        if pd.api.types.is_numeric_dtype(pdf[c]):
            pdf[c] = pdf[c].astype(np.float64)
    return spark.createDataFrame(pdf)
