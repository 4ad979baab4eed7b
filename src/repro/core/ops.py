r"""The 19 relational matrix operations (Section 4, Table 2).

Every operation is closed: it takes relations (Spark DataFrames) plus an
*order schema* per argument and returns a relation. The order schema
``by`` must form a key; the remaining attributes form the *application
schema* (numeric data the matrix operation is applied to). Result
relations carry row and column *origins* morphed from the inputs
according to the operation's shape type, exactly as in Table 2:

=============  ==========  ================================================
shape type     operations  result schema
=============  ==========  ================================================
``(r1,r1)``    usv         ``U ∘ ∇U``
``(r1,r2)``    opd         ``U ∘ ∇V``
``(r1,c1)``    inv evc     ``U ∘ Ū``
\              chf qqr
``(r1,c2)``    mmu         ``U ∘ V̄``
``(r1,1)``     evl vsv     ``U ∘ (op)``
``(c1,r1)``    tra         ``(C) ∘ ∇U``  (C values = Ū)
``(c1,c1)``    rqr dsv     ``(C) ∘ Ū``   (C values = Ū)
``(c1,c2)``    cpd sol     ``(C) ∘ V̄``   (C values = Ū)
``(r*,c*)``    emu add     ``U ∘ V ∘ Ū``
\              sub
``(1,1)``      det rnk     ``(C, op)``   (single tuple ``('op', value)``)
=============  ==========  ================================================

Backends (``backend=`` keyword):

- ``"local"`` — the RMA+MKL analogue: Arrow-collect the application part
  in order-schema order, run numpy/LAPACK, rebuild the relation.
- ``"spark"`` — distributed kernels (:mod:`repro.core.distributed`) for
  ``add``/``sub``/``emu``, ``cpd``, ``sol``, ``mmu``, ``qqr``, ``rqr``.
- ``"bat"`` — the faithful columnwise kernels (:mod:`repro.batops`) for
  ``inv`` (Algorithm 2), ``qqr``/``rqr`` (Gram-Schmidt), and the linear
  ops.
- ``"auto"`` — the paper's policy (§8): linear operations stay in the
  engine, complex operations delegate to the LAPACK backend.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import types as T

from repro.batops import kernels as bat
from repro.core import distributed, matrix_ops
from repro.core.constructors import (
    application_schema,
    column_cast,
    relation_constructor,
    schema_cast,
    split_sorted,
)
from repro.core.shapes import SQUARE_INPUT_OPS, shape_type

C_ATTR = "C"

_NUMERIC = (T.ByteType, T.ShortType, T.IntegerType, T.LongType, T.FloatType, T.DoubleType, T.DecimalType)


def _norm(by: str | Sequence[str]) -> list[str]:
    return [by] if isinstance(by, str) else list(by)


def _check_relation(r: DataFrame, by: list[str], validate: bool, op: str) -> list[str]:
    """Validate order schema (key) and application schema (numeric); return Ū."""
    app = application_schema(r, by)
    if not app:
        raise ValueError(f"{op}: application schema is empty (every attribute is in the order schema)")
    fields = {f.name: f.dataType for f in r.schema.fields}
    bad = [c for c in app if not isinstance(fields[c], _NUMERIC)]
    if bad:
        raise ValueError(
            f"{op}: application attributes must be numeric; {bad} are not "
            "(add them to the order schema or project them away)"
        )
    if validate and r.select(*by).distinct().count() != r.count():
        raise ValueError(f"{op}: order schema {by} does not form a key")
    return app


def _check_counts(r: DataFrame, s: DataFrame, op: str) -> None:
    n, m = r.count(), s.count()
    if n != m:
        raise ValueError(f"{op}: inputs must have the same number of tuples, got {n} and {m}")


# --- unary operations ---------------------------------------------------

def _unary(op: str, r: DataFrame, by: str | Sequence[str], backend: str, validate: bool) -> DataFrame:
    by = _norm(by)
    app = _check_relation(r, by, validate, op)
    st = shape_type(op)
    spark = r.sparkSession

    if op in ("tra", "usv") and len(by) != 1:
        raise ValueError(f"{op}: the order schema must have exactly one attribute (column cast ∇U)")

    # Distributed kernels that never collect the application part.
    if backend == "spark":
        if op == "qqr":
            out = distributed.qqr_rows(r, by, app)
            if validate:
                pass  # key check already done; CholeskyQR validates rank
            return out
        if op == "rqr":
            base = distributed.rqr_matrix(r, app)
            return relation_constructor(spark, [schema_cast(app), base], [C_ATTR, *app])
        raise ValueError(f"{op}: no distributed kernel; use backend='local' or 'bat'")

    order_pdf, m = split_sorted(r, by)
    if op in SQUARE_INPUT_OPS and m.shape[0] != m.shape[1]:
        raise ValueError(f"{op.upper()} requires a square matrix, got {m.shape}")

    if backend == "bat":
        if op == "inv":
            base = bat.from_bats(bat.gauss_jordan_inv(bat.as_bats(m)))
        elif op == "qqr":
            base = bat.from_bats(bat.gram_schmidt_qr(bat.as_bats(m))[0])
        elif op == "rqr":
            base = bat.from_bats(bat.gram_schmidt_qr(bat.as_bats(m))[1])
        else:
            raise ValueError(f"{op}: no BAT kernel; use backend='local'")
    else:
        base = matrix_ops.UNARY[op](m)

    if op == "usv":
        return relation_constructor(spark, [order_pdf, base], [*by, *column_cast(r, by[0])])
    if op in ("inv", "evc", "chf", "qqr"):
        return relation_constructor(spark, [order_pdf, base], [*by, *app])
    if op in ("evl", "vsv"):
        return relation_constructor(spark, [order_pdf, base], [*by, op])
    if op == "tra":
        return relation_constructor(spark, [schema_cast(app), base], [C_ATTR, *column_cast(r, by[0])])
    if op in ("rqr", "dsv"):
        return relation_constructor(spark, [schema_cast(app), base], [C_ATTR, *app])
    if op in ("det", "rnk"):
        return relation_constructor(spark, [np.array([[op]], dtype=object), base], [C_ATTR, op])
    raise AssertionError(f"unhandled unary op {op} with shape type {st}")


# --- binary operations --------------------------------------------------

def _binary(
    op: str,
    r: DataFrame,
    s: DataFrame,
    by: str | Sequence[str],
    by2: str | Sequence[str],
    backend: str,
    validate: bool,
    align: str = "position",
) -> DataFrame:
    by, by2 = _norm(by), _norm(by2)
    app_r = _check_relation(r, by, validate, op)
    app_s = _check_relation(s, by2, validate, op)
    spark = r.sparkSession

    if op == "opd" and len(by2) != 1:
        raise ValueError("opd: the second order schema must have exactly one attribute (column cast ∇V)")

    if op in ("emu", "add", "sub"):
        if len(app_r) != len(app_s):
            raise ValueError(
                f"{op}: application schemas must be union compatible, "
                f"got {len(app_r)} vs {len(app_s)} attributes"
            )
        out_schema = [*by, *by2, *app_r]
        if len(set(out_schema)) != len(out_schema):
            raise ValueError(
                f"{op}: order schemas must not overlap and must not clash with "
                f"the application schema; rename (ρ) attributes in {out_schema}"
            )
        if validate:
            _check_counts(r, s, op)
        if backend in ("auto", "spark"):
            return distributed.zip_linear(r, by, s, by2, app_r, app_s, op, out_schema, align=align)
        (order_r, m), (order_s, n) = split_sorted(r, by), split_sorted(s, by2)
        if backend == "bat":
            kern = {"add": bat.col_add, "sub": bat.col_sub, "emu": bat.col_emu}[op]
            base = bat.from_bats(kern(bat.as_bats(m), bat.as_bats(n)))
        else:
            base = matrix_ops.BINARY[op](m, n)
        return relation_constructor(spark, [order_r, order_s, base], out_schema)

    if op == "cpd" and backend in ("spark",):
        if validate:
            _check_counts(r, s, op)
        self_cpd = r is s and by == by2
        base = (
            distributed.gram(r, app_r)
            if self_cpd
            else distributed.gram(r, app_r, s, by, by2, app_s)
        )
        return relation_constructor(spark, [schema_cast(app_r), base], [C_ATTR, *app_s])

    if op == "sol" and backend == "spark":
        if validate:
            _check_counts(r, s, op)
        if len(app_s) != 1:
            raise ValueError(f"SOL right-hand side must be a single column, got {len(app_s)}")
        # Normal equations over distributed partial Grams: x = (AᵀA)⁻¹ Aᵀb.
        ata = distributed.gram(r, app_r)
        atb = distributed.gram(r, app_r, s, by, by2, app_s)
        base = np.linalg.solve(ata, atb)
        return relation_constructor(spark, [schema_cast(app_r), base], [C_ATTR, *app_s])

    if op == "mmu" and backend == "spark":
        _, right = split_sorted(s, by2)
        out_schema = [*by, *app_s]
        if len(set(out_schema)) != len(set(by)) + len(app_s):
            raise ValueError(f"mmu: result attributes clash: {out_schema}; rename (ρ) first")
        return distributed.mmu_rows(r, by, app_r, right, app_s)

    if backend in ("spark", "bat") and op in ("mmu", "opd", "cpd", "sol"):
        raise ValueError(f"{op}: backend {backend!r} not available; use 'local'")

    (order_r, m), (order_s, n) = split_sorted(r, by), split_sorted(s, by2)
    base = matrix_ops.BINARY[op](m, n)

    if op == "opd":
        return relation_constructor(spark, [order_r, base], [*by, *column_cast(s, by2[0])])
    if op == "mmu":
        return relation_constructor(spark, [order_r, base], [*by, *app_s])
    if op in ("cpd", "sol"):
        return relation_constructor(spark, [schema_cast(app_r), base], [C_ATTR, *app_s])
    raise AssertionError(f"unhandled binary op {op}")


# --- public API (one function per operation) ----------------------------

def emu(r, s, by, by2, *, backend="auto", validate=True, align="position") -> DataFrame:
    """``emu_{U;V}(r, s)``: element-wise multiplication; schema ``U ∘ V ∘ Ū``."""
    return _binary("emu", r, s, by, by2, backend, validate, align)


def add(r, s, by, by2, *, backend="auto", validate=True, align="position") -> DataFrame:
    """``add_{U;V}(r, s)``: matrix addition; schema ``U ∘ V ∘ Ū``."""
    return _binary("add", r, s, by, by2, backend, validate, align)


def sub(r, s, by, by2, *, backend="auto", validate=True, align="position") -> DataFrame:
    """``sub_{U;V}(r, s)``: matrix subtraction; schema ``U ∘ V ∘ Ū``."""
    return _binary("sub", r, s, by, by2, backend, validate, align)


def mmu(r, s, by, by2, *, backend="auto", validate=True) -> DataFrame:
    """``mmu_{U;V}(r, s)``: matrix multiplication; schema ``U ∘ V̄``."""
    backend = "local" if backend == "auto" else backend
    return _binary("mmu", r, s, by, by2, backend, validate)


def opd(r, s, by, by2, *, backend="local", validate=True) -> DataFrame:
    """``opd_{U;V}(r, s)``: outer product; schema ``U ∘ ∇V``."""
    backend = "local" if backend == "auto" else backend
    return _binary("opd", r, s, by, by2, backend, validate)


def cpd(r, s, by, by2, *, backend="auto", validate=True) -> DataFrame:
    """``cpd_{U;V}(r, s)``: cross product ``AᵀB``; schema ``(C) ∘ V̄``.

    With ``backend="auto"`` the self cross product (``r is s``) runs
    distributed via partial Gram matrices (no sort — §8.1 optimisation);
    the general case runs locally.
    """
    if backend == "auto":
        backend = "spark" if (r is s and _norm(by) == _norm(by2)) else "local"
    return _binary("cpd", r, s, by, by2, backend, validate)


def sol(r, s, by, by2, *, backend="auto", validate=True) -> DataFrame:
    """``sol_{U;V}(r, s)``: least-squares solve of ``r·x = s``; schema ``(C) ∘ V̄``."""
    backend = "local" if backend == "auto" else backend
    return _binary("sol", r, s, by, by2, backend, validate)


def tra(r, by, *, backend="local", validate=True) -> DataFrame:
    """``tra_U(r)``: transpose; schema ``(C) ∘ ∇U``, C values = ``Ū``."""
    backend = "local" if backend == "auto" else backend
    return _unary("tra", r, by, backend, validate)


def inv(r, by, *, backend="auto", validate=True) -> DataFrame:
    """``inv_U(r)``: matrix inversion; schema ``U ∘ Ū``."""
    backend = "local" if backend == "auto" else backend
    return _unary("inv", r, by, backend, validate)


def evc(r, by, *, backend="local", validate=True) -> DataFrame:
    """``evc_U(r)``: eigenvectors; schema ``U ∘ Ū``."""
    backend = "local" if backend == "auto" else backend
    return _unary("evc", r, by, backend, validate)


def evl(r, by, *, backend="local", validate=True) -> DataFrame:
    """``evl_U(r)``: eigenvalues; schema ``U ∘ (evl)``."""
    backend = "local" if backend == "auto" else backend
    return _unary("evl", r, by, backend, validate)


def qqr(r, by, *, backend="auto", validate=True) -> DataFrame:
    """``qqr_U(r)``: Q of the QR decomposition; schema ``U ∘ Ū``."""
    backend = "local" if backend == "auto" else backend
    return _unary("qqr", r, by, backend, validate)


def rqr(r, by, *, backend="auto", validate=True) -> DataFrame:
    """``rqr_U(r)``: R of the QR decomposition; schema ``(C) ∘ Ū``."""
    backend = "local" if backend == "auto" else backend
    return _unary("rqr", r, by, backend, validate)


def dsv(r, by, *, backend="local", validate=True) -> DataFrame:
    """``dsv_U(r)``: diagonal matrix of singular values; schema ``(C) ∘ Ū``."""
    backend = "local" if backend == "auto" else backend
    return _unary("dsv", r, by, backend, validate)


def usv(r, by, *, backend="local", validate=True) -> DataFrame:
    """``usv_U(r)``: left singular vectors; schema ``U ∘ ∇U`` (needs ``|U|=1``)."""
    backend = "local" if backend == "auto" else backend
    return _unary("usv", r, by, backend, validate)


def vsv(r, by, *, backend="local", validate=True) -> DataFrame:
    """``vsv_U(r)``: singular values as a column; schema ``U ∘ (vsv)``."""
    backend = "local" if backend == "auto" else backend
    return _unary("vsv", r, by, backend, validate)


def det(r, by, *, backend="local", validate=True) -> DataFrame:
    """``det_U(r)``: determinant; single-tuple relation with schema ``(C, det)``."""
    backend = "local" if backend == "auto" else backend
    return _unary("det", r, by, backend, validate)


def rnk(r, by, *, backend="local", validate=True) -> DataFrame:
    """``rnk_U(r)``: numerical rank; single-tuple relation with schema ``(C, rnk)``."""
    backend = "local" if backend == "auto" else backend
    return _unary("rnk", r, by, backend, validate)


def chf(r, by, *, backend="local", validate=True) -> DataFrame:
    """``chf_U(r)``: Cholesky factor (upper, ``RᵀR=A``); schema ``U ∘ Ū``."""
    backend = "local" if backend == "auto" else backend
    return _unary("chf", r, by, backend, validate)


#: name → callable, for the SQL front-end and generic tests.
UNARY_OPS = {"tra": tra, "inv": inv, "evc": evc, "evl": evl, "qqr": qqr, "rqr": rqr,
             "dsv": dsv, "usv": usv, "vsv": vsv, "det": det, "rnk": rnk, "chf": chf}
BINARY_OPS = {"emu": emu, "add": add, "sub": sub, "mmu": mmu, "opd": opd, "cpd": cpd, "sol": sol}
