"""Matrix consistency (Definition 6.3, Theorem 6.8) for all 19 operations.

For every op: reduce the argument relation(s) to matrices (Def. 6.1),
apply the matrix operation, and check the result *relation* is reducible
to the result *matrix* under the order schema U' given by the shape type
(Table 3). Relations here use application-attribute names whose
alphabetical order equals their schema order, so sorting by the row
origin reproduces the base-result row order directly.
"""
import numpy as np
import pytest

from repro.core import matrix_ops as M
from repro.core import ops
from repro.core.constructors import matrix_constructor_complement
from repro.core.shapes import shape_type

from helpers import make_rel


def reduce_to(df, by):
    """``r →_U m``: the matrix the relation is reducible to (Def. 6.1)."""
    return matrix_constructor_complement(df, by)


UNARY_CASES = [
    # (op, n, k, kwargs for make_rel, result order schema U')
    ("tra", 4, 2, {}, ["C"]),
    ("qqr", 5, 3, {}, ["id"]),
    ("rqr", 5, 3, {}, ["C"]),
    ("dsv", 5, 3, {}, ["C"]),
    ("usv", 4, 2, {}, ["id"]),
    ("vsv", 4, 2, {}, ["id"]),
    ("evl", 3, 3, {"square": True, "spd": True}, ["id"]),
    ("evc", 3, 3, {"square": True, "spd": True}, ["id"]),
    ("chf", 3, 3, {"square": True, "spd": True}, ["id"]),
    ("inv", 3, 3, {"square": True}, ["id"]),
    ("det", 3, 3, {"square": True}, ["C"]),
    ("rnk", 4, 2, {}, ["C"]),
]


@pytest.mark.parametrize("op,n,k,kw,u_prime", UNARY_CASES, ids=[c[0] for c in UNARY_CASES])
def test_unary_matrix_consistency(spark, op, n, k, kw, u_prime):
    r, _ = make_rel(spark, n, k, **kw)
    m = reduce_to(r, ["id"])
    base = M.UNARY[op](m)
    v = getattr(ops, op)(r, ["id"])
    assert np.allclose(reduce_to(v, u_prime), base, atol=1e-8)


BINARY_CASES = [
    # (op, dims r, dims s, U' of the result)
    ("add", (4, 2), (4, 2), ["id"]),
    ("sub", (4, 2), (4, 2), ["id"]),
    ("emu", (4, 2), (4, 2), ["id"]),
    ("mmu", (4, 2), (2, 3), ["id"]),
    ("opd", (3, 2), (4, 2), ["id"]),
    ("cpd", (5, 2), (5, 3), ["C"]),
    ("sol", (5, 2), (5, 1), ["C"]),
]


@pytest.mark.parametrize("op,d1,d2,u_prime", BINARY_CASES, ids=[c[0] for c in BINARY_CASES])
def test_binary_matrix_consistency(spark, op, d1, d2, u_prime):
    r, _ = make_rel(spark, *d1, seed=1)
    s, _ = make_rel(spark, *d2, seed=2, key="id2", prefix="b")
    m, nn = reduce_to(r, ["id"]), reduce_to(s, ["id2"])
    base = M.BINARY[op](m, nn)
    v = getattr(ops, op)(r, s, ["id"], ["id2"])
    # for (r*,c*) ops the reduction drops both order parts
    drop = ["id", "id2"] if shape_type(op).rows.value == "r*" else u_prime
    assert np.allclose(reduce_to(v, drop), base, atol=1e-8)


def test_consistency_survives_relational_selection(weather, weather_sel):
    """Fig. 3: inv applied after σ_{T>6am} matches INV of the reduced matrix."""
    n = reduce_to(weather_sel, ["T"])
    assert n.tolist() == [[6.0, 7.0], [8.0, 5.0]]
    v = ops.inv(weather_sel, ["T"])
    assert np.allclose(reduce_to(v, ["T"]), np.linalg.inv(n), atol=1e-8)


def test_example_6_4_rqr(weather):
    """Example 6.4: rqr_T(r) is reducible to RQR(g)."""
    g = reduce_to(weather, ["T"])
    v = ops.rqr(weather, ["T"])
    assert np.allclose(reduce_to(v, ["C"]), M.rqr(g), atol=1e-8)
