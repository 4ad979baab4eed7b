"""Unary relational matrix operations: schemas, values, origins (Table 2)."""
import numpy as np
import pytest

from repro.core import matrix_ops as M
from repro.core import ops

from helpers import sorted_matrix


@pytest.mark.parametrize("n,k", [(4, 2), (6, 3), (5, 5)])
def test_qqr_schema_and_values(rel_factory, n, k):
    r, m = rel_factory(n, k)
    out = ops.qqr(r, ["id"])
    app = [f"a{j:02d}" for j in range(k)]
    assert out.columns == ["id"] + app  # U ∘ Ū
    assert np.allclose(sorted_matrix(out, ["id"], app), M.qqr(m), atol=1e-8)


@pytest.mark.parametrize("n", [2, 3, 5])
def test_inv_schema_and_values(rel_factory, n):
    r, m = rel_factory(n, n, square=True)
    out = ops.inv(r, ["id"])
    app = [f"a{j:02d}" for j in range(n)]
    assert out.columns == ["id"] + app
    assert np.allclose(sorted_matrix(out, ["id"], app), np.linalg.inv(m), atol=1e-8)


@pytest.mark.parametrize("n", [2, 4])
def test_evc_evl_chf(rel_factory, n):
    r, m = rel_factory(n, n, square=True, spd=True)
    app = [f"a{j:02d}" for j in range(n)]
    evc = ops.evc(r, ["id"])
    assert evc.columns == ["id"] + app
    assert np.allclose(sorted_matrix(evc, ["id"], app), M.evc(m), atol=1e-8)
    evl = ops.evl(r, ["id"])
    assert evl.columns == ["id", "evl"]  # U ∘ (op)
    assert np.allclose(sorted_matrix(evl, ["id"], ["evl"]), M.evl(m), atol=1e-8)
    chf = ops.chf(r, ["id"])
    assert chf.columns == ["id"] + app
    assert np.allclose(sorted_matrix(chf, ["id"], app), M.chf(m), atol=1e-8)


@pytest.mark.parametrize("n,k", [(4, 2), (3, 3)])
def test_tra_schema_and_values(rel_factory, n, k):
    r, m = rel_factory(n, k)
    out = ops.tra(r, ["id"])
    keys = [f"k{i:03d}" for i in range(n)]
    assert out.columns == ["C"] + keys  # (C) ∘ ∇U
    pdf = out.orderBy("C").toPandas()
    assert pdf["C"].tolist() == [f"a{j:02d}" for j in range(k)]  # C values = Ū
    assert np.allclose(pdf[keys].to_numpy(), m.T)


@pytest.mark.parametrize("n,k", [(4, 2), (5, 3)])
def test_rqr_dsv_schema_and_values(rel_factory, n, k):
    r, m = rel_factory(n, k)
    app = [f"a{j:02d}" for j in range(k)]
    for op, base in (("rqr", M.rqr), ("dsv", M.dsv)):
        out = getattr(ops, op)(r, ["id"])
        assert out.columns == ["C"] + app  # (C) ∘ Ū
        pdf = out.orderBy("C").toPandas()
        assert pdf["C"].tolist() == app  # C values = Ū (alphabetical == positional)
        assert np.allclose(pdf[app].to_numpy(), base(m), atol=1e-8)


@pytest.mark.parametrize("n,k", [(3, 2), (4, 4)])
def test_usv_schema_and_values(rel_factory, n, k):
    r, m = rel_factory(n, k)
    out = ops.usv(r, ["id"])
    keys = [f"k{i:03d}" for i in range(n)]
    assert out.columns == ["id"] + keys  # U ∘ ∇U
    assert np.allclose(sorted_matrix(out, ["id"], keys), M.usv(m), atol=1e-8)


@pytest.mark.parametrize("n,k", [(4, 2), (3, 3)])
def test_vsv_schema_and_values(rel_factory, n, k):
    r, m = rel_factory(n, k)
    out = ops.vsv(r, ["id"])
    assert out.columns == ["id", "vsv"]
    assert np.allclose(sorted_matrix(out, ["id"], ["vsv"]), M.vsv(m), atol=1e-8)


def test_det_single_tuple(rel_factory):
    r, m = rel_factory(3, 3, square=True)
    out = ops.det(r, ["id"])
    assert out.columns == ["C", "det"]  # (C, op)
    row = out.collect()[0]
    assert row["C"] == "det"
    assert row["det"] == pytest.approx(np.linalg.det(m))


def test_rnk_single_tuple(rel_factory):
    r, m = rel_factory(5, 3)
    out = ops.rnk(r, ["id"])
    assert out.columns == ["C", "rnk"]
    row = out.collect()[0]
    assert row["C"] == "rnk"
    assert row["rnk"] == 3.0


def test_result_is_unordered_relation(rel_factory):
    """Closedness: the result is a plain DataFrame usable relationally."""
    r, _ = rel_factory(4, 2)
    out = ops.qqr(r, ["id"])
    assert out.filter("a00 > -2").count() <= 4
    assert out.join(r.select("id"), "id").count() == 4


def test_multi_attribute_order_schema(spark):
    import pandas as pd

    r = spark.createDataFrame(
        pd.DataFrame(
            {"g": ["x", "x", "y", "y"], "t": [2, 1, 2, 1], "v": [1.0, 2.0, 3.0, 4.0], "w": [0.5, 0.25, 2.0, 4.0]}
        )
    )
    out = ops.qqr(r, ["g", "t"])
    assert out.columns == ["g", "t", "v", "w"]
    # sorted by (g, t): rows (x,1),(x,2),(y,1),(y,2) → values 2,1,4,3
    m = np.array([[2.0, 0.25], [1.0, 0.5], [4.0, 4.0], [3.0, 2.0]])
    got = out.orderBy("g", "t").toPandas()[["v", "w"]].to_numpy()
    assert np.allclose(got, M.qqr(m), atol=1e-8)


@pytest.mark.parametrize("op", ["tra", "usv"])
def test_unit_order_schema_required(rel_factory, spark, op):
    import pandas as pd

    r = spark.createDataFrame(
        pd.DataFrame({"k1": ["a", "b"], "k2": [1, 2], "v": [1.0, 2.0], "w": [2.0, 1.0]})
    )
    with pytest.raises(ValueError, match="exactly one attribute"):
        getattr(ops, op)(r, ["k1", "k2"])


@pytest.mark.parametrize("op", ["inv", "evc", "evl", "chf", "det"])
def test_square_required(rel_factory, op):
    r, _ = rel_factory(4, 2)
    with pytest.raises(ValueError, match="square"):
        getattr(ops, op)(r, ["id"])
