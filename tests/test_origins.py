"""Origins of result relations — the paper's worked examples (§4-§6).

Checks Figures 3, 4, 9, 10: row/column origins uniquely label every
result cell and connect it to the argument relation.
"""
import numpy as np
import pytest

from repro.core import ops


def test_fig3_inversion_origins(weather_sel):
    """v = inv_T(σ_{T>6am}(r)): schema preserved, origins label each cell."""
    v = ops.inv(weather_sel, ["T"])
    assert v.columns == ["T", "H", "W"]
    pdf = v.orderBy("T").toPandas()
    assert pdf["T"].tolist() == ["7am", "8am"]
    # Figure 3 reports the inverted values per (time, attribute) origin.
    assert pdf["H"].tolist() == pytest.approx([-0.19230769, 0.30769231])
    assert pdf["W"].tolist() == pytest.approx([0.26923077, -0.23076923])


def test_fig3_origin_connects_argument_and_result(weather_sel):
    """Example 6.5(3): cell (7am, H) of v corresponds to cell (7am, H)=6 of r'."""
    v = ops.inv(weather_sel, ["T"])
    arg = weather_sel.filter("T = '7am'").collect()[0]
    res = v.filter("T = '7am'").collect()[0]
    assert arg["H"] == 6.0
    assert res["H"] == pytest.approx(-0.19230769)


def test_fig4a_qqr(weather):
    """Figure 4a: qqr_T(r) keeps schema (T, H, W) and the T values."""
    q = ops.qqr(weather, ["T"])
    assert q.columns == ["T", "H", "W"]
    pdf = q.orderBy("T").toPandas()
    assert pdf["T"].tolist() == ["5am", "6am", "7am", "8am"]
    got = pdf[["H", "W"]].to_numpy()
    # |Q| matches the paper's Figure 4a up to its 1-decimal rounding
    paper_abs = np.array([[0.1, 0.5], [0.1, 0.7], [0.6, 0.4], [0.8, 0.4]])
    assert np.allclose(np.abs(got), paper_abs, atol=0.06)
    assert np.allclose(got.T @ got, np.eye(2), atol=1e-8)


def test_fig4b_tra(weather):
    """Figure 4b: tra_T(r) has schema (C, 5am, 6am, 7am, 8am); H at 6am is 1."""
    t = ops.tra(weather, ["T"])
    assert t.columns == ["C", "5am", "6am", "7am", "8am"]
    pdf = t.orderBy("C").toPandas()
    assert pdf["C"].tolist() == ["H", "W"]
    assert pdf.set_index("C").loc["H", "6am"] == 1.0  # same fact as in r
    assert pdf.set_index("C").loc["W", "7am"] == 7.0


def test_fig9_rnk_origins(weather):
    """p1 = rnk over π_{W,H}(r) — constant origins ('rnk', value).

    (The paper orders by H; in our instance only W is a key, which the
    key check correctly enforces.)
    """
    p1 = ops.rnk(weather, ["T"])  # application part (H, W): 4×2, rank 2
    row = p1.collect()[0]
    assert p1.columns == ["C", "rnk"]
    assert row["C"] == "rnk"
    assert row["rnk"] == 2.0
    single = ops.rnk(weather.select("W", "H"), ["W"])  # 4×1 → rank 1
    assert single.collect()[0]["rnk"] == 1.0


def test_fig9_usv_origins(weather):
    """p2 = usv_T(r): row origin r.T, column origin ∇T (Example 6.7)."""
    p2 = ops.usv(weather, ["T"])
    assert p2.columns == ["T", "5am", "6am", "7am", "8am"]
    assert sorted(r["T"] for r in p2.collect()) == ["5am", "6am", "7am", "8am"]


def test_fig9_qqr_multiattr_origins(weather):
    """p3 = qqr_{W,T}(r): both W and T form the (composite) row origin."""
    p3 = ops.qqr(weather, ["W", "T"])
    assert p3.columns == ["W", "T", "H"]
    assert p3.count() == 4


def test_example_6_9_tra_tra(weather):
    """tra_C(tra_T(r)) returns the original facts with origins intact."""
    r1 = ops.tra(weather, ["T"])
    r2 = ops.tra(r1, ["C"])
    # schema of the double transpose: (C) ∘ ∇C = (C, H, W)
    assert r2.columns == ["C", "H", "W"]
    pdf = r2.orderBy("C").toPandas()
    assert pdf["C"].tolist() == ["5am", "6am", "7am", "8am"]
    # every original cell is recoverable via its origins
    orig = weather.orderBy("T").toPandas()
    assert pdf["H"].tolist() == orig["H"].tolist()
    assert pdf["W"].tolist() == orig["W"].tolist()


def test_origin_attribute_c_holds_application_schema_names(rel_factory):
    r, _ = rel_factory(4, 3)
    out = ops.rqr(r, ["id"])
    assert sorted(row["C"] for row in out.select("C").collect()) == ["a00", "a01", "a02"]
