"""Tests for the matrix/relation constructors and casts (Sections 3, 4.1)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.constructors import (
    application_schema,
    column_cast,
    matrix_constructor,
    matrix_constructor_complement,
    relation_constructor,
    schema_cast,
    split_sorted,
)


def test_application_schema_order_follows_relation_schema(weather):
    assert application_schema(weather, ["T"]) == ["H", "W"]
    assert application_schema(weather, ["W", "T"]) == ["H"]


def test_application_schema_missing_attr_raises(weather):
    with pytest.raises(ValueError, match="not in schema"):
        application_schema(weather, ["X"])


def test_application_schema_duplicate_attr_raises(weather):
    with pytest.raises(ValueError, match="duplicate"):
        application_schema(weather, ["T", "T"])


def test_matrix_constructor_order_part(weather):
    m = matrix_constructor(weather, ["T"])
    assert m[:, 0].tolist() == ["5am", "6am", "7am", "8am"]


def test_matrix_constructor_complement_fig3(weather_sel):
    # μ̄_T(σ_{T>6am}(r)) = [[6,7],[8,5]] — matrix n of Figure 3.
    n = matrix_constructor_complement(weather_sel, ["T"])
    assert n.tolist() == [[6.0, 7.0], [8.0, 5.0]]


def test_split_sorted_returns_both_parts(weather):
    order, m = split_sorted(weather, ["T"])
    assert order["T"].tolist() == ["5am", "6am", "7am", "8am"]
    assert m.tolist() == [[1.0, 3.0], [1.0, 4.0], [6.0, 7.0], [8.0, 5.0]]


def test_split_sorted_single_app_column_is_2d(weather):
    _, m = split_sorted(weather.select("T", "H"), ["T"])
    assert m.shape == (4, 1)


def test_split_sorted_multi_attr_order_schema(weather):
    order, m = split_sorted(weather, ["H", "T"])
    # sorted by (H, T): (1,5am), (1,6am), (6,7am), (8,8am)
    assert order["T"].tolist() == ["5am", "6am", "7am", "8am"]
    assert m[:, 0].tolist() == [3.0, 4.0, 7.0, 5.0]


def test_column_cast_example_3_1(spark):
    # ∇O = (A, B, C) for relation r of Figure 1.
    r = spark.createDataFrame(
        pd.DataFrame({"O": ["A", "C", "D", "B"], "V": [30, 22, 10, 10], "W": [1, 5, 2, 1]})
    )
    assert column_cast(r, "O") == ["A", "B", "C", "D"]


def test_column_cast_numeric_values_become_names(spark):
    r = spark.createDataFrame(pd.DataFrame({"k": [2.0, 1.0], "v": [1.0, 2.0]}))
    assert column_cast(r, "k") == ["1", "2"]


def test_column_cast_duplicate_values_raise(spark):
    r = spark.createDataFrame(pd.DataFrame({"k": [1, 1], "v": [1.0, 2.0]}))
    with pytest.raises(ValueError, match="duplicate"):
        column_cast(r, "k")


def test_schema_cast_example_3_2():
    # Δ(D,B) is a single-column matrix of the attribute names.
    m = schema_cast(["D", "B"])
    assert m.shape == (2, 1)
    assert m[:, 0].tolist() == ["D", "B"]


def test_relation_constructor_roundtrip(spark, weather):
    order, m = split_sorted(weather, ["T"])
    v = relation_constructor(spark, [order, m], ["T", "H", "W"])
    assert sorted(v.columns) == ["H", "T", "W"]
    got = v.orderBy("T").toPandas()
    assert got["H"].tolist() == [1.0, 1.0, 6.0, 8.0]


def test_relation_constructor_duplicate_schema_raises(spark):
    with pytest.raises(ValueError, match="duplicate"):
        relation_constructor(spark, [np.ones((2, 2))], ["A", "A"])


def test_relation_constructor_row_count_mismatch_raises(spark):
    with pytest.raises(ValueError, match="equal row counts"):
        relation_constructor(spark, [np.ones((2, 1)), np.ones((3, 1))], ["A", "B"])


def test_relation_constructor_schema_arity_mismatch_raises(spark):
    with pytest.raises(ValueError, match="supply"):
        relation_constructor(spark, [np.ones((2, 2))], ["A", "B", "C"])


def test_relation_constructor_mixed_context_and_numeric(spark):
    out = relation_constructor(
        spark,
        [np.array([["x"], ["y"]], dtype=object), np.array([[1.0], [2.0]])],
        ["C", "v"],
    )
    pdf = out.orderBy("C").toPandas()
    assert pdf["C"].tolist() == ["x", "y"]
    assert pdf["v"].tolist() == [1.0, 2.0]
