"""Tests for missing-data handling + FD Skolemization (paper §5.2)."""
import pandas as pd
import pytest

from repro.optimize.missing import (
    fill_nulls_single,
    fill_nulls_unique,
    skolemize_fd,
)


def test_fill_nulls_unique(spark):
    pdf = pd.DataFrame({"rid": [0, 1], "x": ["v", None]})
    out = fill_nulls_unique(spark.createDataFrame(pdf)).orderBy("rid").collect()
    assert out[0]["x"] == "v"
    assert out[1]["x"] == "null_x_1"


def test_fill_nulls_unique_distinct_per_cell(spark):
    pdf = pd.DataFrame({"rid": [0, 1], "x": [None, None], "y": [None, "v"]})
    out = fill_nulls_unique(spark.createDataFrame(pdf)).orderBy("rid").collect()
    placeholders = {out[0]["x"], out[1]["x"], out[0]["y"]}
    assert len(placeholders) == 3


def test_fill_nulls_single(spark):
    pdf = pd.DataFrame({"rid": [0, 1], "x": [None, None]})
    out = fill_nulls_single(spark.createDataFrame(pdf)).collect()
    assert {r["x"] for r in out} == {"null"}


def test_skolemize_paper_example(spark):
    """§5.2: R1(a, N1, c, N2), R2(a, b, c', N3) with key A1 ⇒
    conflicting A3 values merge into one Skolem; A4 nulls merge too."""
    r1 = spark.createDataFrame(
        pd.DataFrame({"rid": [0], "A1": ["a"], "A2": [None], "A3": ["c"], "A4": [None]})
    )
    r2 = spark.createDataFrame(
        pd.DataFrame({"rid": [0], "A1": ["a"], "A2": ["b"], "A3": ["c2"], "A4": [None]})
    )
    out1, out2 = skolemize_fd(r1, r2, lhs=["A1"], rhs="A3")
    v1, v2 = out1.first()["A3"], out2.first()["A3"]
    assert v1 == v2
    assert v1.startswith("sk_")
    # A4 under the same FD: both nulls -> same skolem
    out1, out2 = skolemize_fd(r1, r2, lhs=["A1"], rhs="A4")
    assert out1.first()["A4"] == out2.first()["A4"]
    assert out1.first()["A4"].startswith("sk_")


def test_skolemize_clean_groups_untouched(spark):
    r1 = spark.createDataFrame(
        pd.DataFrame({"rid": [0, 1], "k": ["k1", "k2"], "v": ["same", "x"]})
    )
    r2 = spark.createDataFrame(
        pd.DataFrame({"rid": [0], "k": ["k1"], "v": ["same"]})
    )
    out1, out2 = skolemize_fd(r1, r2, lhs=["k"], rhs="v")
    rows1 = {r["k"]: r["v"] for r in out1.collect()}
    assert rows1["k1"] == "same"
    assert rows1["k2"] == "x"
    assert out2.first()["v"] == "same"


def test_skolemize_normalised_key_grouping(spark):
    """Keys matching after normalisation ('A B' vs 'a  b') are one group."""
    r1 = spark.createDataFrame(pd.DataFrame({"rid": [0], "k": ["A B"], "v": ["x"]}))
    r2 = spark.createDataFrame(pd.DataFrame({"rid": [0], "k": ["a  b"], "v": ["y"]}))
    out1, out2 = skolemize_fd(r1, r2, lhs=["k"], rhs="v")
    assert out1.first()["v"] == out2.first()["v"]


def test_skolemize_different_column_names(spark):
    r1 = spark.createDataFrame(pd.DataFrame({"rid": [0], "key": ["a"], "val": ["x"]}))
    r2 = spark.createDataFrame(pd.DataFrame({"rid": [0], "k": ["a"], "v": ["y"]}))
    out1, out2 = skolemize_fd(r1, r2, lhs=["key"], rhs="val", lhs_b=["k"], rhs_b="v")
    assert out1.first()["val"] == out2.first()["v"]


def test_skolemize_single_relation(spark):
    r1 = spark.createDataFrame(
        pd.DataFrame({"rid": [0, 1], "k": ["a", "a"], "v": ["x", None]})
    )
    out1, out2 = skolemize_fd(r1, None, lhs=["k"], rhs="v")
    assert out2 is None
    vals = {r["v"] for r in out1.collect()}
    assert len(vals) == 1 and next(iter(vals)).startswith("sk_")


def test_skolemize_distinct_groups_get_distinct_skolems(spark):
    r1 = spark.createDataFrame(
        pd.DataFrame(
            {"rid": [0, 1, 2, 3], "k": ["a", "a", "b", "b"], "v": ["x", "y", "p", "q"]}
        )
    )
    out1, _ = skolemize_fd(r1, None, lhs=["k"], rhs="v")
    vals = {r["k"]: r["v"] for r in out1.collect()}
    assert vals["a"] != vals["b"]
    assert vals["a"].startswith("sk_") and vals["b"].startswith("sk_")
