"""Tests for node merging & probabilistic replacement (paper §5.3)."""
import pandas as pd
import pytest

from repro.optimize.merging import merge_values, replacement_table


def test_merge_values_rewrites_synonyms(spark):
    pdf = pd.DataFrame({"rid": [0, 1], "country": ["NL", "France"]})
    out = merge_values(
        spark.createDataFrame(pdf), {"NL": "netherlands"}
    ).orderBy("rid").collect()
    assert out[0]["country"] == "netherlands"
    assert out[1]["country"] == "France"


def test_merge_values_case_insensitive_lookup(spark):
    pdf = pd.DataFrame({"rid": [0], "c": ["  nL "]})
    out = merge_values(spark.createDataFrame(pdf), {"Nl": "netherlands"}).first()
    assert out["c"] == "netherlands"


def test_merge_values_column_restriction(spark):
    pdf = pd.DataFrame({"rid": [0], "a": ["NL"], "b": ["NL"]})
    out = merge_values(spark.createDataFrame(pdf), {"NL": "x"}, columns=["a"]).first()
    assert out["a"] == "x" and out["b"] == "NL"


def test_merge_values_preserves_rid(spark):
    pdf = pd.DataFrame({"rid": [7], "a": ["v"]})
    out = merge_values(spark.createDataFrame(pdf), {"v": "w"}).first()
    assert out["rid"] == 7


def test_replacement_table_symmetric():
    t = replacement_table([("Aa", "Bb", 0.8)])
    assert t["tt__aa"] == ("tt__bb", 0.8)
    assert t["tt__bb"] == ("tt__aa", 0.8)


def test_replacement_table_asymmetric():
    t = replacement_table([("a", "b", 0.5)], symmetric=False)
    assert "tt__b" not in t


def test_replacement_table_normalises_multiword():
    t = replacement_table([("New York", "NY", 1.0)])
    assert t["tt__new_york"] == ("tt__ny", 1.0)


def test_replacement_table_confidence_bounds():
    with pytest.raises(ValueError):
        replacement_table([("a", "b", 1.5)])
