"""Unit tests for repro.core.tokenize (cell melt + tokenization strategies)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import tokenize as tk
from repro.oracle import assert_equivalent


@pytest.mark.parametrize(
    "raw,expected",
    [
        ("Hello", "hello"),
        ("  Hello  World ", "hello_world"),
        ("A  B\tC", "a_b_c"),
        ("MiXeD", "mixed"),
        ("already_ok", "already_ok"),
        ("42", "42"),
        ("", None),
        ("   ", None),
        (None, None),
    ],
)
def test_normalize_value(spark, raw, expected):
    df = spark.createDataFrame(pd.DataFrame({"v": [raw]}, dtype=object))
    got = df.select(tk.normalize_value(F.col("v")).alias("n")).first()["n"]
    assert got == expected


@pytest.mark.parametrize(
    "node,kind,stripped",
    [
        ("tt__paul", "token", "paul"),
        ("idx__0_12", "rid", "0_12"),
        ("cid__1_name", "cid", "1_name"),
        ("bare", "token", "bare"),
    ],
)
def test_prefix_helpers(node, kind, stripped):
    assert tk.node_kind(node) == kind
    assert tk.strip_prefix(node) == stripped


def test_make_rid_cid():
    assert tk.make_rid(0, 7) == "idx__0_7"
    assert tk.make_cid(1, "name") == "cid__1_name"


def test_split_words(spark):
    df = spark.createDataFrame(pd.DataFrame({"v": ["a_b_c", "single", "a__b"]}))
    rows = df.select(tk.split_words(F.col("v")).alias("w")).collect()
    assert rows[0]["w"] == ["a", "b", "c"]
    assert rows[1]["w"] == ["single"]
    assert rows[2]["w"] == ["a", "b"]  # empty segments dropped


def test_cells_melts_all_non_null(spark):
    pdf = pd.DataFrame(
        {"rid": [0, 1], "x": ["A", None], "y": ["b c", "d"]}
    )
    out = tk.cells(spark.createDataFrame(pdf), 0).orderBy("rid", "cid").collect()
    assert len(out) == 3  # one null dropped
    assert {r["cid"] for r in out} == {"cid__0_x", "cid__0_y"}
    assert out[0]["rid"] == "idx__0_0"
    vals = {r["value"] for r in out}
    assert vals == {"a", "b_c", "d"}


def test_cells_rid_uses_dataset_index(spark):
    pdf = pd.DataFrame({"rid": [5], "x": ["v"]})
    row = tk.cells(spark.createDataFrame(pdf), 3).first()
    assert row["rid"] == "idx__3_5"
    assert row["cid"] == "cid__3_x"


def test_cells_count_oracle(spark):
    """Cell counts per column match a DuckDB melt (oracle check)."""
    pdf = pd.DataFrame(
        {
            "rid": range(6),
            "a": ["x", "y", None, "x", "z", "y"],
            "b": ["1", None, None, "2", "3", "4"],
        }
    )
    got = (
        tk.cells(spark.createDataFrame(pdf), 0)
        .groupBy("cid")
        .agg(F.count(F.lit(1)).alias("n"))
        .select(F.col("cid"), F.col("n"))
    )
    sql = """
        SELECT 'cid__0_a' AS cid, count(a) AS n FROM t
        UNION ALL
        SELECT 'cid__0_b' AS cid, count(b) AS n FROM t
    """
    assert_equivalent(got, sql, t=pdf)


def test_tokenize_simple_one_token_per_cell(spark):
    pdf = pd.DataFrame({"rid": [0], "x": ["multi word value"]})
    out = tk.tokenize_cells(tk.cells(spark.createDataFrame(pdf), 0), "simple").collect()
    assert len(out) == 1
    assert out[0]["token"] == "tt__multi_word_value"


def test_tokenize_flatten_splits(spark):
    pdf = pd.DataFrame({"rid": [0], "x": ["multi word"], "y": ["solo"]})
    out = tk.tokenize_cells(tk.cells(spark.createDataFrame(pdf), 0), "flatten")
    toks = {r["token"] for r in out.collect()}
    assert toks == {"tt__multi", "tt__word", "tt__solo"}


def test_tokenize_overlap_hybrid(spark):
    a = spark.createDataFrame(pd.DataFrame({"rid": [0], "x": ["shared val"], "y": ["only a"]}))
    b = spark.createDataFrame(pd.DataFrame({"rid": [0], "x": ["shared val"], "y": ["only b"]}))
    ca, cb = tk.cells(a, 0), tk.cells(b, 1)
    shared = tk.shared_values(ca, cb)
    assert [r["value"] for r in shared.collect()] == ["shared_val"]
    toks = {
        r["token"]
        for r in tk.tokenize_cells(ca.unionByName(cb), "overlap", shared).collect()
    }
    # shared value stays whole; dataset-local values are flattened
    assert "tt__shared_val" in toks
    assert {"tt__only", "tt__a", "tt__b"} <= toks
    assert "tt__only_a" not in toks


def test_tokenize_overlap_without_shared_degrades_to_simple(spark):
    pdf = pd.DataFrame({"rid": [0], "x": ["two words"]})
    out = tk.tokenize_cells(tk.cells(spark.createDataFrame(pdf), 0), "overlap", None)
    assert [r["token"] for r in out.collect()] == ["tt__two_words"]


def test_tokenize_rejects_unknown_strategy(spark):
    pdf = pd.DataFrame({"rid": [0], "x": ["v"]})
    with pytest.raises(ValueError, match="unknown tokenization"):
        tk.tokenize_cells(tk.cells(spark.createDataFrame(pdf), 0), "bogus")


def test_token_multiplicity_preserved(spark):
    """The same token twice in a row yields two cell-token rows."""
    pdf = pd.DataFrame({"rid": [0], "x": ["dup"], "y": ["dup"]})
    out = tk.tokenize_cells(tk.cells(spark.createDataFrame(pdf), 0), "simple").collect()
    assert len(out) == 2
    assert all(r["token"] == "tt__dup" for r in out)
