"""Integration tests: every table harness runs end-to-end at micro scale."""
import pandas as pd
import pytest

from repro.tables.common import MethodCache, RunConfig
from repro.tables.table1 import run_table1
from repro.tables.table2 import run_table2
from repro.tables.table3 import run_table3
from repro.tables.table4 import run_table4
from repro.tables.table5 import run_table5
from repro.tables.table6 import run_table6

RUN = RunConfig(corpus_k=20, max_iter=2, quality_tests=25, scale=0.3, dim=32)


@pytest.fixture(scope="module")
def cache(spark):
    return MethodCache(spark, RUN)


def test_table1(spark):
    df = run_table1(spark, RUN, ["FZ", "MSD"])
    assert list(df["dataset"]) == ["FZ", "MSD"]
    assert set(df.columns) >= {
        "n_tuples", "n_columns", "n_distinct", "n_matches", "n_sentences", "overlap_pct",
    }
    fz = df[df.dataset == "FZ"].iloc[0]
    assert fz["n_tuples"] > 0 and fz["n_matches"] > 0
    assert 0 < fz["overlap_pct"] < 100
    assert pd.isna(df[df.dataset == "MSD"].iloc[0]["overlap_pct"])


def test_table2(spark):
    df = run_table2(spark, RUN, ["FZ"], methods=("Basic", "EmbDI", "Pretrained"))
    assert len(df) == 3
    for col in ("MA", "MR", "MC", "AVG"):
        assert ((df[col].dropna() >= 0) & (df[col].dropna() <= 1)).all()
    # the structural claim: local structure-aware embeddings beat pretrained
    avg = df.set_index("method")["AVG"]
    assert avg["EmbDI"] > avg["Pretrained"]


def test_table3(spark):
    df = run_table3(spark, RUN, ["FZ"], methods=("Base", "EmbDI", "SeepP", "SeepL"))
    assert len(df) == 1
    row = df.iloc[0]
    for m in ("Base", "EmbDI", "SeepP", "SeepL"):
        assert 0 <= row[m] <= 1
    assert row["EmbDI"] >= 0.6


def test_table4(spark):
    df = run_table4(
        spark, RUN, ["FZ"],
        unsup=("fastText", "EmbDI-O"), sup=("DeepERL",),
    )
    row = df.iloc[0]
    assert 0 <= row["fastText"] <= 1
    assert row["EmbDI-O"] >= 0.5
    assert 0 <= row["DeepERL"] <= 1


def test_table5(spark):
    df = run_table5(spark, RUN, scenarios=("FZ",), ntops=(1, 100))
    assert len(df) == 2
    p1 = df[df.n_top == 1].iloc[0]
    p100 = df[df.n_top == 100].iloc[0]
    assert p1["P"] >= p100["P"] - 1e-9
    assert p100["R"] >= p1["R"] - 1e-9


def test_token_matching_exp(spark):
    from repro.tables.token_matching_exp import run_token_matching

    df = run_token_matching(spark, RUN, scenario="IM")
    assert set(df["method"]) == {"Pretrained", "Jaccard", "EmbDI"}
    assert ((df["F"] >= 0) & (df["F"] <= 1)).all()
    # both code-column pairs of IM are evaluated
    assert df["columns"].nunique() == 2


def test_table6(spark):
    df = run_table6(spark, RUN, ["FZ"], include_baselines=False)
    row = df.iloc[0]
    assert row["G"] >= 0 and row["W"] > 0 and row["E"] > 0
    assert row["W+E"] == pytest.approx(row["W"] + row["E"], abs=0.2)
    assert row["n2v_mem_mb"] > 0
