"""Tests for the Basic corpus baseline."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.baselines.basic import basic_corpus
from repro.core.tokenize import cells, tokenize_cells


@pytest.fixture(scope="module")
def tokens(spark):
    pdf = pd.DataFrame(
        {
            "rid": [0, 1, 2],
            "x": ["a", "b", "c"],
            "y": ["p", "q", "p"],
        }
    )
    return tokenize_cells(cells(spark.createDataFrame(pdf), 0), "simple").cache()


def test_row_sentences_contain_rid_and_tokens(spark, tokens):
    corpus = basic_corpus(spark, tokens, target_tokens=600, sent_len=10, seed=0)
    rows = corpus.collect()
    row_sents = [r["sentence"] for r in rows if r["sentence"][0].startswith("idx__")]
    assert row_sents, "no row sentences generated"
    for s in row_sents:
        rid = s[0]
        i = int(rid.split("_")[-1])
        expected = {"tt__" + v for v in [["a", "p"], ["b", "q"], ["c", "p"]][i]}
        assert set(s[1:]) == expected


def test_column_sentences_contain_cid(spark, tokens):
    corpus = basic_corpus(spark, tokens, target_tokens=600, sent_len=10, seed=0)
    col_sents = [
        r["sentence"]
        for r in corpus.collect()
        if any(t.startswith("cid__") for t in r["sentence"])
    ]
    assert col_sents
    for s in col_sents:
        cids = [t for t in s if t.startswith("cid__")]
        assert len(cids) == 1
        cid = cids[0]
        col = cid.split("_")[-1]
        domain = {"x": {"tt__a", "tt__b", "tt__c"}, "y": {"tt__p", "tt__q"}}[col]
        assert set(t for t in s if t.startswith("tt__")) <= domain


def test_corpus_size_near_target(spark, tokens):
    target = 800
    corpus = basic_corpus(spark, tokens, target_tokens=target, sent_len=10, seed=0)
    n_tokens = corpus.select(F.explode("sentence")).count()
    assert n_tokens >= target * 0.8


def test_corpus_deterministic(spark, tokens):
    c1 = sorted(map(tuple, (r["sentence"] for r in basic_corpus(spark, tokens, 400, 8, 5).collect())))
    c2 = sorted(map(tuple, (r["sentence"] for r in basic_corpus(spark, tokens, 400, 8, 5).collect())))
    assert c1 == c2


def test_permutations_vary(spark, tokens):
    """Multiple permutations of the same row are not all identical."""
    pdf = pd.DataFrame({"rid": [0], "a": ["1"], "b": ["2"], "c": ["3"], "d": ["4"]})
    toks = tokenize_cells(cells(spark.createDataFrame(pdf), 0), "simple")
    corpus = basic_corpus(spark, toks, target_tokens=400, sent_len=8, seed=1)
    row_sents = {tuple(r["sentence"]) for r in corpus.collect() if r["sentence"][0].startswith("idx__")}
    assert len(row_sents) > 1
