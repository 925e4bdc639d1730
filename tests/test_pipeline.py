"""Integration tests for the end-to-end EmbDI pipeline."""
import pytest
from pyspark.sql import functions as F

from repro.core.pipeline import EmbDIConfig, corpus_target_tokens, run_embdi, with_rid
from repro.core.walks import WalkConfig
from repro.core.embeddings import W2VConfig
from repro.synth_data import customer


@pytest.mark.parametrize(
    "n_distinct,n_rows,k,expected",
    [(100, 50, 10, 1500), (0, 10, 5, 50), (7, 3, 1000, 10000)],
)
def test_corpus_target_tokens(n_distinct, n_rows, k, expected):
    assert corpus_target_tokens(n_distinct, n_rows, k) == expected


def test_with_rid_deterministic(spark):
    df = customer(spark, sf=0.001)
    r1 = with_rid(df).select("rid", "c_custkey").orderBy("rid").toPandas()
    r2 = with_rid(df).select("rid", "c_custkey").orderBy("rid").toPandas()
    assert r1.equals(r2)
    assert list(r1["rid"]) == list(range(len(r1)))


def test_result_vocab_complete(tiny_result):
    """min_count=1 + simple/overlap: every RID and CID has a vector."""
    space = tiny_result.space
    assert len(space.rids(0)) == 3
    assert len(space.rids(1)) == 2
    assert len(space.cids(0)) == 2
    assert len(space.cids(1)) == 2
    assert len(space.tokens()) >= 8


def test_result_counts(tiny_result):
    assert tiny_result.n_rows == 5
    assert tiny_result.n_distinct_values == 8
    target = corpus_target_tokens(8, 5, 30)
    assert tiny_result.n_sentences >= target // 8  # walk_length=8


def test_result_timings(tiny_result):
    assert set(tiny_result.timings) == {"G", "W", "E"}
    assert all(v >= 0 for v in tiny_result.timings.values())


def test_result_stats(tiny_result):
    assert tiny_result.stats["n_rid_nodes"] == 5
    assert tiny_result.stats["n_cid_nodes"] == 4


def test_single_dataset_mode(spark, tiny_pair):
    a, _ = tiny_pair
    cfg = EmbDIConfig(
        tokenization="simple", walk_length=6, corpus_k=20,
        walk=WalkConfig(walk_length=6, seed=0),
        w2v=W2VConfig(dim=8, seed=0),
    )
    res = run_embdi(spark, a, None, cfg)
    assert len(res.space.rids(0)) == 3
    assert res.space.rids(1) == []


def test_overlap_starts_fallback_when_disjoint(spark):
    """No shared tokens: overlap start-restriction falls back to all nodes."""
    import pandas as pd

    a = spark.createDataFrame(pd.DataFrame({"rid": [0], "x": ["aaa"]}))
    b = spark.createDataFrame(pd.DataFrame({"rid": [0], "x": ["bbb"]}))
    cfg = EmbDIConfig(
        tokenization="simple", walk_length=4, corpus_k=20, start_nodes="overlap",
        walk=WalkConfig(walk_length=4, seed=0),
        w2v=W2VConfig(dim=8, seed=0),
    )
    res = run_embdi(spark, a, b, cfg)
    assert res.n_sentences > 0
    assert "tt__aaa" in res.space and "tt__bbb" in res.space


def test_pipeline_deterministic(spark, tiny_pair):
    import numpy as np

    a, b = tiny_pair
    cfg = EmbDIConfig(
        tokenization="overlap", walk_length=6, corpus_k=20,
        walk=WalkConfig(walk_length=6, seed=2),
        w2v=W2VConfig(dim=8, seed=2, num_partitions=1),
    )
    r1 = run_embdi(spark, a, b, cfg)
    r2 = run_embdi(spark, a, b, cfg)
    assert sorted(r1.space.words) == sorted(r2.space.words)
    for w in r1.space.words:
        assert np.allclose(r1.space.vec(w), r2.space.vec(w))
