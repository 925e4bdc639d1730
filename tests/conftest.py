"""Shared expensive fixtures: scenarios and trained embedding spaces.

Word2Vec training dominates test runtime, so anything trained is
session-scoped and reused across test modules.
"""
import pandas as pd
import pytest

from repro.core.embeddings import W2VConfig
from repro.core.pipeline import EmbDIConfig, run_embdi, with_rid
from repro.core.tokenize import cells, shared_values, tokenize_cells
from repro.core.walks import WalkConfig
from repro.scenarios import load_scenario


@pytest.fixture(scope="session")
def tiny_pair(spark):
    """The Figure-1 example: two toy customer tables with rid columns."""
    a = spark.createDataFrame(
        pd.DataFrame(
            {
                "rid": [0, 1, 2],
                "name": ["Paul", "Mike", "Steve"],
                "product": ["iPad 4th", "iPad 4th", "Galaxy"],
            }
        )
    )
    b = spark.createDataFrame(
        pd.DataFrame(
            {
                "rid": [0, 1],
                "name": ["Rick", "Paul"],
                "brand": ["Samsung", "Apple"],
            }
        )
    )
    return a, b


@pytest.fixture(scope="session")
def tiny_tokens(spark, tiny_pair):
    """Overlap-tokenized cells of the tiny pair."""
    a, b = tiny_pair
    ca, cb = cells(a, 0), cells(b, 1)
    shared = shared_values(ca, cb)
    return tokenize_cells(ca.unionByName(cb), "overlap", shared).cache()


@pytest.fixture(scope="session")
def tiny_graph(spark, tiny_tokens):
    from repro.core.graph import build_graph

    return build_graph(spark, tiny_tokens)


@pytest.fixture(scope="session")
def tiny_result(spark, tiny_pair):
    """Full EmbDI run on the tiny pair (fast; walk length 8)."""
    a, b = tiny_pair
    cfg = EmbDIConfig(
        tokenization="overlap",
        walk_length=8,
        corpus_k=30,
        walk=WalkConfig(walk_length=8, seed=3),
        w2v=W2VConfig(dim=16, window=3, seed=3),
    )
    return run_embdi(spark, a, b, cfg)


@pytest.fixture(scope="session")
def fz(spark):
    """FZ scenario at reduced scale — the workhorse integration fixture."""
    return load_scenario(spark, "FZ", scale=0.5)


@pytest.fixture(scope="session")
def fz_result(spark, fz):
    """EmbDI-O with §5.1 defaults on FZ — used by SM/ER/task tests."""
    cfg = EmbDIConfig(
        tokenization="overlap",
        walk_length=40,
        corpus_k=60,
        start_nodes="overlap",
        walk=WalkConfig(walk_length=40, start_with="rid_or_cid", seed=1),
        w2v=W2VConfig(dim=48, window=3, seed=1, max_iter=4),
    )
    return run_embdi(spark, fz.df_a, fz.df_b, cfg)
