"""Tests for the Node2Vec baseline (substitution S4)."""
import numpy as np
import pytest

from repro.baselines.node2vec import (
    alias_table_bytes,
    node2vec_walk_config,
    run_node2vec,
)
from repro.core.embeddings import W2VConfig


def test_walk_config_defaults():
    cfg = node2vec_walk_config(walk_length=12, p=0.5, q=2.0, seed=3)
    assert cfg.mode == "node2vec"
    assert cfg.start_with == "none"
    assert (cfg.p, cfg.q, cfg.walk_length, cfg.seed) == (0.5, 2.0, 12, 3)


def test_alias_table_bytes_formula(tiny_graph):
    g = tiny_graph
    deg = g.indptr[1:] - g.indptr[:-1]
    expected = int(np.sum(deg[g.indices])) * 72
    assert alias_table_bytes(g) == expected
    assert alias_table_bytes(g) > 0


def test_alias_bytes_grow_superlinearly_with_density(spark):
    """Dense graphs blow up the second-order state (the paper's `mem`)."""
    import pandas as pd

    from repro.core.graph import build_graph
    from repro.core.tokenize import cells, tokenize_cells

    def graph(n_rows, n_cols):
        pdf = pd.DataFrame({"rid": range(n_rows)})
        for c in range(n_cols):
            pdf[f"c{c}"] = [f"v{c}_{i}" for i in range(n_rows)]
        return build_graph(
            spark, tokenize_cells(cells(spark.createDataFrame(pdf), 0), "simple")
        )

    small = alias_table_bytes(graph(10, 2))
    big = alias_table_bytes(graph(40, 2))
    # 4x nodes -> ~16x alias entries (CID hubs are 4x bigger on both sides)
    assert big > small * 8


def test_run_node2vec_trains(spark, tiny_graph):
    space, walks = run_node2vec(
        spark, tiny_graph, n_sentences=20, walk_length=6,
        w2v=W2VConfig(dim=8, seed=0), seed=0,
    )
    assert len(space) == tiny_graph.n_nodes
    assert "tt__paul" in space
    walks.unpersist()
