"""Tests for the simplified HARP baseline (substitution S5)."""
import numpy as np
import pytest

from repro.baselines.harp import coarsen, harp_corpus, run_harp
from repro.core.embeddings import W2VConfig


def test_coarsen_levels_shrink(tiny_graph):
    levels = coarsen(tiny_graph, n_levels=2, seed=0)
    assert len(levels) >= 2
    sizes = [lvl.graph.n_nodes for lvl in levels]
    assert all(a > b for a, b in zip(sizes, sizes[1:]))
    assert levels[0].graph is tiny_graph


def test_coarsen_members_partition(tiny_graph):
    """Each level's member lists partition the finest node set."""
    levels = coarsen(tiny_graph, n_levels=3, seed=0)
    all_names = {str(n) for n in tiny_graph.names}
    for lvl in levels:
        seen: list[str] = []
        for mem in lvl.members.values():
            seen.extend(mem)
        assert sorted(seen) == sorted(all_names)


def test_coarsen_graph_connectivity_preserved(tiny_graph):
    """Coarse graphs keep edges (no isolated supernodes on this graph)."""
    levels = coarsen(tiny_graph, n_levels=2, seed=0)
    for lvl in levels[1:]:
        g = lvl.graph
        deg = g.indptr[1:] - g.indptr[:-1]
        assert (deg > 0).all()


def test_coarsen_weights_conserved(tiny_graph):
    """Contraction only removes self-loop weight, never invents weight."""
    levels = coarsen(tiny_graph, n_levels=2, seed=0)
    w0 = tiny_graph.weights.sum()
    for lvl in levels[1:]:
        assert lvl.graph.weights.sum() <= w0 + 1e-9


def test_harp_corpus_projected_to_fine_names(spark, tiny_graph):
    corpus = harp_corpus(spark, tiny_graph, n_sentences=30, walk_length=6, seed=0)
    names = {str(n) for n in tiny_graph.names}
    for r in corpus.collect():
        for tok in r["sentence"]:
            assert tok in names, f"unprojected supernode {tok} in corpus"


def test_harp_corpus_deterministic(spark, tiny_graph):
    c1 = sorted(map(tuple, (r["sentence"] for r in harp_corpus(spark, tiny_graph, 20, 6, seed=4).collect())))
    c2 = sorted(map(tuple, (r["sentence"] for r in harp_corpus(spark, tiny_graph, 20, 6, seed=4).collect())))
    assert c1 == c2


def test_run_harp_trains(spark, tiny_graph):
    space = run_harp(
        spark, tiny_graph, n_sentences=30, walk_length=6,
        w2v=W2VConfig(dim=8, seed=0), seed=0,
    )
    assert "tt__paul" in space
    assert len(space.rids()) == 5
