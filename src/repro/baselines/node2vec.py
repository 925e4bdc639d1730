"""Node2Vec baseline (Grover & Leskovec 2016; substitution S4 in DESIGN.md).

Runs second-order (p, q)-biased random walks over the *same* tripartite
graph EmbDI builds ("All local methods make use of our tripartite graph",
§7) and trains the same MLlib Word2Vec. The walk kernel in
``repro.core.walks`` implements the exact return/in-out bias of the
reference algorithm; like the reference defaults we use p = q = 1 and no
sentence prefixes.

``alias_table_bytes`` estimates the reference implementation's
pre-computed second-order transition tables (one alias table per directed
edge, sized by the destination's degree). That quadratic-in-degree state
is what produced the paper's ``mem`` failures on larger datasets; the
Table 6 harness reports this estimate next to our measured runtime so the
memory-blowup *shape* of the comparison is preserved without crashing the
suite.
"""
from __future__ import annotations

import math

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.core.embeddings import EmbeddingSpace, W2VConfig, train_word2vec
from repro.core.graph import CSRGraph
from repro.core.walks import WalkConfig, generate_walks


def node2vec_walk_config(
    walk_length: int = 60, p: float = 1.0, q: float = 1.0, seed: int = 0
) -> WalkConfig:
    """Reference-default walk configuration (uniform first step, (p,q) bias)."""
    return WalkConfig(
        walk_length=walk_length, mode="node2vec", p=p, q=q, start_with="none", seed=seed
    )


def run_node2vec(
    spark: SparkSession,
    graph: CSRGraph,
    n_sentences: int,
    walk_length: int = 60,
    p: float = 1.0,
    q: float = 1.0,
    w2v: W2VConfig = W2VConfig(),
    seed: int = 0,
) -> tuple[EmbeddingSpace, DataFrame]:
    """Train node2vec embeddings on an EmbDI graph; returns (space, walks)."""
    cfg = node2vec_walk_config(walk_length, p, q, seed)
    walks = generate_walks(spark, graph, cfg, n_sentences).cache()
    walks.count()
    space = train_word2vec(walks, w2v)
    return space, walks


def alias_table_bytes(graph: CSRGraph) -> int:
    """Reference-impl memory estimate for second-order alias tables.

    The original node2vec preprocesses, for every directed edge (u, v), an
    alias table over N(v) — Σ_(u,v) deg(v) entries, ~16 bytes each (an
    int + a float per slot) plus python-object overhead (~56 bytes/entry
    in practice). This is the term that explodes on dense graphs.
    """
    deg = graph.indptr[1:] - graph.indptr[:-1]
    entries = int(np.sum(deg[graph.indices]))
    return entries * 72
