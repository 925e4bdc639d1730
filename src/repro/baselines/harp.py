"""Simplified HARP baseline (Chen et al. 2017; substitution S5 in DESIGN.md).

HARP is a meta-strategy: coarsen the graph into a hierarchy, embed the
coarsest level, and prolong the embedding down the hierarchy so that
higher-order structure survives. MLlib Word2Vec cannot warm-start from a
prior embedding, so prolongation-by-initialisation is replaced with
prolongation-by-corpus: walks are generated at *every* level and coarse
walks are projected back to finest-level nodes (each supernode emits a
random member), then one Word2Vec run trains on the pooled corpus. The
coarse-level walks inject exactly the higher-order co-occurrence HARP's
initialisation would.

Coarsening = star collapsing (degree-1 leaves of a hub merge pairwise)
followed by weighted edge collapsing (greedy maximal matching), per the
original paper's two phases. Coarsening itself runs driver-side on the
CSR arrays (the graph is small; the corpus is the big object).
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass
from typing import Iterable, Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.embeddings import EmbeddingSpace, W2VConfig, train_word2vec
from repro.core.graph import CSRGraph
from repro.core.walks import SENTENCE_SCHEMA, WalkConfig, generate_walks


@dataclass
class CoarseLevel:
    """One hierarchy level: its graph + member lists down to the finest names."""

    graph: CSRGraph
    members: dict[str, list[str]]  # level node name -> finest-level node names


def _edges_from_csr(g: CSRGraph) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Directed (src, dst, w) arrays of a CSR graph."""
    n = g.n_nodes
    src = np.repeat(np.arange(n), g.indptr[1:] - g.indptr[:-1])
    return src, g.indices.copy(), g.weights.copy()


def _csr_from_edges(
    n: int, src: np.ndarray, dst: np.ndarray, w: np.ndarray, names: np.ndarray
) -> CSRGraph:
    order = np.lexsort((dst, src))
    src, dst, w = src[order], dst[order], w[order]
    indptr = np.zeros(n + 1, dtype=np.int64)
    np.add.at(indptr, src + 1, 1)
    indptr = np.cumsum(indptr)
    cum = np.empty_like(w, dtype=np.float64)
    for i in range(n):
        lo, hi = indptr[i], indptr[i + 1]
        cum[lo:hi] = np.cumsum(w[lo:hi])
    kinds = np.zeros(n, dtype=np.int8)  # supernodes have no RID/CID identity
    return CSRGraph(
        indptr=indptr, indices=dst.astype(np.int64), weights=w.astype(np.float64),
        cum_weights=cum, names=names, kinds=kinds,
    )


def _star_collapse_assign(g: CSRGraph) -> np.ndarray:
    """Pair up degree-1 leaves that hang off the same hub."""
    n = g.n_nodes
    comp = np.arange(n)
    deg = g.indptr[1:] - g.indptr[:-1]
    leaves_by_hub: dict[int, list[int]] = {}
    for u in range(n):
        if deg[u] == 1:
            hub = int(g.indices[g.indptr[u]])
            leaves_by_hub.setdefault(hub, []).append(u)
    for hub, leaves in leaves_by_hub.items():
        for i in range(0, len(leaves) - 1, 2):
            comp[leaves[i + 1]] = leaves[i]
    return comp


def _edge_collapse_assign(g: CSRGraph, rng: np.random.Generator) -> np.ndarray:
    """Greedy maximal matching on edge weight; matched pairs merge."""
    n = g.n_nodes
    comp = np.arange(n)
    matched = np.zeros(n, dtype=bool)
    order = rng.permutation(n)
    for u in order:
        if matched[u]:
            continue
        lo, hi = g.indptr[u], g.indptr[u + 1]
        best, best_w = -1, -1.0
        for k in range(lo, hi):
            v = int(g.indices[k])
            if v != u and not matched[v] and g.weights[k] > best_w:
                best, best_w = v, float(g.weights[k])
        if best >= 0:
            matched[u] = matched[best] = True
            comp[best] = u
    return comp


def _apply_assign(
    g: CSRGraph, comp: np.ndarray, level: int, members: dict[str, list[str]]
) -> tuple[CSRGraph, dict[str, list[str]]]:
    """Contract ``comp`` (node → representative) into a new level graph."""
    reps = np.unique(comp)
    remap = np.full(g.n_nodes, -1, dtype=np.int64)
    remap[reps] = np.arange(len(reps))
    new_ids = remap[comp]
    new_names = np.array([f"h{level}_{i}" for i in range(len(reps))], dtype=object)
    new_members: dict[str, list[str]] = {str(nm): [] for nm in new_names}
    for u in range(g.n_nodes):
        new_members[str(new_names[new_ids[u]])].extend(members[str(g.names[u])])
    src, dst, w = _edges_from_csr(g)
    src, dst = new_ids[src], new_ids[dst]
    keep = src != dst  # drop self-loops from contraction
    src, dst, w = src[keep], dst[keep], w[keep]
    key = src * len(reps) + dst
    uniq, inv = np.unique(key, return_inverse=True)
    agg_w = np.zeros(len(uniq))
    np.add.at(agg_w, inv, w)
    new_g = _csr_from_edges(
        len(reps), (uniq // len(reps)).astype(np.int64),
        (uniq % len(reps)).astype(np.int64), agg_w, new_names,
    )
    return new_g, new_members


def coarsen(graph: CSRGraph, n_levels: int = 2, seed: int = 0) -> list[CoarseLevel]:
    """Build the hierarchy: level 0 is the input graph."""
    members0 = {str(n): [str(n)] for n in graph.names}
    levels = [CoarseLevel(graph, members0)]
    g, members = graph, members0
    rng = np.random.default_rng(seed)
    for lvl in range(1, n_levels + 1):
        comp = _star_collapse_assign(g)
        g1, members1 = _apply_assign(g, comp, lvl * 2 - 1, members)
        comp2 = _edge_collapse_assign(g1, rng)
        g2, members2 = _apply_assign(g1, comp2, lvl * 2, members1)
        if g2.n_nodes >= g.n_nodes or g2.n_nodes < 8:
            break
        levels.append(CoarseLevel(g2, members2))
        g, members = g2, members2
    return levels


def _project_kernel(members: dict[str, list[str]], seed: int):
    """Replace supernode names in sentences with random member names."""

    def kernel(batches: Iterable[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            out = []
            for walk_id, sent in zip(pdf["walk_id"], pdf["sentence"]):
                rng = np.random.default_rng([seed, zlib.crc32(str(walk_id).encode())])
                proj = []
                for tok in sent:
                    mem = members.get(tok)
                    proj.append(tok if mem is None else mem[int(rng.integers(0, len(mem)))])
                out.append(proj)
            yield pd.DataFrame({"walk_id": pdf["walk_id"], "sentence": out})

    return kernel


def harp_corpus(
    spark: SparkSession,
    graph: CSRGraph,
    n_sentences: int,
    walk_length: int = 60,
    n_levels: int = 2,
    seed: int = 0,
) -> DataFrame:
    """Pooled multi-level corpus: budget split evenly across levels."""
    levels = coarsen(graph, n_levels, seed)
    per_level = max(1, n_sentences // len(levels))
    parts = []
    for i, lvl in enumerate(levels):
        cfg = WalkConfig(walk_length=walk_length, mode="uniform", start_with="none", seed=seed + i)
        walks = generate_walks(spark, lvl.graph, cfg, per_level)
        if i > 0:
            walks = walks.mapInPandas(
                _project_kernel(lvl.members, seed + 100 + i), schema=SENTENCE_SCHEMA
            )
        parts.append(walks)
    corpus = parts[0]
    for p in parts[1:]:
        corpus = corpus.unionByName(p)
    return corpus


def run_harp(
    spark: SparkSession,
    graph: CSRGraph,
    n_sentences: int,
    walk_length: int = 60,
    n_levels: int = 2,
    w2v: W2VConfig = W2VConfig(),
    seed: int = 0,
) -> EmbeddingSpace:
    """Full HARP baseline: hierarchy → pooled corpus → one Word2Vec run."""
    corpus = harp_corpus(spark, graph, n_sentences, walk_length, n_levels, seed).cache()
    corpus.count()
    space = train_word2vec(corpus, w2v)
    corpus.unpersist()
    return space
