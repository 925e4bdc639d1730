"""Sentence construction by random walks (paper §4.2, Algorithm 2).

Two walkers are provided:

* :func:`generate_walks` — the production path. The CSR graph is broadcast
  and walks are generated inside an Arrow ``mapInPandas`` kernel, fanning
  out over executors; one output row per sentence. Supports the paper's
  uniform weighted walk, the node2vec second-order (p, q) walk used by the
  Node2Vec baseline, Algorithm 2's "start from a neighbouring RID" sentence
  prefix, and §5.3's probabilistic node replacement (replacement changes
  only the *emitted* sentence, never the walk position).
* :func:`generate_walks_join` — a pure-DataFrame iterative-join walker
  (one shuffle join per step). It exists to cross-validate the kernel on
  small graphs; a 60-step walk would cost 60 shuffles per corpus, so the
  broadcast kernel is the default (DESIGN.md §3).

Walk budgeting follows §5.1: every start node is the origin of the same
number of walks (``ceil(n_sentences / n_starts)``), which guarantees rare
tokens at least their budget.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import Iterable, Iterator, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.graph import CSRGraph

SENTENCE_SCHEMA = "walk_id long, sentence array<string>"


@dataclass(frozen=True)
class WalkConfig:
    """Knobs of the sentence-construction stage.

    ``start_with='rid'`` reproduces Algorithm 2 (the first emitted word is a
    random neighbouring RID of the start node); ``'rid_or_cid'`` is §5.1's
    variant for overlapping tokens; ``'none'`` starts at the node itself.
    ``replacements`` maps node name → (replacement node name, probability)
    for §5.3 node replacement.
    """

    walk_length: int = 60
    mode: str = "uniform"  # "uniform" | "node2vec"
    p: float = 1.0
    q: float = 1.0
    start_with: str = "rid"
    seed: int = 0
    replacements: dict = field(default_factory=dict)

    def __post_init__(self):
        if self.mode not in ("uniform", "node2vec"):
            raise ValueError(f"unknown walk mode {self.mode!r}")
        if self.start_with not in ("none", "rid", "rid_or_cid"):
            raise ValueError(f"unknown start_with {self.start_with!r}")
        if self.walk_length < 2:
            raise ValueError("walk_length must be >= 2")


def walk_budget(n_sentences: int, n_starts: int) -> int:
    """Per-start-node walk count guaranteeing full coverage (§5.1)."""
    if n_starts <= 0:
        raise ValueError("need at least one start node")
    return max(1, math.ceil(n_sentences / n_starts))


def build_starts(
    spark: SparkSession, start_ids: Sequence[int], n_sentences: int
) -> DataFrame:
    """Replicate every start node to its walk budget.

    Returns ``(walk_id, start_id)``; ``walk_id`` doubles as the per-walk RNG
    stream id, so the corpus is independent of partitioning.
    """
    ids = np.asarray(sorted(start_ids), dtype=np.int64)
    budget = walk_budget(n_sentences, len(ids))
    rep = np.tile(ids, budget)
    pdf = pd.DataFrame({"walk_id": np.arange(len(rep), dtype=np.int64), "start_id": rep})
    n_parts = max(2, spark.sparkContext.defaultParallelism)
    return spark.createDataFrame(pdf).repartition(n_parts, "walk_id")


def _sample_neighbor(g: CSRGraph, node: int, rng: np.random.Generator) -> int:
    lo, hi = g.indptr[node], g.indptr[node + 1]
    if lo == hi:
        return -1
    r = rng.random() * g.cum_weights[hi - 1]
    return int(g.indices[lo + np.searchsorted(g.cum_weights[lo:hi], r, side="right")])


def _sample_node2vec(
    g: CSRGraph, prev: int, node: int, rng: np.random.Generator, p: float, q: float
) -> int:
    lo, hi = g.indptr[node], g.indptr[node + 1]
    if lo == hi:
        return -1
    cand = g.indices[lo:hi]
    w = g.weights[lo:hi].copy()
    plo, phi = g.indptr[prev], g.indptr[prev + 1]
    prev_nbrs = g.indices[plo:phi]
    # second-order bias: 1/p to return, 1 to stay in N(prev), 1/q to explore
    if len(prev_nbrs):
        pos = np.clip(np.searchsorted(prev_nbrs, cand), 0, len(prev_nbrs) - 1)
        shared = prev_nbrs[pos] == cand
    else:
        shared = np.zeros(len(cand), dtype=bool)
    bias = np.where(cand == prev, 1.0 / p, np.where(shared, 1.0, 1.0 / q))
    w *= bias
    cum = np.cumsum(w)
    r = rng.random() * cum[-1]
    return int(cand[np.searchsorted(cum, r, side="right")])


def _pick_prefix(g: CSRGraph, node: int, rng: np.random.Generator, start_with: str) -> int:
    """Random neighbouring RID (or RID/CID) of ``node`` for the sentence head."""
    lo, hi = g.indptr[node], g.indptr[node + 1]
    nbrs = g.indices[lo:hi]
    if start_with == "rid":
        pool = nbrs[g.kinds[nbrs] == 1]
    else:
        pool = nbrs[g.kinds[nbrs] != 0]
    if len(pool) == 0:
        return -1
    return int(pool[rng.integers(0, len(pool))])


def _make_kernel(g: CSRGraph, cfg: WalkConfig):
    """Arrow kernel closure: batches of (walk_id, start_id) → sentences."""
    repl_target = np.full(g.n_nodes, -1, dtype=np.int64)
    repl_prob = np.zeros(g.n_nodes, dtype=np.float64)
    for name, (other, prob) in cfg.replacements.items():
        try:
            i, j = g.id_of(name), g.id_of(other)
        except KeyError:
            continue  # replacement partner absent from this graph
        repl_target[i] = j
        repl_prob[i] = prob
    has_repl = bool(cfg.replacements)

    def emit(node: int, rng: np.random.Generator) -> str:
        if has_repl and repl_prob[node] > 0 and rng.random() < repl_prob[node]:
            return g.names[repl_target[node]]
        return g.names[node]

    def kernel(batches: Iterable[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            out_ids, out_sentences = [], []
            for walk_id, start in zip(
                pdf["walk_id"].to_numpy(), pdf["start_id"].to_numpy()
            ):
                rng = np.random.default_rng([cfg.seed, int(walk_id)])
                sent: list[str] = []
                if cfg.start_with != "none" and g.kinds[start] == 0:
                    head = _pick_prefix(g, int(start), rng, cfg.start_with)
                    if head >= 0:
                        sent.append(emit(head, rng))
                prev, cur = -1, int(start)
                sent.append(emit(cur, rng))
                while len(sent) < cfg.walk_length:
                    if cfg.mode == "node2vec" and prev >= 0:
                        nxt = _sample_node2vec(g, prev, cur, rng, cfg.p, cfg.q)
                    else:
                        nxt = _sample_neighbor(g, cur, rng)
                    if nxt < 0:
                        break  # isolated node: sentence ends early
                    sent.append(emit(nxt, rng))
                    prev, cur = cur, nxt
                out_ids.append(walk_id)
                out_sentences.append(sent)
            yield pd.DataFrame({"walk_id": out_ids, "sentence": out_sentences})

    return kernel


def generate_walks(
    spark: SparkSession,
    graph: CSRGraph,
    cfg: WalkConfig,
    n_sentences: int,
    start_nodes: Sequence[str] | None = None,
) -> DataFrame:
    """Materialise the walk corpus as ``(walk_id, sentence: array<string>)``.

    ``start_nodes`` restricts walk origins (§5.1's overlap optimisation);
    ``None`` starts from every node. The CSR graph is broadcast implicitly
    through closure capture — Spark serialises it once per executor.
    """
    if start_nodes is None:
        start_ids = np.arange(graph.n_nodes)
    else:
        start_ids = np.array(sorted({graph.id_of(s) for s in start_nodes}), dtype=np.int64)
    # nodes with no edges can never walk
    deg = graph.indptr[1:] - graph.indptr[:-1]
    start_ids = start_ids[deg[start_ids] > 0]
    starts = build_starts(spark, start_ids, n_sentences)
    return starts.mapInPandas(_make_kernel(graph, cfg), schema=SENTENCE_SCHEMA)


def adjacency_df(spark: SparkSession, graph: CSRGraph) -> DataFrame:
    """Adjacency as ``(node, nbrs array<string>)`` for the join walker."""
    rows = []
    for i in range(graph.n_nodes):
        nbrs = [graph.names[j] for j in graph.neighbors(i)]
        if nbrs:
            rows.append((graph.names[i], nbrs))
    return spark.createDataFrame(rows, "node string, nbrs array<string>")


def generate_walks_join(
    spark: SparkSession,
    graph: CSRGraph,
    walk_length: int,
    n_sentences: int,
    seed: int = 0,
    start_nodes: Sequence[str] | None = None,
) -> DataFrame:
    """Pure-DataFrame walker: one shuffle join per step (validation path).

    Uniform over *distinct* neighbours (unweighted) and without sentence
    prefixes — used only to cross-check the kernel walker's transition
    validity on small graphs, not to build production corpora.
    """
    adj = adjacency_df(spark, graph).cache()
    names = (
        [graph.names[i] for i in range(graph.n_nodes) if graph.degree(i) > 0]
        if start_nodes is None
        else sorted(start_nodes)
    )
    budget = walk_budget(n_sentences, len(names))
    starts = spark.createDataFrame(
        [(i, n) for i, n in enumerate(names * budget)], "walk_id long, cur string"
    ).withColumn("sentence", F.array(F.col("cur")))
    walks = starts
    for step in range(walk_length - 1):
        walks = (
            walks.join(adj, on=walks["cur"] == adj["node"], how="inner")
            .withColumn(
                "nxt",
                F.element_at(
                    "nbrs",
                    (F.floor(F.rand(seed + step) * F.size("nbrs")) + 1).cast("int"),
                ),
            )
            .select(
                "walk_id",
                F.col("nxt").alias("cur"),
                F.concat("sentence", F.array("nxt")).alias("sentence"),
            )
        )
        if (step + 1) % 8 == 0:
            walks = walks.localCheckpoint(eager=False)
    return walks.select("walk_id", "sentence")
