"""Tripartite graph construction (paper §4.1, Algorithm 1) as DataFrame ops.

The graph has token, RID and CID nodes; every ``(rid, cid, token)`` row of
the tokenized cell frame contributes a token↔RID edge and a token↔CID edge.
Multiplicity (the same token twice in a row) becomes an edge *weight*, which
the walkers sample proportionally — equivalent to the multigraph the paper's
pseudocode builds.

Node ids are assigned deterministically (dense ranks over sorted node name)
so corpora are reproducible across runs. The compact CSR form handed to the
walk kernel is collected on the driver and broadcast: the graph is orders of
magnitude smaller than the corpus it generates (DESIGN.md §3).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.tokenize import CID_PREFIX, RID_PREFIX


def build_edges(tokens: DataFrame) -> DataFrame:
    """Undirected weighted edge list ``(u, v, weight)`` from tokenized cells.

    Each edge appears once with ``u < v`` lexicographically; ``weight`` is
    the number of cell occurrences backing it.
    """
    tr = tokens.select(F.col("token").alias("a"), F.col("rid").alias("b"))
    tc = tokens.select(F.col("token").alias("a"), F.col("cid").alias("b"))
    return (
        tr.unionByName(tc)
        .select(
            F.least("a", "b").alias("u"),
            F.greatest("a", "b").alias("v"),
        )
        .groupBy("u", "v")
        .agg(F.count(F.lit(1)).alias("weight"))
    )


def node_ids(edges: DataFrame) -> DataFrame:
    """Deterministic dense ids for every node touched by ``edges``.

    Returns ``(node, node_id)`` with ids ``0..n-1`` assigned in sorted node
    order (single global sort — vocabularies at reproduction scale are well
    under 10⁶ nodes, see DESIGN.md §5).
    """
    nodes = edges.select(F.col("u").alias("node")).unionByName(
        edges.select(F.col("v").alias("node"))
    ).distinct()
    w = Window.orderBy("node")
    return nodes.select(
        "node", (F.row_number().over(w) - 1).alias("node_id")
    )


@dataclass(frozen=True)
class CSRGraph:
    """Driver-side compact adjacency, ready to broadcast to walk kernels.

    ``indptr``/``indices``/``weights`` are the usual CSR triplet;
    ``cum_weights`` holds per-row cumulative edge weights for O(log deg)
    weighted sampling; ``names`` maps node_id → prefixed node name and
    ``kinds`` holds 0=token, 1=RID, 2=CID. Within each row ``indices`` is
    sorted, so neighbourhood membership tests are O(log deg).
    """

    indptr: np.ndarray
    indices: np.ndarray
    weights: np.ndarray
    cum_weights: np.ndarray
    names: np.ndarray
    kinds: np.ndarray

    @property
    def n_nodes(self) -> int:
        return len(self.names)

    @property
    def n_edges(self) -> int:
        """Undirected edge count (each stored twice in CSR)."""
        return len(self.indices) // 2

    def neighbors(self, node_id: int) -> np.ndarray:
        return self.indices[self.indptr[node_id]: self.indptr[node_id + 1]]

    def degree(self, node_id: int) -> int:
        return int(self.indptr[node_id + 1] - self.indptr[node_id])

    def id_of(self, name: str) -> int:
        """Node id for a prefixed node name (linear only at build; lookups
        use the sorted-name invariant via searchsorted)."""
        i = int(np.searchsorted(self.names, name))
        if i >= len(self.names) or self.names[i] != name:
            raise KeyError(name)
        return i


def _kind_code(name: str) -> int:
    if name.startswith(RID_PREFIX):
        return 1
    if name.startswith(CID_PREFIX):
        return 2
    return 0


def build_graph(spark: SparkSession, tokens: DataFrame) -> CSRGraph:
    """Materialise the tripartite graph of a tokenized cell frame as CSR.

    The heavy lifting (dedup, weighting, id assignment) happens in Spark;
    only the final compact arrays are collected.
    """
    edges = build_edges(tokens)
    ids = node_ids(edges)
    directed = (
        edges.select(F.col("u").alias("src"), F.col("v").alias("dst"), "weight")
        .unionByName(
            edges.select(F.col("v").alias("src"), F.col("u").alias("dst"), "weight")
        )
        .join(ids.withColumnRenamed("node", "src").withColumnRenamed("node_id", "src_id"), on="src")
        .join(ids.withColumnRenamed("node", "dst").withColumnRenamed("node_id", "dst_id"), on="dst")
        .select("src_id", "dst_id", "weight")
    )
    adj = directed.toPandas().sort_values(["src_id", "dst_id"]).reset_index(drop=True)
    names_pdf = ids.orderBy("node_id").toPandas()
    names = names_pdf["node"].to_numpy(dtype=object)
    n = len(names)
    # row_number over sorted names ⇒ names must already be sorted; the
    # searchsorted lookup in id_of relies on it.
    assert (names_pdf["node_id"].to_numpy() == np.arange(n)).all()
    src = adj["src_id"].to_numpy(dtype=np.int64)
    indptr = np.zeros(n + 1, dtype=np.int64)
    np.add.at(indptr, src + 1, 1)
    indptr = np.cumsum(indptr)
    indices = adj["dst_id"].to_numpy(dtype=np.int64)
    w = adj["weight"].to_numpy(dtype=np.float64)
    cum = np.empty_like(w)
    for i in range(n):
        lo, hi = indptr[i], indptr[i + 1]
        cum[lo:hi] = np.cumsum(w[lo:hi])
    kinds = np.fromiter((_kind_code(s) for s in names), dtype=np.int8, count=n)
    return CSRGraph(
        indptr=indptr, indices=indices, weights=w, cum_weights=cum, names=names, kinds=kinds
    )


def graph_stats(tokens: DataFrame) -> dict:
    """Table-1-style structural statistics of the tokenized graph."""
    agg = tokens.agg(
        F.countDistinct("token").alias("n_tokens"),
        F.countDistinct("rid").alias("n_rids"),
        F.countDistinct("cid").alias("n_cids"),
        F.count(F.lit(1)).alias("n_cell_tokens"),
    ).first()
    return {
        "n_token_nodes": agg["n_tokens"],
        "n_rid_nodes": agg["n_rids"],
        "n_cid_nodes": agg["n_cids"],
        "n_cell_tokens": agg["n_cell_tokens"],
    }
