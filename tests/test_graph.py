"""Unit tests for repro.core.graph (edges, node ids, CSR construction)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import tokenize as tk
from repro.core.graph import build_edges, build_graph, graph_stats, node_ids
from repro.oracle import assert_equivalent


def _tokens(spark, pdf, strategy="simple"):
    return tk.tokenize_cells(tk.cells(spark.createDataFrame(pdf), 0), strategy)


def test_build_edges_token_rid_and_cid(spark):
    pdf = pd.DataFrame({"rid": [0], "x": ["v"]})
    edges = {(r["u"], r["v"]) for r in build_edges(_tokens(spark, pdf)).collect()}
    assert edges == {("idx__0_0", "tt__v"), ("cid__0_x", "tt__v")}


def test_build_edges_weight_multiplicity(spark):
    pdf = pd.DataFrame({"rid": [0], "x": ["dup"], "y": ["dup"]})
    edges = build_edges(_tokens(spark, pdf)).collect()
    w = {(r["u"], r["v"]): r["weight"] for r in edges}
    assert w[("idx__0_0", "tt__dup")] == 2
    assert w[("cid__0_x", "tt__dup")] == 1
    assert w[("cid__0_y", "tt__dup")] == 1


def test_build_edges_canonical_order_no_dupes(spark):
    pdf = pd.DataFrame({"rid": [0, 1], "x": ["a", "a"], "y": ["b", "c"]})
    edges = build_edges(_tokens(spark, pdf)).collect()
    pairs = [(r["u"], r["v"]) for r in edges]
    assert all(u < v for u, v in pairs)
    assert len(pairs) == len(set(pairs))


def test_edge_count_oracle(spark):
    """Distinct (token,rid)+(token,cid) pair count equals the edge count."""
    pdf = pd.DataFrame(
        {"rid": range(5), "a": list("xyxzy"), "b": ["1", "2", "1", "2", "3"]}
    )
    tokens = _tokens(spark, pdf)
    got = build_edges(tokens).agg(F.count(F.lit(1)).alias("n"))
    tokens_pdf = tokens.toPandas()
    sql = """
        SELECT count(*) AS n FROM (
            SELECT DISTINCT token, rid FROM t
            UNION
            SELECT DISTINCT token, cid FROM t
        )
    """
    assert_equivalent(got, sql, t=tokens_pdf)


def test_node_ids_dense_and_deterministic(spark):
    pdf = pd.DataFrame({"rid": [0, 1], "x": ["a", "b"]})
    edges = build_edges(_tokens(spark, pdf))
    ids1 = node_ids(edges).orderBy("node_id").toPandas()
    ids2 = node_ids(edges).orderBy("node_id").toPandas()
    pd.testing.assert_frame_equal(ids1, ids2)
    assert list(ids1["node_id"]) == list(range(len(ids1)))
    assert list(ids1["node"]) == sorted(ids1["node"])


def test_csr_structure(tiny_graph):
    g = tiny_graph
    assert g.n_nodes == len(g.names)
    assert g.indptr[0] == 0 and g.indptr[-1] == len(g.indices)
    # neighbors sorted within each row (node2vec membership tests rely on it)
    for i in range(g.n_nodes):
        nb = g.neighbors(i)
        assert (np.diff(nb) >= 0).all()
    # cum_weights monotone within rows, ends at row weight sum
    for i in range(g.n_nodes):
        lo, hi = g.indptr[i], g.indptr[i + 1]
        if lo < hi:
            assert np.allclose(g.cum_weights[hi - 1], g.weights[lo:hi].sum())


def test_csr_symmetry(tiny_graph):
    """Undirected: v in N(u) <=> u in N(v)."""
    g = tiny_graph
    for u in range(g.n_nodes):
        for v in g.neighbors(u):
            assert u in g.neighbors(int(v))


def test_csr_id_of_roundtrip(tiny_graph):
    g = tiny_graph
    for i in [0, g.n_nodes // 2, g.n_nodes - 1]:
        assert g.id_of(str(g.names[i])) == i
    with pytest.raises(KeyError):
        g.id_of("tt__definitely_not_there")


def test_csr_kinds(tiny_graph):
    g = tiny_graph
    for i, name in enumerate(g.names):
        expected = {"token": 0, "rid": 1, "cid": 2}[
            {"tt": "token", "id": "rid", "ci": "cid"}[name[:2]]
        ]
        assert g.kinds[i] == expected


def test_tiny_graph_expected_nodes(tiny_graph):
    names = set(tiny_graph.names)
    # 5 RIDs, 4 CIDs; shared token paul stays whole, ipad 4th flattens
    assert {"idx__0_0", "idx__0_1", "idx__0_2", "idx__1_0", "idx__1_1"} <= names
    assert {"cid__0_name", "cid__0_product", "cid__1_name", "cid__1_brand"} <= names
    assert "tt__paul" in names and "tt__ipad" in names and "tt__4th" in names
    assert "tt__ipad_4th" not in names


def test_n_edges_consistent(tiny_graph):
    assert tiny_graph.n_edges * 2 == len(tiny_graph.indices)


def test_graph_stats(spark):
    pdf = pd.DataFrame({"rid": [0, 1], "x": ["a", "a"], "y": ["b", None]})
    stats = graph_stats(_tokens(spark, pdf))
    assert stats == {
        "n_token_nodes": 2,
        "n_rid_nodes": 2,
        "n_cid_nodes": 2,
        "n_cell_tokens": 3,
    }


def test_build_graph_isolated_free(spark):
    """Every node in CSR has degree >= 1 (graph built from edges only)."""
    pdf = pd.DataFrame({"rid": range(3), "x": list("abc")})
    g = build_graph(spark, _tokens(spark, pdf))
    deg = g.indptr[1:] - g.indptr[:-1]
    assert (deg >= 1).all()
