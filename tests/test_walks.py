"""Unit tests for repro.core.walks (kernel walker, join walker, budgets)."""
import numpy as np
import pytest

from repro.core.tokenize import RID_PREFIX
from repro.core.walks import (
    WalkConfig,
    build_starts,
    generate_walks,
    generate_walks_join,
    walk_budget,
)


def _edge_set(graph):
    out = set()
    for u in range(graph.n_nodes):
        for v in graph.neighbors(u):
            out.add((str(graph.names[u]), str(graph.names[int(v)])))
    return out


# -- config validation --------------------------------------------------

@pytest.mark.parametrize(
    "kwargs,msg",
    [
        ({"mode": "bogus"}, "unknown walk mode"),
        ({"start_with": "bogus"}, "unknown start_with"),
        ({"walk_length": 1}, "walk_length"),
    ],
)
def test_walkconfig_validation(kwargs, msg):
    with pytest.raises(ValueError, match=msg):
        WalkConfig(**kwargs)


@pytest.mark.parametrize(
    "n_sent,n_starts,expected",
    [(10, 5, 2), (11, 5, 3), (1, 5, 1), (100, 1, 100)],
)
def test_walk_budget(n_sent, n_starts, expected):
    assert walk_budget(n_sent, n_starts) == expected


def test_walk_budget_rejects_empty():
    with pytest.raises(ValueError):
        walk_budget(5, 0)


def test_build_starts_replicates_budget(spark):
    df = build_starts(spark, [3, 1, 2], 7).toPandas()
    # budget = ceil(7/3) = 3 walks per node
    assert len(df) == 9
    assert sorted(df["start_id"].value_counts().to_dict().items()) == [(1, 3), (2, 3), (3, 3)]
    assert sorted(df["walk_id"]) == list(range(9))


# -- kernel walker ------------------------------------------------------

def test_walk_lengths_and_validity(spark, tiny_graph):
    cfg = WalkConfig(walk_length=10, start_with="none", seed=5)
    walks = generate_walks(spark, tiny_graph, cfg, 20).collect()
    edges = _edge_set(tiny_graph)
    assert len(walks) >= 20
    for row in walks:
        s = row["sentence"]
        assert len(s) == 10  # tiny graph is connected, no early stops
        for a, b in zip(s, s[1:]):
            assert (a, b) in edges, f"invalid transition {a}->{b}"


def test_walks_deterministic_in_seed(spark, tiny_graph):
    cfg = WalkConfig(walk_length=6, start_with="none", seed=9)
    w1 = sorted(tuple(r["sentence"]) for r in generate_walks(spark, tiny_graph, cfg, 10).collect())
    w2 = sorted(tuple(r["sentence"]) for r in generate_walks(spark, tiny_graph, cfg, 10).collect())
    assert w1 == w2
    cfg2 = WalkConfig(walk_length=6, start_with="none", seed=10)
    w3 = sorted(tuple(r["sentence"]) for r in generate_walks(spark, tiny_graph, cfg2, 10).collect())
    assert w1 != w3


def test_walks_start_nodes_respected(spark, tiny_graph):
    cfg = WalkConfig(walk_length=5, start_with="none", seed=2)
    start = ["tt__paul"]
    walks = generate_walks(spark, tiny_graph, cfg, 6, start_nodes=start).collect()
    assert len(walks) == 6
    assert all(r["sentence"][0] == "tt__paul" for r in walks)


def test_walk_rid_prefix(spark, tiny_graph):
    """Algorithm 2: sentences from token starts open with a neighbouring RID."""
    cfg = WalkConfig(walk_length=5, start_with="rid", seed=4)
    walks = generate_walks(spark, tiny_graph, cfg, 30, start_nodes=["tt__paul"]).collect()
    paul_rids = {"idx__0_0", "idx__1_1"}  # rows containing paul
    for r in walks:
        s = r["sentence"]
        assert s[0] in paul_rids
        assert s[1] == "tt__paul"
        assert len(s) == 5


def test_walk_rid_or_cid_prefix(spark, tiny_graph):
    cfg = WalkConfig(walk_length=5, start_with="rid_or_cid", seed=4)
    walks = generate_walks(spark, tiny_graph, cfg, 40, start_nodes=["tt__paul"]).collect()
    heads = {r["sentence"][0] for r in walks}
    allowed = {"idx__0_0", "idx__1_1", "cid__0_name", "cid__1_name"}
    assert heads <= allowed
    assert len(heads) > 1  # both kinds get sampled


def test_walk_prefix_skipped_for_rid_start(spark, tiny_graph):
    cfg = WalkConfig(walk_length=5, start_with="rid", seed=4)
    walks = generate_walks(spark, tiny_graph, cfg, 5, start_nodes=["idx__0_0"]).collect()
    assert all(r["sentence"][0] == "idx__0_0" for r in walks)


def test_replacement_affects_sentence_not_walk(spark, tiny_graph):
    """§5.3: with prob 1 the partner is emitted, but transitions still
    follow the original node's edges."""
    repl = {"tt__paul": ("tt__rick", 1.0)}
    cfg = WalkConfig(walk_length=12, start_with="none", seed=7, replacements=repl)
    walks = generate_walks(spark, tiny_graph, cfg, 30).collect()
    seen_rick = False
    rick_real_nbrs = {
        str(tiny_graph.names[v])
        for v in tiny_graph.neighbors(tiny_graph.id_of("tt__rick"))
    }
    for r in walks:
        s = r["sentence"]
        assert "tt__paul" not in s  # always replaced
        for a, b in zip(s, s[1:]):
            if a == "tt__rick" and b not in rick_real_nbrs:
                # the walk was actually at paul: successor must be a paul edge
                seen_rick = True
                paul_nbrs = {
                    str(tiny_graph.names[v])
                    for v in tiny_graph.neighbors(tiny_graph.id_of("tt__paul"))
                }
                assert b in paul_nbrs
    assert seen_rick, "replacement never exercised a paul-only transition"


def test_node2vec_bias_return_vs_explore(spark, tiny_graph):
    """p << 1 makes 2-hop returns dominate; q >> 1 suppresses exploration."""
    def return_rate(p, q):
        cfg = WalkConfig(walk_length=20, mode="node2vec", p=p, q=q, start_with="none", seed=11)
        walks = generate_walks(spark, tiny_graph, cfg, 40).collect()
        ret, tot = 0, 0
        for r in walks:
            s = r["sentence"]
            for i in range(2, len(s)):
                tot += 1
                ret += s[i] == s[i - 2]
        return ret / max(1, tot)

    assert return_rate(0.05, 10.0) > return_rate(20.0, 0.1) + 0.2


def test_walks_weighted_sampling(spark):
    """A weight-2 edge is sampled ~2x the weight-1 edge."""
    import pandas as pd

    from repro.core.graph import build_graph
    from repro.core.tokenize import cells, tokenize_cells

    # row 0 has token 'dup' twice -> edge weight 2 to rid; 'solo' once
    pdf = pd.DataFrame({"rid": [0], "x": ["dup"], "y": ["dup"], "z": ["solo"]})
    g = build_graph(spark, tokenize_cells(cells(spark.createDataFrame(pdf), 0), "simple"))
    cfg = WalkConfig(walk_length=2, start_with="none", seed=13)
    walks = generate_walks(spark, g, cfg, 600, start_nodes=["idx__0_0"]).collect()
    nxt = [r["sentence"][1] for r in walks]
    n_dup = sum(1 for x in nxt if x == "tt__dup")
    n_solo = sum(1 for x in nxt if x == "tt__solo")
    assert n_dup + n_solo == len(nxt)
    ratio = n_dup / max(1, n_solo)
    assert 1.5 < ratio < 2.6, f"weighted sampling off: ratio={ratio:.2f}"


# -- join walker (validation path) --------------------------------------

def test_join_walker_validity(spark, tiny_graph):
    walks = generate_walks_join(spark, tiny_graph, walk_length=5, n_sentences=10, seed=3).collect()
    edges = _edge_set(tiny_graph)
    assert len(walks) >= 10
    for r in walks:
        s = r["sentence"]
        assert len(s) == 5
        for a, b in zip(s, s[1:]):
            assert (a, b) in edges


def test_join_walker_matches_kernel_support(spark, tiny_graph):
    """Both walkers traverse the same edge support on the tiny graph."""
    cfg = WalkConfig(walk_length=6, start_with="none", seed=21)
    kernel = generate_walks(spark, tiny_graph, cfg, 120).collect()
    join = generate_walks_join(spark, tiny_graph, 6, 120, seed=21).collect()

    def transitions(rows):
        out = set()
        for r in rows:
            s = r["sentence"]
            out |= set(zip(s, s[1:]))
        return out

    edges = _edge_set(tiny_graph)
    assert transitions(kernel) <= edges
    assert transitions(join) <= edges
    # with 120 walks x 6 steps on a 18-node graph, both should cover most edges
    assert len(transitions(kernel) & transitions(join)) > len(edges) * 0.5
