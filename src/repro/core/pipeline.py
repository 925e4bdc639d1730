"""End-to-end EmbDI pipeline (paper Algorithm 3 + §5.1 optimisations).

``run_embdi`` wires graph construction → sentence construction → embedding
construction and times each stage separately, because Table 6 reports the
G / W / E breakdown. Inputs are one or two Spark DataFrames that carry a
``rid`` column (the scenario generator provides it; ``with_rid`` adds one
deterministically for ad-hoc frames).

Upstream optimisations that *rewrite the data* (numeric rounding, FD
Skolemization, dictionary merging — §5.2/§5.3) are applied by the caller
before this pipeline; optimisations that shape the *walks* (overlap-only
starts, RID prefixes, probabilistic replacement) are config knobs here.
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.embeddings import EmbeddingSpace, W2VConfig, train_word2vec
from repro.core.graph import CSRGraph, build_graph, graph_stats
from repro.core.tokenize import cells, shared_values, tokenize_cells
from repro.core.walks import WalkConfig, generate_walks


@dataclass(frozen=True)
class EmbDIConfig:
    """One EmbDI run's full configuration (paper defaults, scaled dims)."""

    tokenization: str = "overlap"
    walk_length: int = 60
    corpus_k: int = 40  # paper's rule-of-thumb multiplier (paper: 1000)
    start_nodes: str = "all"  # "all" | "overlap"
    walk: WalkConfig = field(default_factory=WalkConfig)
    w2v: W2VConfig = field(default_factory=W2VConfig)


@dataclass
class EmbDIResult:
    """Trained space plus the diagnostics every table harness needs."""

    space: EmbeddingSpace
    graph: CSRGraph
    n_sentences: int
    n_distinct_values: int
    n_rows: int
    stats: dict
    timings: dict  # {"G": s, "W": s, "E": s}


def with_rid(df: DataFrame, order_cols: list[str] | None = None) -> DataFrame:
    """Add a deterministic 0-based ``rid`` column (row_number over a sort)."""
    cols = order_cols or df.columns
    w = Window.orderBy(*[F.col(c).asc_nulls_last() for c in cols])
    return df.withColumn("rid", F.row_number().over(w) - 1)


def corpus_target_tokens(n_distinct: int, n_rows: int, k: int) -> int:
    """§7.3 rule of thumb: ``#corpus tokens = (#dist.values + #rows) * k``."""
    return (n_distinct + n_rows) * k


def run_embdi(
    spark: SparkSession,
    df_a: DataFrame,
    df_b: DataFrame | None = None,
    cfg: EmbDIConfig = EmbDIConfig(),
) -> EmbDIResult:
    """Train local relational embeddings for one or two datasets."""
    t0 = time.perf_counter()
    cells_a = cells(df_a, 0)
    if df_b is not None:
        cells_b = cells(df_b, 1)
        shared = shared_values(cells_a, cells_b).cache()
        all_cells = cells_a.unionByName(cells_b)
    else:
        shared = None
        all_cells = cells_a
    tokens = tokenize_cells(all_cells, cfg.tokenization, shared).cache()
    stats = graph_stats(tokens)
    n_distinct = all_cells.select("value").distinct().count()
    n_rows = stats["n_rid_nodes"]
    graph = build_graph(spark, tokens)
    t_graph = time.perf_counter() - t0

    t0 = time.perf_counter()
    target = corpus_target_tokens(n_distinct, n_rows, cfg.corpus_k)
    n_sentences = max(1, math.ceil(target / cfg.walk_length))
    start_nodes = None
    if cfg.start_nodes == "overlap" and df_b is not None:
        overlap_tokens = (
            tokenize_cells(cells_a, cfg.tokenization, shared)
            .select("token")
            .distinct()
            .join(
                tokenize_cells(cells_b, cfg.tokenization, shared)
                .select("token")
                .distinct(),
                on="token",
            )
        )
        names = [r["token"] for r in overlap_tokens.collect()]
        start_nodes = names or None  # fall back to all nodes if no overlap
    walks = generate_walks(spark, graph, cfg.walk, n_sentences, start_nodes).cache()
    n_generated = walks.count()
    t_walks = time.perf_counter() - t0

    t0 = time.perf_counter()
    space = train_word2vec(walks, cfg.w2v)
    t_embed = time.perf_counter() - t0
    walks.unpersist()
    tokens.unpersist()
    if shared is not None:
        shared.unpersist()
    return EmbDIResult(
        space=space,
        graph=graph,
        n_sentences=n_generated,
        n_distinct_values=n_distinct,
        n_rows=n_rows,
        stats=stats,
        timings={"G": t_graph, "W": t_walks, "E": t_embed},
    )
