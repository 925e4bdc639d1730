"""Shared infrastructure for the per-table reproduction harnesses.

One place defines the run-scale configuration (DESIGN.md §5), builds and
caches embedding spaces per (scenario, method, tokenization), and formats
paper-style rows. Jobs in ``jobs/`` and benchmarks call these entry
points; caching means e.g. Table 4 and Table 5 reuse the same EmbDI-O
space when run in one process.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field, replace

import numpy as np
from pyspark.sql import SparkSession

from repro.baselines.basic import basic_corpus
from repro.baselines.harp import run_harp
from repro.baselines.node2vec import run_node2vec
from repro.baselines.pretrained import FastTextSim
from repro.core.embeddings import EmbeddingSpace, W2VConfig, train_word2vec
from repro.core.graph import build_graph
from repro.core.pipeline import (
    EmbDIConfig,
    EmbDIResult,
    corpus_target_tokens,
    run_embdi,
)
from repro.core.tokenize import TOKEN_PREFIX, cells, shared_values, tokenize_cells
from repro.core.walks import WalkConfig
from repro.scenarios import Scenario, load_scenario


@dataclass(frozen=True)
class RunConfig:
    """Reproduction-scale knobs shared by every table harness."""

    corpus_k: int = 100       # paper rule-of-thumb multiplier (paper: 1000)
    walk_length: int = 60     # paper default
    dim: int = 64             # paper: 300 (vocab here is ~100x smaller)
    window: int = 3           # paper default
    max_iter: int = 8         # extra epochs compensate the smaller corpus
    n_top: int = 10           # paper default for ER
    seed: int = 1
    scale: float = 1.0        # scenario row-count multiplier (tests use <1)
    quality_tests: int = 200  # per kind per scenario

    def w2v(self) -> W2VConfig:
        return W2VConfig(dim=self.dim, window=self.window, min_count=1,
                         max_iter=self.max_iter, seed=self.seed)


DEFAULT_RUN = RunConfig()


class MethodCache:
    """Per-process memo of scenarios and trained spaces."""

    def __init__(self, spark: SparkSession, run: RunConfig = DEFAULT_RUN):
        self.spark = spark
        self.run = run
        self._scenarios: dict[str, Scenario] = {}
        self._spaces: dict[tuple, object] = {}

    def scenario(self, name: str) -> Scenario:
        if name not in self._scenarios:
            self._scenarios[name] = load_scenario(self.spark, name, self.run.scale)
        return self._scenarios[name]

    # -- corpora shared by the graph baselines ---------------------------
    def _simple_tokens(self, name: str):
        """Tokenized cells under the ``simple`` strategy (Table 2 footing:
        every cell value is in-vocabulary for every local method)."""
        sc = self.scenario(name)
        cells_a = cells(sc.df_a, 0)
        if sc.df_b is not None:
            all_cells = cells_a.unionByName(cells(sc.df_b, 1))
        else:
            all_cells = cells_a
        return all_cells, tokenize_cells(all_cells, "simple")

    def _budget(self, name: str, all_cells) -> int:
        sc = self.scenario(name)
        n_rows = sc.pdf_a.shape[0] + (0 if sc.pdf_b is None else sc.pdf_b.shape[0])
        n_distinct = all_cells.select("value").distinct().count()
        target = corpus_target_tokens(n_distinct, n_rows, self.run.corpus_k)
        return max(1, target // self.run.walk_length)

    # -- embedding methods ----------------------------------------------
    def embdi(
        self, name: str, tokenization: str = "overlap", starts: str = "overlap"
    ) -> EmbDIResult:
        """EmbDI run; ``tokenization`` selects EmbDI-S/F/O.

        ``starts='overlap'`` applies the §5.1 integration-task defaults
        (walks start from overlapping nodes, sentences open with a
        connected RID/CID); ``starts='all'`` is the plain Algorithm 2/3
        generation config used for the §7.1 quality tests.
        """
        key = ("embdi", name, tokenization, starts)
        if key not in self._spaces:
            sc = self.scenario(name)
            cfg = EmbDIConfig(
                tokenization=tokenization,
                walk_length=self.run.walk_length,
                corpus_k=self.run.corpus_k,
                start_nodes=starts,
                walk=WalkConfig(
                    walk_length=self.run.walk_length,
                    start_with="rid_or_cid" if starts == "overlap" else "rid",
                    seed=self.run.seed,
                ),
                w2v=self.run.w2v(),
            )
            self._spaces[key] = run_embdi(self.spark, sc.df_a, sc.df_b, cfg)
        return self._spaces[key]

    def basic(self, name: str) -> tuple[EmbeddingSpace, float]:
        """Basic baseline space + wall-clock seconds (corpus+train)."""
        key = ("basic", name)
        if key not in self._spaces:
            t0 = time.perf_counter()
            all_cells, tokens = self._simple_tokens(name)
            target = self._budget(name, all_cells) * self.run.walk_length
            corpus = basic_corpus(
                self.spark, tokens, target, self.run.walk_length, self.run.seed
            ).cache()
            corpus.count()
            space = train_word2vec(corpus, self.run.w2v())
            corpus.unpersist()
            self._spaces[key] = (space, time.perf_counter() - t0)
        return self._spaces[key]

    def node2vec(self, name: str) -> tuple[EmbeddingSpace, float]:
        key = ("node2vec", name)
        if key not in self._spaces:
            t0 = time.perf_counter()
            all_cells, tokens = self._simple_tokens(name)
            graph = build_graph(self.spark, tokens)
            n_sent = self._budget(name, all_cells)
            space, walks = run_node2vec(
                self.spark, graph, n_sent,
                walk_length=self.run.walk_length, w2v=self.run.w2v(),
                seed=self.run.seed,
            )
            walks.unpersist()
            self._spaces[key] = (space, time.perf_counter() - t0)
        return self._spaces[key]

    def harp(self, name: str) -> tuple[EmbeddingSpace, float]:
        key = ("harp", name)
        if key not in self._spaces:
            t0 = time.perf_counter()
            all_cells, tokens = self._simple_tokens(name)
            graph = build_graph(self.spark, tokens)
            n_sent = self._budget(name, all_cells)
            space = run_harp(
                self.spark, graph, n_sent,
                walk_length=self.run.walk_length, w2v=self.run.w2v(),
                seed=self.run.seed,
            )
            self._spaces[key] = (space, time.perf_counter() - t0)
        return self._spaces[key]

    def pretrained(self) -> FastTextSim:
        key = ("fasttext",)
        if key not in self._spaces:
            self._spaces[key] = FastTextSim(dim=self.run.dim, seed=0)
        return self._spaces[key]


def local_value_vec(space: EmbeddingSpace, fallback_dim: int):
    """Word-embedding lookup over an EmbDI space for DeepERL / SeepL.

    A (normalised) value resolves to its whole-value token if present,
    else to the mean of its word tokens that are in vocabulary, else to a
    tiny epsilon vector (value unseen by the local training).
    """

    def vec(value: str) -> np.ndarray:
        tok = TOKEN_PREFIX + value
        if tok in space:
            return space.vec(tok)
        words = [w for w in value.split("_") if w]
        vecs = [space.vec(TOKEN_PREFIX + w) for w in words if TOKEN_PREFIX + w in space]
        if vecs:
            return np.mean(vecs, axis=0)
        return np.full(space.dim, 1e-9)

    return vec


def fmt_row(cells_: list, widths: list[int]) -> str:
    """Fixed-width table row for harness stdout."""
    out = []
    for c, w in zip(cells_, widths):
        s = f"{c:.2f}" if isinstance(c, float) else str(c)
        out.append(s.ljust(w))
    return "  ".join(out)
