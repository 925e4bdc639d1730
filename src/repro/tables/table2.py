"""Table 2 — Embedding-quality tests (MA / MR / MC pass fractions).

Every local method (Basic, Node2Vec, Harp, EmbDI) is evaluated on the
same MA/MR/MC suite, generated from the scenario's normalised cell
values. All methods run over the ``simple``-tokenized tripartite graph
footing so each cell value is a single in-vocabulary token for everyone
(the paper's §7 setup: "All local methods make use of our tripartite
graph"). The pre-trained row reproduces the prose numbers ("they obtain
.33 on average for dataset BB...").
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.scenarios import SCENARIOS
from repro.tables.common import MethodCache, RunConfig
from repro.tasks.quality import evaluate_quality, generate_tests

METHODS = ("Basic", "Node2Vec", "Harp", "EmbDI", "Pretrained")


def quality_row(cache: MethodCache, name: str, method: str, tests) -> dict:
    """Evaluate one method on one scenario's test suite."""
    if method == "Basic":
        space, _ = cache.basic(name)
    elif method == "Node2Vec":
        space, _ = cache.node2vec(name)
    elif method == "Harp":
        space, _ = cache.harp(name)
    elif method == "EmbDI":
        # plain generation config: quality tests probe the raw embeddings,
        # not the integration-task walk optimisations (§7.1 vs §5.1)
        space = cache.embdi(name, "simple", starts="all").space
    elif method == "Pretrained":
        ft = cache.pretrained()
        vocab = sorted({t for qt in tests for t in qt.tokens})
        space = ft.token_space(vocab)
    else:
        raise ValueError(method)
    scores = evaluate_quality(space, tests)
    return {"dataset": name, "method": method, **scores}


def run_table2(
    spark: SparkSession,
    run: RunConfig | None = None,
    scenarios: list[str] | None = None,
    methods: tuple = METHODS,
    cache: MethodCache | None = None,
) -> pd.DataFrame:
    """Build and print Table 2."""
    cache = cache or MethodCache(spark, run or RunConfig())
    rows = []
    for name in scenarios or SCENARIOS:
        sc = cache.scenario(name)
        tests = generate_tests(
            sc.pdf_a, sc.pdf_b, sc.config.mc_pair,
            n_per_kind=cache.run.quality_tests, seed=cache.run.seed,
        )
        for method in methods:
            rows.append(quality_row(cache, name, method, tests))
            r = rows[-1]
            print(
                f"[table2] {name:4s} {method:10s} "
                f"MA={r['MA']:.2f} MR={r['MR']:.2f} MC={r['MC']:.2f} AVG={r['AVG']:.2f}"
            )
    df = pd.DataFrame(rows)
    print("\nTable 2 — Quality of local embeddings (fraction of passed tests)")
    print(df.to_string(index=False))
    return df
