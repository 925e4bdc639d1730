"""Table 3 — Schema Matching F-measure (unsupervised).

Group 1 runs Algorithm 5 over CID vectors from each local embedding
method (plus the ``Base`` bag-of-words matcher). Group 2 runs the SEEP
system with pre-trained (SeepP) vs EmbDI (SeepL) embeddings.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.seep import seep_match
from repro.scenarios import TWO_DATASET_SCENARIOS
from repro.tables.common import MethodCache, RunConfig
from repro.tasks.metrics import prf
from repro.tasks.schema_matching import base_bow_match, schema_match, sm_gt_as_cids

METHODS = ("Base", "EmbDI", "Node2Vec", "Harp", "SeepP", "SeepL")


def sm_fmeasure(cache: MethodCache, name: str, method: str) -> float:
    """F-measure of one SM method on one scenario."""
    sc = cache.scenario(name)
    if method == "Base":
        return prf(base_bow_match(sc.pdf_a, sc.pdf_b), sc.sm_gt).f1
    if method == "SeepP":
        return prf(
            seep_match(sc.pdf_a, sc.pdf_b, local=None, dim=cache.run.dim), sc.sm_gt
        ).f1
    if method == "SeepL":
        space = cache.embdi(name, "overlap").space
        return prf(
            seep_match(sc.pdf_a, sc.pdf_b, local=space, dim=cache.run.dim), sc.sm_gt
        ).f1
    if method == "EmbDI":
        space = cache.embdi(name, "overlap").space
    elif method == "Node2Vec":
        space, _ = cache.node2vec(name)
    elif method == "Harp":
        space, _ = cache.harp(name)
    else:
        raise ValueError(method)
    return prf(schema_match(space), sm_gt_as_cids(sc.sm_gt)).f1


def run_table3(
    spark: SparkSession,
    run: RunConfig | None = None,
    scenarios: list[str] | None = None,
    methods: tuple = METHODS,
    cache: MethodCache | None = None,
) -> pd.DataFrame:
    """Build and print Table 3."""
    cache = cache or MethodCache(spark, run or RunConfig())
    rows = []
    for name in scenarios or TWO_DATASET_SCENARIOS:
        row = {"dataset": name}
        for method in methods:
            row[method] = round(sm_fmeasure(cache, name, method), 2)
            print(f"[table3] {name:4s} {method:8s} F={row[method]:.2f}")
        rows.append(row)
    df = pd.DataFrame(rows)
    print("\nTable 3 — F-measure results for Schema Matching (SM)")
    print(df.to_string(index=False))
    return df
