"""Table 4 — Entity Resolution F-measure.

Unsupervised: Algorithm 6 over tuple vectors from pre-trained embeddings
(fastText-sim) and over RID vectors from EmbDI-S / EmbDI-F / EmbDI-O,
Node2Vec and Harp. Supervised: DeepER with pre-trained (DeepERP) vs
EmbDI (DeepERL) word vectors on 5 % labels, plus the task-specific
fine-tuned variants.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.deeper import deeper_er, prepare
from repro.scenarios import TWO_DATASET_SCENARIOS
from repro.tables.common import MethodCache, RunConfig, local_value_vec
from repro.tasks.entity_resolution import (
    er_gt_as_rids,
    er_match,
    match_rids,
    pretrained_tuple_space,
)
from repro.tasks.metrics import prf

UNSUP_METHODS = ("fastText", "EmbDI-S", "EmbDI-F", "EmbDI-O", "Node2Vec", "Harp")
SUP_METHODS = ("DeepERP", "DeepERL", "DeepERP-ft", "DeepERL-ft")


def er_fmeasure_unsup(cache: MethodCache, name: str, method: str) -> float:
    """Unsupervised ER F-measure for one method on one scenario."""
    sc = cache.scenario(name)
    gt = er_gt_as_rids(sc.er_gt)
    n_top = cache.run.n_top
    if method == "fastText":
        ft = cache.pretrained()
        space = pretrained_tuple_space(sc.pdf_a, sc.pdf_b, ft.word_vec, cache.run.dim)
        return prf(match_rids(space, space.rids(0), space.rids(1), n_top), gt).f1
    if method.startswith("EmbDI-"):
        tok = {"S": "simple", "F": "flatten", "O": "overlap"}[method[-1]]
        space = cache.embdi(name, tok).space
    elif method == "Node2Vec":
        space, _ = cache.node2vec(name)
    elif method == "Harp":
        space, _ = cache.harp(name)
    else:
        raise ValueError(method)
    return prf(er_match(space, n_top), gt).f1


def er_fmeasure_sup(
    cache: MethodCache, name: str, method: str, label_frac: float = 0.05
) -> float:
    """Supervised DeepER F-measure (P = pre-trained vectors, L = EmbDI)."""
    sc = cache.scenario(name)
    col_pairs = sorted(sc.sm_gt)
    fine_tune = method.endswith("-ft")
    if method.startswith("DeepERP"):
        ft = cache.pretrained()
        value_vec = ft.value_vec
        dim = cache.run.dim
    else:
        space = cache.embdi(name, "overlap").space
        value_vec = local_value_vec(space, cache.run.dim)
        dim = space.dim
    data = prepare(sc.pdf_a, sc.pdf_b, col_pairs, value_vec, dim)
    return deeper_er(
        cache.spark, data, sc.er_gt,
        label_frac=label_frac, fine_tune=fine_tune, seed=cache.run.seed,
    ).f1


def run_table4(
    spark: SparkSession,
    run: RunConfig | None = None,
    scenarios: list[str] | None = None,
    unsup: tuple = UNSUP_METHODS,
    sup: tuple = SUP_METHODS,
    cache: MethodCache | None = None,
) -> pd.DataFrame:
    """Build and print Table 4."""
    cache = cache or MethodCache(spark, run or RunConfig())
    rows = []
    for name in scenarios or TWO_DATASET_SCENARIOS:
        row = {"dataset": name}
        for method in unsup:
            row[method] = round(er_fmeasure_unsup(cache, name, method), 2)
            print(f"[table4] {name:4s} {method:10s} F={row[method]:.2f}")
        for method in sup:
            row[method] = round(er_fmeasure_sup(cache, name, method), 2)
            print(f"[table4] {name:4s} {method:10s} F={row[method]:.2f}")
        rows.append(row)
    df = pd.DataFrame(rows)
    print("\nTable 4 — F-measure results for Entity Resolution (ER)")
    print(df.to_string(index=False))
    return df
