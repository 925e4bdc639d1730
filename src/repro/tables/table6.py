"""Table 6 — Execution times for embeddings generation (seconds).

For every scenario: EmbDI's G (graph), W (walks), E (training) and W+E,
next to Node2Vec and HARP wall-clock (walks + training over the same
tripartite graph). The paper's comparison excludes graph generation
("common to all methods"); ours includes it inside the N2V/HARP numbers
but G is <1–10 % of total, and the claims checked are relative: E
dominates EmbDI's time, and EmbDI < N2V / HARP. ``n2v_mem_mb`` reports
the reference node2vec implementation's estimated alias-table footprint
(the term behind the paper's ``mem`` failures; substitution S4).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.node2vec import alias_table_bytes
from repro.scenarios import SCENARIOS
from repro.tables.common import MethodCache, RunConfig


def run_table6(
    spark: SparkSession,
    run: RunConfig | None = None,
    scenarios: list[str] | None = None,
    include_baselines: bool = True,
    cache: MethodCache | None = None,
) -> pd.DataFrame:
    """Build and print Table 6."""
    cache = cache or MethodCache(spark, run or RunConfig())
    rows = []
    for name in scenarios or SCENARIOS:
        res = cache.embdi(name, "overlap")
        row = {
            "dataset": name,
            "G": round(res.timings["G"], 1),
            "W": round(res.timings["W"], 1),
            "E": round(res.timings["E"], 1),
            "W+E": round(res.timings["W"] + res.timings["E"], 1),
        }
        row["n2v_mem_mb"] = round(alias_table_bytes(res.graph) / 2**20, 1)
        if include_baselines:
            _, t_n2v = cache.node2vec(name)
            _, t_harp = cache.harp(name)
            row["N2V"] = round(t_n2v, 1)
            row["HARP"] = round(t_harp, 1)
        rows.append(row)
        print(f"[table6] {row}")
    df = pd.DataFrame(rows)
    print("\nTable 6 — Execution times (seconds) for embeddings generation")
    print(df.to_string(index=False))
    return df
