"""Table 5 — Effect of ``n_top`` on ER precision / recall / F-measure.

Sweeps n_top ∈ {1, 5, 10, 100} over the six datasets the paper reports
(AG, BB, DA, IA, IM, WA), reusing each scenario's EmbDI-O space.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.tables.common import MethodCache, RunConfig
from repro.tasks.entity_resolution import er_gt_as_rids, er_match
from repro.tasks.metrics import prf

NTOPS = (1, 5, 10, 100)
DATASETS = ("AG", "BB", "DA", "IA", "IM", "WA")


def run_table5(
    spark: SparkSession,
    run: RunConfig | None = None,
    scenarios: tuple = DATASETS,
    ntops: tuple = NTOPS,
    cache: MethodCache | None = None,
) -> pd.DataFrame:
    """Build and print Table 5."""
    cache = cache or MethodCache(spark, run or RunConfig())
    rows = []
    for name in scenarios:
        sc = cache.scenario(name)
        space = cache.embdi(name, "overlap").space
        gt = er_gt_as_rids(sc.er_gt)
        for n_top in ntops:
            m = prf(er_match(space, n_top), gt)
            rows.append(
                {
                    "n_top": n_top,
                    "dataset": name,
                    "P": round(m.precision, 3),
                    "R": round(m.recall, 3),
                    "F": round(m.f1, 3),
                }
            )
            print(f"[table5] {name:4s} n_top={n_top:<4d} P={m.precision:.3f} R={m.recall:.3f} F={m.f1:.3f}")
    df = pd.DataFrame(rows)
    print("\nTable 5 — Effects of n_top on ER quality")
    print(df.pivot(index="n_top", columns="dataset", values=["P", "R", "F"]).to_string())
    return df
