"""Table 1 — Dataset properties.

For every scenario: #tuples, #columns, #distinct values, #matches,
#sentences (the corpus-rule target at this run's K), and % overlap
(distinct normalised values present in both datasets / all distinct
values). The paper's absolute counts are ~10–100× larger (DESIGN.md §5);
EXPERIMENTS.md places them side by side.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.pipeline import corpus_target_tokens
from repro.core.tokenize import cells
from repro.scenarios import SCENARIOS
from repro.tables.common import MethodCache, RunConfig


def dataset_properties(cache: MethodCache, name: str) -> dict:
    """One Table-1 row for a scenario."""
    sc = cache.scenario(name)
    cells_a = cells(sc.df_a, 0)
    # paper's "# columns" is per (aligned) dataset, not summed over the pair
    n_cols = len(sc.pdf_a.columns) - 1
    n_rows = len(sc.pdf_a)
    if sc.df_b is not None:
        cells_b = cells(sc.df_b, 1)
        da = cells_a.select("value").distinct()
        db = cells_b.select("value").distinct()
        n_shared = da.join(db, "value").count()
        n_distinct = da.union(db).distinct().count()
        overlap = 100.0 * n_shared / n_distinct if n_distinct else 0.0
        n_cols = max(n_cols, len(sc.pdf_b.columns) - 1)
        n_rows += len(sc.pdf_b)
    else:
        n_distinct = cells_a.select("value").distinct().count()
        overlap = float("nan")
    target = corpus_target_tokens(n_distinct, n_rows, cache.run.corpus_k)
    return {
        "dataset": name,
        "n_tuples": n_rows,
        "n_columns": n_cols,
        "n_distinct": n_distinct,
        "n_matches": len(sc.er_gt),
        "n_sentences": max(1, target // cache.run.walk_length),
        "overlap_pct": round(overlap, 2),
    }


def run_table1(
    spark: SparkSession,
    run: RunConfig | None = None,
    scenarios: list[str] | None = None,
    cache: MethodCache | None = None,
) -> pd.DataFrame:
    """Build and print Table 1 for all (or selected) scenarios."""
    cache = cache or MethodCache(spark, run or RunConfig())
    rows = [dataset_properties(cache, n) for n in (scenarios or SCENARIOS)]
    df = pd.DataFrame(rows)
    print("\nTable 1 — Dataset properties (reproduction scale)")
    print(df.to_string(index=False))
    return df
