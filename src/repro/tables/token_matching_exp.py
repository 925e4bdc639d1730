"""Token-Matching experiment (§7.2 prose — country & language columns of IM).

For each code column pair of the IM scenario, compare F-measure of:
pre-trained (fastText-sim) nearest neighbour, char-3-gram Jaccard, and
EmbDI embeddings — the paper reports .13/.19/.31 (countries) and
.17/.20/.30 (languages).

EmbDI runs in a TM-tuned configuration (simple tokenization, window 5,
short walks, larger corpus): the code↔name signal travels the 2-hop
CID bridge created by mixed-format rows, which short walks and a wider
window capture best. §7.3 of the paper makes the same point — task-
specific tuning beats the single default configuration.

Candidates are B-only surface forms (values occurring verbatim in both
columns are trivial identity matches, not synonyms).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.tables.common import MethodCache, RunConfig
from repro.tasks.metrics import prf
from repro.tasks.token_matching import jaccard_token_match, token_match


def run_token_matching(
    spark: SparkSession,
    run: RunConfig | None = None,
    scenario: str = "IM",
    cache: MethodCache | None = None,
) -> pd.DataFrame:
    """Evaluate TM on every code-column pair of a scenario."""
    cache = cache or MethodCache(spark, run or RunConfig())
    sc = cache.scenario(scenario)
    from repro.core.embeddings import W2VConfig
    from repro.core.pipeline import EmbDIConfig, run_embdi
    from repro.core.walks import WalkConfig

    tm_cfg = EmbDIConfig(
        tokenization="simple",
        walk_length=20,
        corpus_k=max(cache.run.corpus_k, 200),
        start_nodes="overlap",
        walk=WalkConfig(walk_length=20, start_with="rid_or_cid", seed=cache.run.seed),
        w2v=W2VConfig(
            dim=cache.run.dim, window=5, min_count=1,
            max_iter=cache.run.max_iter, seed=cache.run.seed,
        ),
    )
    space = run_embdi(spark, sc.df_a, sc.df_b, tm_cfg).space
    ft = cache.pretrained()
    rows = []
    for (col_a, col_b), gt in sc.tm_gt.items():
        dom_a = {str(v) for v in sc.pdf_a[col_a].dropna()}
        dom_b = {str(v) for v in sc.pdf_b[col_b].dropna()}
        # the task is synonym discovery: values occurring verbatim in both
        # columns are trivial identity matches, so candidates are B-only
        # surface forms (the codes)
        dom_b = dom_b - dom_a
        vocab = [
            "tt__" + "_".join(v.strip().lower().split()) for v in (dom_a | dom_b)
        ]
        ft_space = ft.token_space(vocab)
        methods = {
            "Pretrained": token_match(ft_space, dom_a, dom_b, k=50),
            "Jaccard": jaccard_token_match(dom_a, dom_b),
            "EmbDI": token_match(space, dom_a, dom_b, k=50),
        }
        for m, pred in methods.items():
            f = prf(pred, gt).f1
            rows.append({"columns": f"{col_a}~{col_b}", "method": m, "F": round(f, 2)})
            print(f"[tm] {col_a}~{col_b} {m:10s} F={f:.2f}")
    df = pd.DataFrame(rows)
    print("\nToken Matching (§7.2) — F-measure")
    print(df.to_string(index=False))
    return df
