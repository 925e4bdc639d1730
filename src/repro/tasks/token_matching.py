"""Token Matching (paper §6 "TM"): conceptual synonyms across two columns.

Given two aligned attributes, for every token of the first domain the
top-``k`` embedding neighbours are scanned and the first one that belongs
to the second domain is announced as its synonym. Baselines: the same
scan over pre-trained (fastText-sim) vectors, and a character-3-gram
Jaccard ranking (the paper's Jaccard-similarity baseline).
"""
from __future__ import annotations

import numpy as np

from repro.core.embeddings import EmbeddingSpace
from repro.core.tokenize import TOKEN_PREFIX


def _normed(v: str) -> str:
    return "_".join(str(v).strip().lower().split())


def token_match(
    space: EmbeddingSpace,
    dom_a: set[str],
    dom_b: set[str],
    k: int = 20,
) -> set:
    """Predict ``{(value_a, value_b)}`` synonym pairs (normalised values).

    ``dom_a`` / ``dom_b`` are raw column domains; values missing from the
    vocabulary yield no prediction (counted against recall downstream).
    """
    preds: set = set()
    b_tokens = {TOKEN_PREFIX + _normed(v) for v in dom_b}
    for v in dom_a:
        tok = TOKEN_PREFIX + _normed(v)
        if tok not in space:
            continue
        for w, _ in space.knn(tok, k):
            if w in b_tokens and w != tok:
                preds.add((_normed(v), w[len(TOKEN_PREFIX):]))
                break
    return preds


def char_ngrams(s: str, n: int = 3) -> set[str]:
    """Padded character n-grams of a normalised string."""
    s = f"^{_normed(s)}$"
    if len(s) < n:
        return {s}
    return {s[i: i + n] for i in range(len(s) - n + 1)}


def jaccard_token_match(dom_a: set[str], dom_b: set[str]) -> set:
    """Jaccard-over-3-grams baseline: best-scoring b-value per a-value."""
    preds: set = set()
    b_vals = sorted({_normed(v) for v in dom_b})
    b_grams = {v: char_ngrams(v) for v in b_vals}
    for v in sorted({_normed(x) for x in dom_a}):
        ga = char_ngrams(v)
        best, best_s = None, -1.0
        for bv in b_vals:
            gb = b_grams[bv]
            u = len(ga | gb)
            s = len(ga & gb) / u if u else 0.0
            if s > best_s:
                best, best_s = bv, s
        if best is not None and best_s > 0:
            preds.add((v, best))
    return preds
