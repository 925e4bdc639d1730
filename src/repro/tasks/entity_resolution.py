"""Entity Resolution (paper §6, Algorithm 6) over RID embeddings.

Each RID keeps a candidate pool of its ``n_top`` nearest RIDs from the
other dataset; matching verifies symmetry (rk matches r′ only when r′'s
best remaining candidate is rk), which "increases precision by reducing
the false-positive rate without penalizing recall". Non-mutual heads are
struck from both pools and the sweep repeats until stable, so larger
pools recover matches the strict top-1 check would miss — reproducing
Table 5's P/R trade-off in ``n_top``.

``pretrained_tuple_space`` builds the unsupervised baseline's tuple
vectors (mean of cell-token vectors) so the *same* matcher runs on
pre-trained embeddings, as in Table 4's fastText column.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.embeddings import EmbeddingSpace
from repro.core.tokenize import RID_PREFIX, make_rid


def _rid_candidate_lists(
    space: EmbeddingSpace, queries: list[str], other: set[str], n_top: int
) -> dict[str, list[str]]:
    """``d(ri)`` of Algorithm 6: other-dataset RIDs among the ``n_top``
    nearest *vocabulary words* of each query.

    The ranked list is over the whole vocabulary (tokens, CIDs and
    same-dataset RIDs included, the query itself excluded) — exactly what
    a ``most_similar(topn=n_top)`` call sees. Tokens crowding the head of
    the list is what makes small ``n_top`` selective: a row only gets
    candidates at ``n_top = 1`` when its single nearest word is an
    other-dataset RID. That is the source of Table 5's P/R trade-off.
    """
    if not queries:
        return {}
    qm = np.stack([space.vec(q) for q in queries])
    sims = qm @ space.matrix.T
    words = np.asarray(space.words, dtype=object)
    out: dict[str, list[str]] = {}
    k = min(n_top + 1, len(words))  # +1: the query ranks itself first
    for i, q in enumerate(queries):
        order = np.lexsort((words, -sims[i]))[:k]
        out[q] = [str(words[j]) for j in order if words[j] != q and words[j] in other][: n_top]
    return out


def match_rids(
    space: EmbeddingSpace,
    rids_a: list[str],
    rids_b: list[str],
    n_top: int = 10,
) -> set:
    """Algorithm 6: symmetry-verified nearest-neighbour matching.

    ``rk ∈ D1`` matches ``r′ = findClosest(d(rk))`` iff
    ``findClosest(d(r′)) == rk``. Because ``d(·)`` only contains
    other-dataset RIDs that survive into the global top-``n_top`` word
    ranking, most non-duplicate rows have *empty* candidate lists — the
    symmetry check then "increases precision by reducing the false
    positive rate, without penalizing recall" (§6).
    """
    set_a, set_b = set(rids_a), set(rids_b)
    d_a = _rid_candidate_lists(space, rids_a, set_b, n_top)
    d_b = _rid_candidate_lists(space, rids_b, set_a, n_top)
    matched: set = set()
    for rk in rids_a:
        lst = d_a.get(rk, [])
        if not lst:
            continue
        cand = lst[0]
        back = d_b.get(cand, [])
        if back and back[0] == rk:
            matched.add((rk, cand))
    return matched


def er_match(space: EmbeddingSpace, n_top: int = 10) -> set:
    """Unsupervised ER between dataset 0 and dataset 1 RIDs of ``space``."""
    return match_rids(space, space.rids(0), space.rids(1), n_top)


def er_gt_as_rids(er_gt: set, single_table: bool = False) -> set:
    """Lift raw (rid_a, rid_b) int ground truth to RID node names."""
    d2 = 0 if single_table else 1
    return {(make_rid(0, a), make_rid(d2, b)) for a, b in er_gt}


def tuple_token_lists(pdf: pd.DataFrame) -> dict[int, list[str]]:
    """Per-row normalised word tokens (rid → tokens), mirroring `flatten`."""
    out: dict[int, list[str]] = {}
    cols = [c for c in pdf.columns if c != "rid"]
    for _, row in pdf.iterrows():
        toks: list[str] = []
        for c in cols:
            v = row[c]
            if v is None or (isinstance(v, float) and np.isnan(v)) or pd.isna(v):
                continue
            toks.extend(str(v).strip().lower().split())
        out[int(row["rid"])] = toks
    return out


def pretrained_tuple_space(
    pdf_a: pd.DataFrame,
    pdf_b: pd.DataFrame,
    word_vec,
    dim: int,
) -> EmbeddingSpace:
    """RID space whose vectors are means of per-word baseline vectors.

    ``word_vec(word) -> np.ndarray`` is any word-embedding lookup (the
    fastText-sim baseline); rows with no tokens get a tiny deterministic
    vector so the matcher still sees them.
    """
    vectors: dict[str, np.ndarray] = {}
    for didx, pdf in ((0, pdf_a), (1, pdf_b)):
        if pdf is None:
            continue
        for rid, toks in tuple_token_lists(pdf).items():
            if toks:
                v = np.mean([word_vec(t) for t in toks], axis=0)
            else:
                v = np.full(dim, 1e-9)
            vectors[make_rid(didx, rid)] = v
    return EmbeddingSpace.from_dict(vectors)
