"""Schema Matching (paper §6, Algorithm 5) plus the Base BoW matcher (§7.2).

Algorithm 5 is a symmetric mutual-nearest-neighbour matcher over CID
embeddings: a column pair matches when each is the other's closest
remaining candidate; non-mutual closest candidates are struck from both
candidate lists; the paper terminates after two sweeps to avoid false
positives. The same matcher skeleton, fed a Jaccard bag-of-words
similarity instead of embedding cosine, is the unsupervised ``Base``
system of Table 3.
"""
from __future__ import annotations

from typing import Callable

import numpy as np
import pandas as pd

from repro.core.embeddings import EmbeddingSpace
from repro.core.tokenize import make_cid


def mutual_nn_match(
    items1: list,
    items2: list,
    sim: Callable[[object, object], float],
    max_sweeps: int = 2,
) -> set:
    """Algorithm 5's matching loop over an arbitrary similarity function.

    Candidate lists are sorted by descending similarity (deterministic
    tie-break on item); a sweep visits every unmatched item, matches
    mutual-closest pairs, and prunes non-mutual closest candidates from
    both lists. Stops after ``max_sweeps`` sweeps (paper: 2) or when no
    candidates remain.
    """
    cand: dict = {}
    for a in items1:
        cand[a] = sorted(items2, key=lambda b: (-sim(a, b), str(b)))
    for b in items2:
        cand[b] = sorted(items1, key=lambda a: (-sim(a, b), str(a)))
    active = list(items1) + list(items2)
    matched: set = set()
    taken: set = set()
    for _ in range(max_sweeps):
        progressed = False
        for ck in list(active):
            if ck in taken or ck not in cand:
                continue
            lst = cand[ck]
            while lst and lst[0] in taken:
                lst.pop(0)
            if not lst:
                cand.pop(ck, None)
                continue
            other = lst[0]
            back = cand.get(other, [])
            while back and back[0] in taken:
                back.pop(0)
            if back and back[0] == ck:
                pair = (ck, other) if ck in items1 else (other, ck)
                matched.add(pair)
                taken.add(ck)
                taken.add(other)
                progressed = True
            else:
                lst.pop(0)
                if ck in back:
                    back.remove(ck)
                progressed = True
        if not progressed:
            break
    return matched


def schema_match(
    space: EmbeddingSpace, dataset_a: int = 0, dataset_b: int = 1
) -> set:
    """Algorithm 5 over CID vectors. Returns ``{(cid_a, cid_b)}`` node names."""
    c1 = [c for c in space.cids(dataset_a)]
    c2 = [c for c in space.cids(dataset_b)]
    if not c1 or not c2:
        return set()
    return mutual_nn_match(c1, c2, lambda a, b: space.sim(a, b))


def _norm_set(series: pd.Series) -> set:
    return {
        "_".join(str(v).strip().lower().split())
        for v in series.dropna()
        if str(v).strip() != ""
    }


def base_bow_match(pdf_a: pd.DataFrame, pdf_b: pd.DataFrame) -> set:
    """``Base``: column overlap as bag-of-words Jaccard + the same matcher.

    Returns raw ``{(col_a, col_b)}`` column-name pairs (no cid prefix).
    """
    cols_a = [c for c in pdf_a.columns if c != "rid"]
    cols_b = [c for c in pdf_b.columns if c != "rid"]
    sets_a = {c: _norm_set(pdf_a[c]) for c in cols_a}
    sets_b = {c: _norm_set(pdf_b[c]) for c in cols_b}

    def jac(a: str, b: str) -> float:
        sa = sets_a[a] if a in sets_a else sets_b[a]
        sb = sets_b[b] if b in sets_b else sets_a[b]
        union = sa | sb
        return len(sa & sb) / len(union) if union else 0.0

    return mutual_nn_match(cols_a, cols_b, jac)


def sm_gt_as_cids(sm_gt: set) -> set:
    """Lift raw column-name ground truth to CID node names."""
    return {(make_cid(0, a), make_cid(1, b)) for a, b in sm_gt}
