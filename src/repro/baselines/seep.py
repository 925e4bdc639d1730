"""SEEP baseline — "Seeping Semantics" attribute matcher (substitution S6).

Fernandez et al. (ICDE'18) link attributes by comparing embedding-based
signatures built from attribute *names* (SeepP relies heavily on label
quality, as the paper's §7.2 remark about synthetic labels shows) and, in
our instance-aware variant, sampled attribute *values*. The reproduction
keeps that shape: a column's signature is the concatenation of its
name-embedding mean and its instance-embedding mean; candidate pairs above
a similarity threshold go through the same mutual-NN matcher.

Two configurations, as in Table 3:
* **SeepP** — signatures from pre-trained (fastText-sim) vectors.
* **SeepL** — signatures from EmbDI token vectors (names fall back to the
  pre-trained vector when absent from the local vocabulary, mirroring how
  the paper plugged EmbDI embeddings into the existing system).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.baselines.pretrained import FastTextSim
from repro.core.embeddings import EmbeddingSpace
from repro.core.tokenize import TOKEN_PREFIX, make_cid
from repro.tasks.schema_matching import mutual_nn_match


def _norm(v) -> str | None:
    if v is None or pd.isna(v):
        return None
    s = "_".join(str(v).strip().lower().split())
    return s or None


def _instance_mean(
    values: list[str], local: EmbeddingSpace | None, ft: FastTextSim
) -> np.ndarray:
    vecs = []
    for v in values:
        if local is not None:
            tok = TOKEN_PREFIX + v
            if tok in local:
                vecs.append(local.vec(tok))
                continue
        if local is None:
            vecs.append(ft.value_vec(v))
    if not vecs:
        return np.full(ft.dim if local is None else local.dim, 1e-9)
    return np.mean(vecs, axis=0)


def seep_signatures(
    pdf: pd.DataFrame,
    local: EmbeddingSpace | None,
    ft: FastTextSim,
    n_sample: int = 50,
    seed: int = 0,
    dataset_idx: int | None = None,
) -> dict[str, np.ndarray]:
    """Per-column signature = [name-mean ; instance-mean], L2-normalised.

    With a local space, the instance component is the column's own CID
    vector when trained (that *is* the column's embedding once EmbDI
    vectors are plugged into the system — the §7.2 SeepL configuration),
    falling back to the mean of in-vocabulary instance tokens.
    """
    rng = np.random.default_rng(seed)
    out = {}
    for c in pdf.columns:
        if c == "rid":
            continue
        name_vec = ft.value_vec(c.replace("_", " "))
        inst_vec = None
        if local is not None and dataset_idx is not None:
            cid = make_cid(dataset_idx, c)
            if cid in local:
                inst_vec = local.vec(cid)
        if inst_vec is None:
            vals = sorted({v for v in (_norm(x) for x in pdf[c]) if v is not None})
            if len(vals) > n_sample:
                vals = list(rng.choice(vals, n_sample, replace=False))
            inst_vec = _instance_mean(vals, local, ft)
        sig = np.concatenate([name_vec / (np.linalg.norm(name_vec) or 1.0),
                              inst_vec / (np.linalg.norm(inst_vec) or 1.0)])
        out[c] = sig / (np.linalg.norm(sig) or 1.0)
    return out


def seep_match(
    pdf_a: pd.DataFrame,
    pdf_b: pd.DataFrame,
    local: EmbeddingSpace | None = None,
    threshold: float = 0.1,
    dim: int = 64,
    seed: int = 0,
) -> set:
    """SEEP attribute matching; ``local=None`` is SeepP, else SeepL.

    Returns raw ``{(col_a, col_b)}`` pairs. The threshold guards against
    matching unrelated leftovers; it applies to the *combined* name+instance
    signature, whose true-pair similarities sit well below the per-component
    cosines (the two halves are independent), hence the low default.
    """
    ft = FastTextSim(dim=dim, seed=seed)
    sig_a = seep_signatures(pdf_a, local, ft, seed=seed, dataset_idx=0)
    sig_b = seep_signatures(pdf_b, local, ft, seed=seed + 1, dataset_idx=1)

    def sim(a: str, b: str) -> float:
        va = sig_a[a] if a in sig_a else sig_b[a]
        vb = sig_b[b] if b in sig_b else sig_a[b]
        return float(va @ vb)

    matches = mutual_nn_match(sorted(sig_a), sorted(sig_b), sim)
    return {(a, b) for a, b in matches if sim(a, b) >= threshold}
