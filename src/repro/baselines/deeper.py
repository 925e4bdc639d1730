"""DeepER baseline — supervised embedding-based ER (substitution S6).

Ebraheem et al. (VLDB'18) represent each tuple through word embeddings of
its attribute values and train a classifier over pair similarities. The
reproduction keeps the design space the paper exercises:

* tuple/attribute vectors come from a pluggable word-embedding lookup —
  pre-trained fastText-sim (**DeepERP**) or EmbDI local vectors
  (**DeepERL**), exactly the swap Table 4 measures;
* blocking by tuple-vector cosine (top-k neighbours) produces candidates;
* features: per-aligned-attribute cosine + whole-tuple cosine;
* an MLlib LogisticRegression is trained on a small labelled fraction
  (5 % of ground truth, as in §7.2) plus sampled negatives;
* the **task-specific fine-tuning** variant appends the element-wise
  product of the two tuple vectors, so the classifier learns a diagonal
  re-weighting ``W`` of embedding dimensions — the §7.2 lookup-layer
  weight matrix reduced to its diagonal.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.ml.classification import LogisticRegression
from pyspark.ml.linalg import Vectors
from pyspark.sql import SparkSession

from repro.tasks.metrics import PRF, prf


def _norm(v) -> str | None:
    if v is None or pd.isna(v):
        return None
    s = "_".join(str(v).strip().lower().split())
    return s or None


def _cos(a: np.ndarray, b: np.ndarray) -> float:
    na, nb = np.linalg.norm(a), np.linalg.norm(b)
    if na == 0 or nb == 0:
        return 0.0
    return float(a @ b / (na * nb))


@dataclass
class DeepERData:
    """Pre-computed per-row attribute and tuple vectors for both datasets."""

    attr_vecs_a: dict[int, dict[str, np.ndarray]]
    attr_vecs_b: dict[int, dict[str, np.ndarray]]
    tuple_vecs_a: dict[int, np.ndarray]
    tuple_vecs_b: dict[int, np.ndarray]
    col_pairs: list[tuple[str, str]]
    dim: int


def prepare(
    pdf_a: pd.DataFrame,
    pdf_b: pd.DataFrame,
    col_pairs: list[tuple[str, str]],
    value_vec,
    dim: int,
) -> DeepERData:
    """Vectorise every row under the given word-embedding lookup."""

    def side(pdf: pd.DataFrame, cols: list[str]):
        attr, tup = {}, {}
        for _, row in pdf.iterrows():
            rid = int(row["rid"])
            vecs = {}
            acc = []
            for c in cols:
                v = _norm(row[c])
                if v is None:
                    continue
                vec = value_vec(v)
                vecs[c] = vec
                acc.append(vec)
            attr[rid] = vecs
            tup[rid] = np.mean(acc, axis=0) if acc else np.zeros(dim)
        return attr, tup

    attr_a, tup_a = side(pdf_a, [a for a, _ in col_pairs])
    attr_b, tup_b = side(pdf_b, [b for _, b in col_pairs])
    return DeepERData(attr_a, attr_b, tup_a, tup_b, col_pairs, dim)


def block_candidates(data: DeepERData, k: int = 10) -> list[tuple[int, int]]:
    """Top-``k`` tuple-cosine neighbours of each left row (the blocker)."""
    rids_a = sorted(data.tuple_vecs_a)
    rids_b = sorted(data.tuple_vecs_b)
    ma = np.stack([data.tuple_vecs_a[r] for r in rids_a])
    mb = np.stack([data.tuple_vecs_b[r] for r in rids_b])

    def unit(m):
        n = np.linalg.norm(m, axis=1, keepdims=True)
        n[n == 0] = 1
        return m / n

    sims = unit(ma) @ unit(mb).T
    out = []
    kk = min(k, len(rids_b))
    for i, ra in enumerate(rids_a):
        top = np.argpartition(-sims[i], kk - 1)[:kk]
        for j in sorted(top):
            out.append((ra, rids_b[j]))
    return out


def pair_features(data: DeepERData, ra: int, rb: int, fine_tune: bool) -> np.ndarray:
    """Similarity features of one candidate pair."""
    feats = []
    va, vb = data.attr_vecs_a.get(ra, {}), data.attr_vecs_b.get(rb, {})
    for ca, cb in data.col_pairs:
        if ca in va and cb in vb:
            feats.append(_cos(va[ca], vb[cb]))
        else:
            feats.append(0.0)
    ta, tb = data.tuple_vecs_a[ra], data.tuple_vecs_b[rb]
    feats.append(_cos(ta, tb))
    if fine_tune:
        na, nb = np.linalg.norm(ta), np.linalg.norm(tb)
        ua = ta / na if na else ta
        ub = tb / nb if nb else tb
        feats.extend((ua * ub).tolist())
    return np.asarray(feats)


def deeper_er(
    spark: SparkSession,
    data: DeepERData,
    er_gt: set,
    label_frac: float = 0.05,
    fine_tune: bool = False,
    blocking_k: int = 10,
    neg_per_pos: int = 3,
    seed: int = 0,
) -> PRF:
    """Train + evaluate one DeepER configuration; returns pair-level PRF."""
    rng = np.random.default_rng(seed)
    cands = block_candidates(data, blocking_k)
    gt = set(er_gt)
    cand_set = set(cands)
    # labelled sample: label_frac of gt as positives (injected into the
    # candidate set if the blocker missed them — labelling oracles see gt).
    # Floor of 5 positives: at reproduction scale 5% of a small gt can be
    # 1-2 pairs, which degenerates LR; the paper's datasets have 10-100x
    # more matches so its 5% never drops this low.
    gt_list = sorted(gt)
    n_pos = min(len(gt_list), max(5, int(round(label_frac * len(gt_list)))))
    pos_idx = rng.choice(len(gt_list), size=n_pos, replace=False)
    pos = [gt_list[i] for i in pos_idx]
    negs_pool = sorted(cand_set - gt)
    n_neg = min(len(negs_pool), n_pos * neg_per_pos)
    neg_idx = rng.choice(len(negs_pool), size=n_neg, replace=False) if n_neg else []
    neg = [negs_pool[i] for i in neg_idx]
    train_pairs = [(p, 1.0) for p in pos] + [(n, 0.0) for n in neg]

    rows = [
        (Vectors.dense(pair_features(data, ra, rb, fine_tune)), lbl)
        for (ra, rb), lbl in train_pairs
    ]
    train_df = spark.createDataFrame(rows, ["features", "label"])
    # the fine-tuned variant has dim extra features for the same few
    # labels — ridge-regularise harder so the learned diagonal W stays a
    # perturbation of the cosine features rather than an overfit
    lr = LogisticRegression(maxIter=50, regParam=0.2 if fine_tune else 0.01)
    model = lr.fit(train_df)

    test_pairs = sorted(cand_set - set(p for p, _ in train_pairs))
    test_rows = [
        (ra, rb, Vectors.dense(pair_features(data, ra, rb, fine_tune)))
        for ra, rb in test_pairs
    ]
    test_df = spark.createDataFrame(test_rows, ["ra", "rb", "features"])
    pred = model.transform(test_df).select("ra", "rb", "prediction").toPandas()
    predicted = {
        (int(r.ra), int(r.rb)) for r in pred.itertuples() if r.prediction >= 0.5
    }
    # training positives count as resolved matches (standard protocol:
    # evaluate on the non-labelled remainder)
    eval_gt = gt - set(p for p, _ in train_pairs)
    return prf(predicted, eval_gt)
