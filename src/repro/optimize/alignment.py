"""Embedding alignment (paper §5.4, Algorithm 4).

Two spaces trained independently (one per relation) are aligned by
solving the orthogonal Procrustes problem on their *anchor* words — the
vocabulary they share (values, or candidate RIDs/CIDs from a first
matching pass): ``W* = argmin_W ||W A − B||`` with ``W`` orthogonal, via
SVD. Anchors get the average of the rotated and target vectors; all other
words keep their (rotated) original vector, so each relation's internal
geometry is preserved — the property the paper adapts from multilingual
translation [11].
"""
from __future__ import annotations

import numpy as np

from repro.core.embeddings import EmbeddingSpace


def procrustes_rotation(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """Orthogonal ``W`` minimising ``||a @ W.T − b||_F`` (rows are vectors)."""
    if a.shape != b.shape:
        raise ValueError("anchor matrices must have equal shape")
    u, _, vt = np.linalg.svd(b.T @ a)
    return u @ vt


def align_spaces(
    space_a: EmbeddingSpace,
    space_b: EmbeddingSpace,
    anchors: list[str] | None = None,
) -> EmbeddingSpace:
    """Algorithm 4: rotate ``space_a`` onto ``space_b`` and merge.

    ``anchors`` defaults to the shared vocabulary (``U1 ∩ U2``). Anchor
    words get the average of rotated-A and B vectors; A-only words the
    rotated A vector; B-only words the B vector.
    """
    if space_a.dim != space_b.dim:
        raise ValueError("spaces must share dimensionality")
    if anchors is None:
        anchors = sorted(set(space_a.words) & set(space_b.words))
    anchors = [w for w in anchors if w in space_a and w in space_b]
    if len(anchors) < 2:
        raise ValueError("need at least 2 anchor words to align")
    a = np.stack([space_a.vec(w) for w in anchors])
    b = np.stack([space_b.vec(w) for w in anchors])
    w_star = procrustes_rotation(a, b)
    vectors: dict[str, np.ndarray] = {}
    anchor_set = set(anchors)
    for w in space_b.words:
        vectors[w] = space_b.vec(w)
    for w in space_a.words:
        rotated = w_star @ space_a.vec(w)
        if w in anchor_set:
            vectors[w] = (rotated + space_b.vec(w)) / 2.0
        elif w not in vectors:
            vectors[w] = rotated
    return EmbeddingSpace.from_dict(vectors)


def alignment_residual(
    space_a: EmbeddingSpace, space_b: EmbeddingSpace, anchors: list[str]
) -> tuple[float, float]:
    """(pre, post) mean anchor distance — diagnostic that rotation helps."""
    a = np.stack([space_a.vec(w) for w in anchors])
    b = np.stack([space_b.vec(w) for w in anchors])
    w_star = procrustes_rotation(a, b)
    pre = float(np.linalg.norm(a - b, axis=1).mean())
    post = float(np.linalg.norm(a @ w_star.T - b, axis=1).mean())
    return pre, post
