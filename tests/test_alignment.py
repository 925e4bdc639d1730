"""Tests for Procrustes embedding alignment (paper §5.4, Algorithm 4)."""
import numpy as np
import pytest

from repro.core.embeddings import EmbeddingSpace
from repro.optimize.alignment import (
    align_spaces,
    alignment_residual,
    procrustes_rotation,
)


def _random_orthogonal(d, rng):
    q, _ = np.linalg.qr(rng.standard_normal((d, d)))
    return q


def test_procrustes_recovers_rotation():
    rng = np.random.default_rng(0)
    a = rng.standard_normal((20, 6))
    r = _random_orthogonal(6, rng)
    b = a @ r.T
    w = procrustes_rotation(a, b)
    assert np.allclose(a @ w.T, b, atol=1e-8)


def test_procrustes_is_orthogonal():
    rng = np.random.default_rng(1)
    a, b = rng.standard_normal((10, 4)), rng.standard_normal((10, 4))
    w = procrustes_rotation(a, b)
    assert np.allclose(w @ w.T, np.eye(4), atol=1e-8)


def test_procrustes_shape_mismatch():
    with pytest.raises(ValueError):
        procrustes_rotation(np.zeros((3, 2)), np.zeros((4, 2)))


def _spaces_with_common_words():
    rng = np.random.default_rng(2)
    d = 8
    shared = {f"tt__s{i}": rng.standard_normal(d) for i in range(12)}
    rot = _random_orthogonal(d, rng)
    a_vecs = dict(shared)
    a_vecs["tt__only_a"] = rng.standard_normal(d)
    # B sees the shared words rotated (different training run geometry)
    b_vecs = {w: rot @ v for w, v in shared.items()}
    b_vecs["tt__only_b"] = rng.standard_normal(d)
    return EmbeddingSpace.from_dict(a_vecs), EmbeddingSpace.from_dict(b_vecs)


def test_align_spaces_vocab_union():
    sa, sb = _spaces_with_common_words()
    merged = align_spaces(sa, sb)
    assert "tt__only_a" in merged and "tt__only_b" in merged
    assert len(merged) == len(set(sa.words) | set(sb.words))


def test_align_spaces_anchor_geometry_restored():
    """After alignment, shared words agree across the two origins."""
    sa, sb = _spaces_with_common_words()
    merged = align_spaces(sa, sb)
    # rotated-A anchors should now be near their B twins: similarity of the
    # merged anchor vector to B's original vector is ~1
    for w in sa.words:
        if w.startswith("tt__s"):
            assert float(merged.vec(w) @ sb.vec(w)) > 0.99


def test_align_spaces_dim_mismatch():
    sa = EmbeddingSpace.from_dict({"x": np.ones(3), "y": np.ones(3)})
    sb = EmbeddingSpace.from_dict({"x": np.ones(4), "y": np.ones(4)})
    with pytest.raises(ValueError, match="dimension"):
        align_spaces(sa, sb)


def test_align_spaces_needs_anchors():
    sa = EmbeddingSpace.from_dict({"a": np.ones(2), "b": np.ones(2)})
    sb = EmbeddingSpace.from_dict({"c": np.ones(2), "d": np.ones(2)})
    with pytest.raises(ValueError, match="anchor"):
        align_spaces(sa, sb)


def test_alignment_residual_improves():
    sa, sb = _spaces_with_common_words()
    anchors = [w for w in sa.words if w.startswith("tt__s")]
    pre, post = alignment_residual(sa, sb, anchors)
    assert post < pre
    assert post < 1e-6  # exact rotation is recoverable here
