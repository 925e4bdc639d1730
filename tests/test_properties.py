"""Property-based tests (hypothesis) for pure helpers."""
import math

import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.embeddings import EmbeddingSpace
from repro.optimize.numeric import round_sig
from repro.tasks.metrics import prf
from repro.tasks.token_matching import char_ngrams


@given(st.floats(min_value=-1e9, max_value=1e9, allow_nan=False), st.integers(1, 6))
def test_round_sig_idempotent(x, sig):
    once = round_sig(x, sig)
    assert round_sig(once, sig) == once


@given(st.floats(min_value=1e-6, max_value=1e9), st.integers(1, 6))
def test_round_sig_relative_error_bounded(x, sig):
    r = round_sig(x, sig)
    assert abs(r - x) <= abs(x) * (10.0 ** (1 - sig)) / 2 * 1.0001


@given(
    st.sets(st.tuples(st.integers(0, 20), st.integers(0, 20)), max_size=30),
    st.sets(st.tuples(st.integers(0, 20), st.integers(0, 20)), max_size=30),
)
def test_prf_bounds_and_symmetry_props(pred, gt):
    m = prf(pred, gt)
    assert 0 <= m.precision <= 1
    assert 0 <= m.recall <= 1
    assert 0 <= m.f1 <= 1
    eps = 1e-9
    assert (
        min(m.precision, m.recall) - eps <= m.f1 <= max(m.precision, m.recall) + eps
        or m.f1 == 0
    )
    if pred == gt and pred:
        assert m.f1 == 1.0


@given(st.text(alphabet="abcdefg _", min_size=0, max_size=20))
def test_char_ngrams_total(s):
    grams = char_ngrams(s, 3)
    assert grams  # never empty: padding guarantees at least one gram
    for g in grams:
        assert len(g) <= 3


@settings(max_examples=25)
@given(
    st.lists(
        st.lists(st.floats(-10, 10, allow_nan=False), min_size=3, max_size=3),
        min_size=2,
        max_size=8,
        unique_by=lambda v: tuple(v),
    )
)
def test_embedding_space_knn_self_similarity(vectors):
    vecs = {}
    for i, v in enumerate(vectors):
        arr = np.asarray(v)
        if np.linalg.norm(arr) < 1e-6:
            arr = arr + 1.0
        vecs[f"w{i}"] = arr
    space = EmbeddingSpace.from_dict(vecs)
    for w in space.words:
        # a word is always most similar to itself
        top = space.knn_vec(space.vec(w), 1)
        assert top[0][1] <= 1.0 + 1e-9
        assert space.sim(w, w) >= top[0][1] - 1e-9
