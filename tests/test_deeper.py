"""Tests for the DeepER supervised-ER baseline (substitution S6)."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.deeper import (
    block_candidates,
    deeper_er,
    pair_features,
    prepare,
)
from repro.baselines.pretrained import FastTextSim


@pytest.fixture(scope="module")
def easy_pair():
    """40 rows per side; first 20 are near-identical matches."""
    rng = np.random.default_rng(0)
    words = [f"w{i}" for i in range(200)]
    names_a = [" ".join(rng.choice(words, 3, replace=False)) for _ in range(40)]
    cats = [f"cat{i % 4}" for i in range(40)]
    pdf_a = pd.DataFrame({"rid": range(40), "name": names_a, "cat": cats})
    names_b = [
        names_a[i] if i < 20 else " ".join(rng.choice(words, 3, replace=False))
        for i in range(40)
    ]
    pdf_b = pd.DataFrame({"rid": range(40), "title": names_b, "kind": cats})
    gt = {(i, i) for i in range(20)}
    return pdf_a, pdf_b, gt


@pytest.fixture(scope="module")
def easy_data(easy_pair):
    pdf_a, pdf_b, _ = easy_pair
    ft = FastTextSim(dim=24)
    return prepare(pdf_a, pdf_b, [("name", "title"), ("cat", "kind")], ft.value_vec, 24)


def test_prepare_shapes(easy_data):
    assert len(easy_data.tuple_vecs_a) == 40
    assert len(easy_data.tuple_vecs_b) == 40
    assert set(easy_data.attr_vecs_a[0]) == {"name", "cat"}


def test_pair_features_lengths(easy_data):
    f = pair_features(easy_data, 0, 0, fine_tune=False)
    assert f.shape == (3,)  # 2 column cosines + tuple cosine
    f_ft = pair_features(easy_data, 0, 0, fine_tune=True)
    assert f_ft.shape == (3 + 24,)


def test_pair_features_match_scores_high(easy_data):
    match = pair_features(easy_data, 0, 0, False)
    non = pair_features(easy_data, 0, 25, False)
    assert match[0] > 0.95          # identical names
    assert match[0] > non[0] + 0.3


def test_block_candidates_contains_matches(easy_data, easy_pair):
    _, _, gt = easy_pair
    cands = set(block_candidates(easy_data, k=10))
    hit = sum(1 for p in gt if p in cands)
    assert hit >= len(gt) * 0.9


def test_block_candidates_k_bound(easy_data):
    cands = block_candidates(easy_data, k=5)
    assert len(cands) == 40 * 5


def test_deeper_er_learns(spark, easy_data, easy_pair):
    _, _, gt = easy_pair
    m = deeper_er(spark, easy_data, gt, label_frac=0.25, seed=0)
    assert m.f1 >= 0.7, m


def test_deeper_er_fine_tune_runs(spark, easy_data, easy_pair):
    _, _, gt = easy_pair
    m = deeper_er(spark, easy_data, gt, label_frac=0.25, fine_tune=True, seed=0)
    assert m.f1 >= 0.5, m
