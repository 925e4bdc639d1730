"""Unit tests for the MA/MR/MC quality-test machinery (paper §7.1)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.embeddings import EmbeddingSpace
from repro.tasks.quality import (
    QualityTest,
    evaluate_quality,
    generate_ma,
    generate_mc,
    generate_mr,
    generate_tests,
)


@pytest.fixture()
def frame():
    rng = np.random.default_rng(0)
    n = 40
    return pd.DataFrame(
        {
            "rid": range(n),
            "brand": [f"brand{i % 5}" for i in range(n)],
            "name": [f"name{i}" for i in range(n)],
            "year": [1990 + (i % 7) for i in range(n)],
        }
    )


def test_ma_structure(frame):
    rng = np.random.default_rng(1)
    tests = generate_ma(frame, 30, rng)
    assert len(tests) == 30
    for t in tests:
        assert t.kind == "MA"
        assert len(t.tokens) == 5
        assert t.outlier == t.tokens[-1]
        assert t.outlier not in t.tokens[:4]


def test_mr_structure(frame):
    rng = np.random.default_rng(2)
    tests = generate_mr(frame, 30, rng)
    assert len(tests) == 30
    for t in tests:
        assert t.kind == "MR"
        assert t.outlier in t.tokens
        assert len(t.tokens) >= 3


def test_mc_structure(frame):
    rng = np.random.default_rng(3)
    tests = generate_mc(frame, 20, rng, ("brand", "name"))
    assert len(tests) == 20
    for t in tests:
        assert t.kind == "MC"
        assert len(t.tokens) == 5
        assert t.outlier == t.tokens[-1]
    # the outlier name must not co-occur with the key brand
    groups = frame.groupby("brand")["name"].apply(set).to_dict()
    for t in tests:
        key = t.tokens[0][len("tt__"):]
        odd = t.outlier[len("tt__"):]
        assert odd not in {v.lower() for v in groups[key]}


def test_mc_missing_pair_returns_empty(frame):
    rng = np.random.default_rng(4)
    assert generate_mc(frame, 10, rng, ("nope", "name")) == []


def test_generate_tests_both_frames(frame):
    other = frame.copy()
    other["name"] = other["name"].str.replace("name", "other")
    tests = generate_tests(frame, other, ("brand", "name"), n_per_kind=20, seed=0)
    kinds = {t.kind for t in tests}
    assert kinds == {"MA", "MR", "MC"}


def test_generate_tests_deterministic(frame):
    t1 = generate_tests(frame, None, ("brand", "name"), n_per_kind=15, seed=9)
    t2 = generate_tests(frame, None, ("brand", "name"), n_per_kind=15, seed=9)
    assert t1 == t2


def test_evaluate_quality_perfect_space():
    """A space where outliers are orthogonal passes every test."""
    tests = [
        QualityTest("MA", ("tt__a", "tt__b", "tt__odd"), "tt__odd"),
        QualityTest("MR", ("tt__a", "tt__b", "tt__odd"), "tt__odd"),
        QualityTest("MC", ("tt__a", "tt__b", "tt__odd"), "tt__odd"),
    ]
    space = EmbeddingSpace.from_dict(
        {
            "tt__a": np.array([1.0, 0.05]),
            "tt__b": np.array([1.0, -0.05]),
            "tt__odd": np.array([0.0, 1.0]),
        }
    )
    scores = evaluate_quality(space, tests)
    assert scores["MA"] == scores["MR"] == scores["MC"] == 1.0
    assert scores["AVG"] == 1.0
    assert scores["n_tests"] == 3


def test_evaluate_quality_oov_counts_as_failure():
    tests = [QualityTest("MA", ("tt__a", "tt__b", "tt__missing"), "tt__missing")]
    space = EmbeddingSpace.from_dict(
        {"tt__a": np.array([1.0, 0.0]), "tt__b": np.array([1.0, 0.1])}
    )
    scores = evaluate_quality(space, tests)
    assert scores["MA"] == 0.0


def test_evaluate_quality_empty_kind_nan():
    tests = [QualityTest("MA", ("tt__a", "tt__b", "tt__c"), "tt__c")]
    space = EmbeddingSpace.from_dict(
        {
            "tt__a": np.array([1.0, 0.0]),
            "tt__b": np.array([1.0, 0.1]),
            "tt__c": np.array([0.0, 1.0]),
        }
    )
    scores = evaluate_quality(space, tests)
    assert np.isnan(scores["MR"]) and np.isnan(scores["MC"])
    assert scores["AVG"] == 1.0  # mean over non-nan kinds


def test_ma_skips_ambiguous_values():
    """Values present in two columns never become MA outliers."""
    pdf = pd.DataFrame(
        {
            "rid": range(8),
            "x": ["v1", "v2", "v3", "v4", "shared", "v5", "v6", "v7"],
            "y": ["shared"] * 8,
        }
    )
    rng = np.random.default_rng(0)
    for t in generate_ma(pdf, 20, rng):
        if t.outlier == "tt__shared":
            # only valid if the four x-values do not contain it
            assert "tt__shared" not in t.tokens[:4]
