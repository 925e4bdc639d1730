"""Tests for Token Matching (TM) and its baselines."""
import numpy as np

from repro.core.embeddings import EmbeddingSpace
from repro.tasks.token_matching import char_ngrams, jaccard_token_match, token_match


def test_char_ngrams_padded():
    assert "^ab" in char_ngrams("ab", 3)
    assert char_ngrams("a", 3) == {"^a$"}


def test_char_ngrams_normalises():
    assert char_ngrams("A  B") == char_ngrams("a_b")


def test_jaccard_token_match_picks_closest_string():
    got = jaccard_token_match({"england"}, {"englund", "france"})
    assert got == {("england", "englund")}


def test_jaccard_token_match_empty_grams_no_pred():
    got = jaccard_token_match({"xyz"}, {"abc"})
    # zero similarity -> no prediction
    assert got == set()


def test_token_match_on_planted_space():
    vecs = {
        "tt__english": np.array([1.0, 0.0, 0.0]),
        "tt__en": np.array([0.95, 0.05, 0.0]),
        "tt__french": np.array([0.0, 1.0, 0.0]),
        "tt__fr": np.array([0.05, 0.95, 0.0]),
        "tt__noise": np.array([0.0, 0.0, 1.0]),
    }
    space = EmbeddingSpace.from_dict(vecs)
    got = token_match(space, {"english", "french"}, {"en", "fr"}, k=4)
    assert got == {("english", "en"), ("french", "fr")}


def test_token_match_oov_skipped():
    space = EmbeddingSpace.from_dict({"tt__a": np.array([1.0, 0.0]), "tt__b": np.array([0.9, 0.1])})
    got = token_match(space, {"zzz"}, {"b"}, k=3)
    assert got == set()


def test_token_match_k_limits_scan():
    """If no dom_b token is within the top-k, no prediction is made."""
    vecs = {"tt__q": np.array([1.0, 0.0, 0.0])}
    rng = np.random.default_rng(0)
    for i in range(20):  # clutter closer than the target
        vecs[f"tt__c{i}"] = np.array([1.0, 0.0, 0.0]) + 0.01 * rng.standard_normal(3)
    vecs["tt__far"] = np.array([0.0, 1.0, 0.0])
    space = EmbeddingSpace.from_dict(vecs)
    assert token_match(space, {"q"}, {"far"}, k=3) == set()
    assert token_match(space, {"q"}, {"far"}, k=30) == {("q", "far")}
