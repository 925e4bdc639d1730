"""Unit tests for repro.core.embeddings (EmbeddingSpace + Word2Vec wrapper)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.embeddings import EmbeddingSpace, W2VConfig, train_word2vec


@pytest.fixture()
def toy_space():
    """Hand-built geometry: a~b, c orthogonal; plus rid/cid namespaces."""
    v = {
        "tt__a": np.array([1.0, 0.1, 0.0]),
        "tt__b": np.array([1.0, 0.0, 0.1]),
        "tt__c": np.array([0.0, 0.0, 1.0]),
        "idx__0_0": np.array([0.5, 0.5, 0.0]),
        "idx__1_0": np.array([0.5, 0.4, 0.1]),
        "cid__0_x": np.array([0.0, 1.0, 0.0]),
    }
    return EmbeddingSpace.from_dict(v)


def test_vectors_normalized(toy_space):
    for w in toy_space.words:
        assert np.isclose(np.linalg.norm(toy_space.vec(w)), 1.0)


def test_sim_symmetric_and_bounded(toy_space):
    s1 = toy_space.sim("tt__a", "tt__b")
    s2 = toy_space.sim("tt__b", "tt__a")
    assert np.isclose(s1, s2)
    assert -1.0001 <= s1 <= 1.0001
    assert toy_space.sim("tt__a", "tt__a") == pytest.approx(1.0)


def test_contains_len_dim(toy_space):
    assert "tt__a" in toy_space and "tt__zzz" not in toy_space
    assert len(toy_space) == 6
    assert toy_space.dim == 3


def test_vec_raises_oov(toy_space):
    with pytest.raises(KeyError):
        toy_space.vec("tt__missing")


def test_knn_order_and_exclusion(toy_space):
    nn = toy_space.knn("tt__a", 2)
    assert nn[0][0] == "tt__b"
    assert all(w != "tt__a" for w, _ in nn)
    sims = [s for _, s in nn]
    assert sims == sorted(sims, reverse=True)


def test_knn_candidates_restriction(toy_space):
    nn = toy_space.knn("tt__a", 5, candidates=["tt__c", "cid__0_x"])
    assert {w for w, _ in nn} == {"tt__c", "cid__0_x"}


def test_knn_vec_rejects_zero(toy_space):
    with pytest.raises(ValueError):
        toy_space.knn_vec(np.zeros(3), 1)


def test_doesnt_match_picks_outlier(toy_space):
    assert toy_space.doesnt_match(["tt__a", "tt__b", "tt__c"]) == "tt__c"


def test_doesnt_match_oov_raises(toy_space):
    with pytest.raises(KeyError):
        toy_space.doesnt_match(["tt__a", "tt__nope"])


def test_namespace_subspaces(toy_space):
    assert toy_space.rids() == ["idx__0_0", "idx__1_0"]
    assert toy_space.rids(0) == ["idx__0_0"]
    assert toy_space.rids(1) == ["idx__1_0"]
    assert toy_space.cids() == ["cid__0_x"]
    assert toy_space.cids(1) == []
    assert toy_space.tokens() == ["tt__a", "tt__b", "tt__c"]


def test_from_dict_length_mismatch():
    with pytest.raises(ValueError):
        EmbeddingSpace(["a", "b"], np.zeros((3, 2)))


def test_train_word2vec_smoke(spark):
    """Words co-occurring in sentences end up with vectors; dim honoured."""
    sents = [(i, ["x", "y", "z"]) for i in range(30)]
    df = spark.createDataFrame(sents, "walk_id long, sentence array<string>")
    space = train_word2vec(df, W2VConfig(dim=8, window=2, seed=0))
    assert set(space.words) == {"x", "y", "z"}
    assert space.dim == 8


def test_train_word2vec_min_count(spark):
    sents = [(0, ["a", "b"] * 5), (1, ["a", "rare"])]
    df = spark.createDataFrame(sents, "walk_id long, sentence array<string>")
    space = train_word2vec(df, W2VConfig(dim=4, window=2, seed=0, min_count=3))
    assert "rare" not in space
    assert "a" in space


def test_train_word2vec_deterministic(spark):
    sents = [(i, ["p", "q", "r", "s"]) for i in range(20)]
    df = spark.createDataFrame(sents, "walk_id long, sentence array<string>")
    s1 = train_word2vec(df, W2VConfig(dim=8, window=2, seed=5, num_partitions=1))
    s2 = train_word2vec(df, W2VConfig(dim=8, window=2, seed=5, num_partitions=1))
    for w in s1.words:
        assert np.allclose(s1.vec(w), s2.vec(w))
