"""Tests for the table-harness infrastructure (repro.tables.common)."""
import numpy as np
import pytest

from repro.core.embeddings import EmbeddingSpace
from repro.tables.common import MethodCache, RunConfig, fmt_row, local_value_vec


def test_runconfig_w2v_propagation():
    run = RunConfig(dim=32, window=5, max_iter=3, seed=9)
    w2v = run.w2v()
    assert (w2v.dim, w2v.window, w2v.max_iter, w2v.seed) == (32, 5, 3, 9)
    assert w2v.min_count == 1


def test_local_value_vec_whole_token():
    space = EmbeddingSpace.from_dict(
        {
            "tt__adobe_photoshop": np.array([1.0, 0.0]),
            "tt__adobe": np.array([0.0, 1.0]),
            "tt__photoshop": np.array([1.0, 1.0]),
        }
    )
    vec = local_value_vec(space, 2)
    # whole-value token wins when present
    assert np.allclose(vec("adobe_photoshop"), space.vec("tt__adobe_photoshop"))


def test_local_value_vec_word_fallback():
    space = EmbeddingSpace.from_dict(
        {"tt__adobe": np.array([0.0, 1.0]), "tt__photoshop": np.array([1.0, 0.0])}
    )
    vec = local_value_vec(space, 2)
    got = vec("adobe_photoshop_cs3")  # cs3 unseen, mean of the other two
    expected = (space.vec("tt__adobe") + space.vec("tt__photoshop")) / 2
    assert np.allclose(got, expected)


def test_local_value_vec_unknown_epsilon():
    space = EmbeddingSpace.from_dict({"tt__x": np.array([1.0, 0.0])})
    vec = local_value_vec(space, 2)
    got = vec("totally_unknown")
    assert got.shape == (2,)
    assert np.linalg.norm(got) < 1e-6


def test_fmt_row():
    assert fmt_row(["ab", 0.5], [4, 6]) == "ab    0.50  "


def test_method_cache_scenario_memoised(spark):
    cache = MethodCache(spark, RunConfig(scale=0.3))
    s1 = cache.scenario("FZ")
    s2 = cache.scenario("FZ")
    assert s1 is s2


def test_method_cache_embdi_memoised_by_key(spark):
    cache = MethodCache(spark, RunConfig(scale=0.3, corpus_k=10, max_iter=1, dim=16))
    r1 = cache.embdi("FZ", "simple", starts="all")
    r2 = cache.embdi("FZ", "simple", starts="all")
    assert r1 is r2
    r3 = cache.embdi("FZ", "flatten", starts="all")
    assert r3 is not r1
