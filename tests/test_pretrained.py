"""Tests for the simulated pre-trained embeddings (substitution S2)."""
import numpy as np
import pytest

from repro.baselines.pretrained import FastTextSim


@pytest.fixture(scope="module")
def ft():
    return FastTextSim(dim=32, seed=0)


def test_deterministic(ft):
    v1 = ft.word_vec("hello")
    v2 = FastTextSim(dim=32, seed=0).word_vec("hello")
    assert np.allclose(v1, v2)


def test_seed_changes_vectors():
    a = FastTextSim(dim=32, seed=0).word_vec("hello")
    b = FastTextSim(dim=32, seed=1).word_vec("hello")
    assert not np.allclose(a, b)


def test_unit_norm(ft):
    for w in ["a", "hello", "superlongword"]:
        assert np.isclose(np.linalg.norm(ft.word_vec(w)), 1.0)


def test_no_oov(ft):
    v = ft.word_vec("zzqy_never_seen_8231")
    assert v.shape == (32,)
    assert np.linalg.norm(v) > 0


def test_subword_similarity(ft):
    """fastText property: a typo'd word stays close; unrelated words do not."""
    def cos(a, b):
        return float(ft.word_vec(a) @ ft.word_vec(b))

    assert cos("photoshop", "photoshopp") > cos("photoshop", "zebra") + 0.3
    assert cos("england", "englund") > cos("england", "xylophone")


def test_case_insensitive(ft):
    assert np.allclose(ft.word_vec("Hello"), ft.word_vec("hello"))


def test_value_vec_multiword_mean(ft):
    v = ft.value_vec("adobe photoshop")
    expected = (ft.word_vec("adobe") + ft.word_vec("photoshop")) / 2
    assert np.allclose(v, expected)


def test_value_vec_underscore_normalised(ft):
    assert np.allclose(ft.value_vec("adobe_photoshop"), ft.value_vec("adobe photoshop"))


def test_value_vec_empty(ft):
    v = ft.value_vec("")
    assert np.linalg.norm(v) < 1e-6


def test_token_space(ft):
    sp = ft.token_space(["tt__apple", "tt__aplpe", "tt__zebra"])
    assert set(sp.words) == {"tt__apple", "tt__aplpe", "tt__zebra"}
    assert sp.sim("tt__apple", "tt__aplpe") > sp.sim("tt__apple", "tt__zebra")


def test_no_dataset_semantics(ft):
    """Unlike local embeddings, co-occurrence in a dataset cannot move
    pre-trained vectors: two string-unrelated words stay unrelated."""
    assert abs(float(ft.word_vec("paul") @ ft.word_vec("mike"))) < 0.5
