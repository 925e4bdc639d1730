"""Tests for Algorithm 6 (ER) and the pretrained tuple-space baseline."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.pretrained import FastTextSim
from repro.core.embeddings import EmbeddingSpace
from repro.tasks.entity_resolution import (
    _rid_candidate_lists,
    er_gt_as_rids,
    er_match,
    match_rids,
    pretrained_tuple_space,
    tuple_token_lists,
)
from repro.tasks.metrics import prf


@pytest.fixture()
def planted_space():
    """Two matched pairs + one decoy row per side + token clutter.

    idx__0_0 ~ idx__1_0 and idx__0_1 ~ idx__1_1 are planted matches;
    idx__0_2 / idx__1_2 are unrelated.
    """
    rng = np.random.default_rng(0)
    d = 16
    base0, base1 = rng.standard_normal(d), rng.standard_normal(d)
    vecs = {
        "idx__0_0": base0 + 0.01 * rng.standard_normal(d),
        "idx__1_0": base0 + 0.01 * rng.standard_normal(d),
        "idx__0_1": base1 + 0.01 * rng.standard_normal(d),
        "idx__1_1": base1 + 0.01 * rng.standard_normal(d),
        "idx__0_2": rng.standard_normal(d),
        "idx__1_2": rng.standard_normal(d),
    }
    for i in range(30):
        vecs[f"tt__w{i}"] = rng.standard_normal(d)
    return EmbeddingSpace.from_dict(vecs)


def test_candidate_lists_filter_to_other_dataset(planted_space):
    sp = planted_space
    d = _rid_candidate_lists(sp, sp.rids(0), set(sp.rids(1)), n_top=3)
    for q, lst in d.items():
        assert all(x.startswith("idx__1_") for x in lst)
        assert q not in lst


def test_candidate_lists_nearest_first(planted_space):
    sp = planted_space
    d = _rid_candidate_lists(sp, ["idx__0_0"], set(sp.rids(1)), n_top=40)
    assert d["idx__0_0"][0] == "idx__1_0"


def test_candidate_lists_small_ntop_selective(planted_space):
    """With n_top=1 only rows whose single nearest word is a foreign RID
    get candidates at all."""
    sp = planted_space
    d = _rid_candidate_lists(sp, sp.rids(0), set(sp.rids(1)), n_top=1)
    assert d["idx__0_0"] == ["idx__1_0"]
    assert d["idx__0_2"] == []  # decoy's nearest word is random clutter


def test_match_rids_planted(planted_space):
    sp = planted_space
    got = match_rids(sp, sp.rids(0), sp.rids(1), n_top=5)
    assert {("idx__0_0", "idx__1_0"), ("idx__0_1", "idx__1_1")} <= got
    assert ("idx__0_2", "idx__1_2") not in got


def test_match_rids_empty():
    sp = EmbeddingSpace.from_dict({"idx__0_0": np.array([1.0, 0.0])})
    assert match_rids(sp, ["idx__0_0"], [], 5) == set()


def test_er_gt_as_rids():
    assert er_gt_as_rids({(1, 2)}) == {("idx__0_1", "idx__1_2")}
    assert er_gt_as_rids({(1, 2)}, single_table=True) == {("idx__0_1", "idx__0_2")}


def test_tuple_token_lists():
    pdf = pd.DataFrame({"rid": [0, 1], "a": ["X Y", None], "b": ["z", "w"]})
    out = tuple_token_lists(pdf)
    assert out[0] == ["x", "y", "z"]
    assert out[1] == ["w"]


def test_pretrained_tuple_space_shapes():
    pdf_a = pd.DataFrame({"rid": [0], "a": ["hello world"]})
    pdf_b = pd.DataFrame({"rid": [0], "a": ["hello world"]})
    ft = FastTextSim(dim=16)
    sp = pretrained_tuple_space(pdf_a, pdf_b, ft.word_vec, 16)
    assert set(sp.words) == {"idx__0_0", "idx__1_0"}
    # identical rows -> identical tuple vectors
    assert sp.sim("idx__0_0", "idx__1_0") == pytest.approx(1.0)


def test_er_fz_quality(fz, fz_result):
    """End-to-end unsupervised ER on FZ beats 0.6 F (Table 4 shape)."""
    m = prf(er_match(fz_result.space, 10), er_gt_as_rids(fz.er_gt))
    assert m.f1 >= 0.6, m
    assert m.recall >= 0.8, m


def test_er_ntop_tradeoff(fz, fz_result):
    """Table 5 shape: recall non-decreasing, precision non-increasing in n_top."""
    gt = er_gt_as_rids(fz.er_gt)
    m1 = prf(er_match(fz_result.space, 1), gt)
    m100 = prf(er_match(fz_result.space, 100), gt)
    assert m1.precision >= m100.precision - 1e-9
    assert m100.recall >= m1.recall - 1e-9


def test_er_match_uses_dataset_namespaces(fz_result):
    got = er_match(fz_result.space, 5)
    for a, b in got:
        assert a.startswith("idx__0_")
        assert b.startswith("idx__1_")
