"""Tests for Algorithm 5 (SM) and the Base bag-of-words matcher."""
import numpy as np
import pandas as pd
import pytest

from repro.core.embeddings import EmbeddingSpace
from repro.tasks.metrics import prf
from repro.tasks.schema_matching import (
    base_bow_match,
    mutual_nn_match,
    schema_match,
    sm_gt_as_cids,
)


def test_mutual_nn_perfect_diagonal():
    sim = lambda a, b: 1.0 if a[-1] == b[-1] else 0.0
    got = mutual_nn_match(["a1", "a2", "a3"], ["b1", "b2", "b3"], sim)
    assert got == {("a1", "b1"), ("a2", "b2"), ("a3", "b3")}


def test_mutual_nn_non_mutual_pruned_then_matched():
    """a1's first choice prefers a2; after a2-b1 match, a1 falls to b2."""
    s = {("a1", "b1"): 0.9, ("a1", "b2"): 0.5, ("a2", "b1"): 0.95, ("a2", "b2"): 0.1}
    sim = lambda a, b: s[(a, b)] if (a, b) in s else s[(b, a)]
    got = mutual_nn_match(["a1", "a2"], ["b1", "b2"], sim)
    assert ("a2", "b1") in got
    assert ("a1", "b2") in got


def test_mutual_nn_two_sweep_termination():
    """Unmatchable leftovers do not loop forever."""
    sim = lambda a, b: 0.1
    got = mutual_nn_match(["a1", "a2"], ["b1"], sim, max_sweeps=2)
    assert len(got) == 1  # one of them pairs with b1, the other stays


def test_mutual_nn_empty_sides():
    assert mutual_nn_match([], ["b"], lambda a, b: 1.0) == set()
    assert mutual_nn_match(["a"], [], lambda a, b: 1.0) == set()


def test_schema_match_on_toy_space():
    vecs = {
        "cid__0_name": np.array([1.0, 0.0, 0.0]),
        "cid__0_year": np.array([0.0, 1.0, 0.0]),
        "cid__1_title": np.array([0.9, 0.1, 0.0]),
        "cid__1_released": np.array([0.1, 0.9, 0.0]),
        "tt__noise": np.array([0.0, 0.0, 1.0]),
    }
    space = EmbeddingSpace.from_dict(vecs)
    got = schema_match(space)
    assert got == {
        ("cid__0_name", "cid__1_title"),
        ("cid__0_year", "cid__1_released"),
    }


def test_schema_match_missing_side():
    space = EmbeddingSpace.from_dict({"cid__0_x": np.array([1.0, 0.0])})
    assert schema_match(space) == set()


def test_sm_gt_as_cids():
    assert sm_gt_as_cids({("a", "b")}) == {("cid__0_a", "cid__1_b")}


def test_base_bow_match_exact_overlap():
    a = pd.DataFrame({"rid": [0, 1], "name": ["x", "y"], "year": ["1999", "2000"]})
    b = pd.DataFrame({"rid": [0, 1], "title": ["x", "z"], "released": ["1999", "2001"]})
    got = base_bow_match(a, b)
    assert got == {("name", "title"), ("year", "released")}


def test_base_bow_match_ignores_rid():
    a = pd.DataFrame({"rid": [0], "v": ["only"]})
    b = pd.DataFrame({"rid": [0], "w": ["only"]})
    assert base_bow_match(a, b) == {("v", "w")}


def test_schema_match_fz_quality(fz, fz_result):
    """End-to-end SM on the FZ fixture should be near-perfect (Table 3)."""
    m = prf(schema_match(fz_result.space), sm_gt_as_cids(fz.sm_gt))
    assert m.f1 >= 0.8, m


def test_base_bow_fz_quality(fz):
    m = prf(base_bow_match(fz.pdf_a, fz.pdf_b), fz.sm_gt)
    assert m.f1 >= 0.8, m
