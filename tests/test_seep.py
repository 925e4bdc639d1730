"""Tests for the SEEP schema-matching baseline (substitution S6)."""
import pandas as pd
import pytest

from repro.baselines.pretrained import FastTextSim
from repro.baselines.seep import seep_match, seep_signatures


@pytest.fixture()
def frames():
    a = pd.DataFrame(
        {
            "rid": range(6),
            "name": [f"alpha{i}" for i in range(6)],
            "year": [str(1990 + i) for i in range(6)],
        }
    )
    b = pd.DataFrame(
        {
            "rid": range(6),
            "names": [f"alpha{i}" for i in range(6)],  # similar label + same values
            "released": [str(1990 + i) for i in range(6)],
        }
    )
    return a, b


def test_signatures_keys_and_norm(frames):
    a, _ = frames
    ft = FastTextSim(dim=16)
    sigs = seep_signatures(a, None, ft)
    assert set(sigs) == {"name", "year"}
    import numpy as np

    for v in sigs.values():
        assert np.isclose(np.linalg.norm(v), 1.0)


def test_seep_match_pretrained(frames):
    a, b = frames
    got = seep_match(a, b, local=None, dim=16)
    assert got == {("name", "names"), ("year", "released")}


def test_seep_match_threshold_blocks_garbage():
    a = pd.DataFrame({"rid": [0, 1], "aaa": ["x1", "x2"]})
    b = pd.DataFrame({"rid": [0, 1], "qqq": ["zz9", "yy8"]})
    got = seep_match(a, b, local=None, dim=16, threshold=0.95)
    assert got == set()


def test_seep_match_with_local_space():
    """SeepL path: the CID vectors of corresponding columns drive the match
    even when the column *labels* share nothing."""
    import numpy as np

    from repro.core.embeddings import EmbeddingSpace

    local = EmbeddingSpace.from_dict(
        {
            "cid__0_alpha": np.array([1.0, 0.0, 0.0, 0.0]),
            "cid__1_zzz": np.array([0.95, 0.05, 0.0, 0.0]),
            "cid__0_beta": np.array([0.0, 1.0, 0.0, 0.0]),
            "cid__1_qqq": np.array([0.05, 0.95, 0.0, 0.0]),
        }
    )
    a = pd.DataFrame({"rid": [0], "alpha": ["v1"], "beta": ["v2"]})
    b = pd.DataFrame({"rid": [0], "zzz": ["w1"], "qqq": ["w2"]})
    # low threshold: with random name vectors the label component of the
    # signature is noise here; the CID instance component carries the match
    got = seep_match(a, b, local=local, dim=4, threshold=0.05)
    assert got == {("alpha", "zzz"), ("beta", "qqq")}
