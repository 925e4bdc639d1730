"""Tests for numeric-value handling (paper §4.1 + §5.3)."""
import math

import pandas as pd
import pytest

from repro.optimize.numeric import (
    _num_token,
    distribution_aware_replacements,
    round_sig,
    round_significant,
)


@pytest.mark.parametrize(
    "x,sig,expected",
    [
        (1234.5, 2, 1200.0),
        (1234.4, 4, 1234.0),
        # NB: Python round() uses banker's rounding on exact halves
        # (1234.5 @ sig=4 -> 1234.0); Spark's F.round rounds half-up, so
        # round_significant tests avoid exact .5 ties.
        (1234.5, 4, 1234.0),
        (0.012345, 2, 0.012),
        (-987.6, 2, -990.0),
        (0.0, 3, 0.0),
        (5.0, 1, 5.0),
    ],
)
def test_round_sig(x, sig, expected):
    assert round_sig(x, sig) == pytest.approx(expected)


def test_round_sig_non_finite():
    assert math.isnan(round_sig(float("nan"), 3))
    assert round_sig(float("inf"), 3) == float("inf")


def test_round_significant_spark_matches_python(spark):
    vals = [1234.5, 0.012345, -987.6, 0.0, None, 42.42]
    pdf = pd.DataFrame({"rid": range(len(vals)), "x": vals})
    out = round_significant(spark.createDataFrame(pdf), ["x"], sig=2).orderBy("rid").collect()
    for row, v in zip(out, vals):
        if v is None:
            assert row["x"] is None
        else:
            assert row["x"] == pytest.approx(round_sig(v, 2))


def test_round_significant_rejects_bad_sig(spark):
    pdf = pd.DataFrame({"rid": [0], "x": [1.0]})
    with pytest.raises(ValueError):
        round_significant(spark.createDataFrame(pdf), ["x"], sig=0)


def test_distribution_replacements_stay_in_domain():
    vals = list(range(1, 50))
    pairs = distribution_aware_replacements(vals, sig=3, spread=0.2, seed=1)
    dom = {_num_token(v, 3) for v in vals}
    assert pairs, "wide domain should produce some replacements"
    for a, b, conf in pairs:
        assert a in dom and b in dom and a != b
        assert 0 <= conf <= 1


def test_distribution_replacements_tight_domain_empty():
    """§5.3 counterexample: {1, 1.00001, ...} — at sig=3 the domain
    collapses to one token, so nothing is replaced."""
    vals = [1 + i * 1e-5 for i in range(100)]
    assert distribution_aware_replacements(vals, sig=3) == []


def test_distribution_replacements_deterministic():
    vals = list(range(100))
    p1 = distribution_aware_replacements(vals, seed=3)
    p2 = distribution_aware_replacements(vals, seed=3)
    assert p1 == p2


def test_num_token_integer_form():
    assert _num_token(5.0, 3) == "5"
    assert _num_token(5.5, 3) == "5.5"


def test_distribution_replacements_handles_none():
    assert distribution_aware_replacements([None, 1.0], sig=3) == []
