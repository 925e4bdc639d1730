"""Unit tests for repro.tasks.metrics."""
import pytest

from repro.tasks.metrics import prf


def test_perfect():
    m = prf({(1, 2), (3, 4)}, {(1, 2), (3, 4)})
    assert m.precision == m.recall == m.f1 == 1.0


def test_half_precision():
    m = prf({(1, 2), (9, 9)}, {(1, 2)})
    assert m.precision == 0.5
    assert m.recall == 1.0
    assert m.f1 == pytest.approx(2 / 3)


def test_half_recall():
    m = prf({(1, 2)}, {(1, 2), (3, 4)})
    assert m.precision == 1.0
    assert m.recall == 0.5


def test_empty_predictions():
    m = prf(set(), {(1, 2)})
    assert m.precision == 0.0 and m.recall == 0.0 and m.f1 == 0.0


def test_empty_gt():
    m = prf({(1, 2)}, set())
    assert m.recall == 0.0 and m.f1 == 0.0


def test_both_empty():
    m = prf(set(), set())
    assert m.f1 == 0.0


def test_counts():
    m = prf({(1, 1), (2, 2), (3, 3)}, {(2, 2), (4, 4)})
    assert (m.n_pred, m.n_gt, m.n_correct) == (3, 2, 1)


def test_direction_sensitive():
    """Pairs are ordered: (a,b) != (b,a)."""
    m = prf({(2, 1)}, {(1, 2)})
    assert m.n_correct == 0
