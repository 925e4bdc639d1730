"""Precision / recall / F-measure over predicted vs ground-truth pairs (§7.2)."""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True)
class PRF:
    precision: float
    recall: float
    f1: float
    n_pred: int
    n_gt: int
    n_correct: int


def prf(predicted: set, ground_truth: set) -> PRF:
    """Exact-pair matching quality. Pairs must be hashable 2-tuples."""
    correct = len(predicted & ground_truth)
    p = correct / len(predicted) if predicted else 0.0
    r = correct / len(ground_truth) if ground_truth else 0.0
    f = 2 * p * r / (p + r) if (p + r) > 0 else 0.0
    return PRF(p, r, f, len(predicted), len(ground_truth), correct)
