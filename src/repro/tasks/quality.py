"""Embedding-quality tests MA / MR / MC (paper §7.1, Table 2).

Each test is an odd-one-out set of tokens; the embedding passes when
``doesnt_match`` (cosine-to-mean, gensim semantics) identifies the planted
outlier:

* **MatchAttribute (MA)** — four values of one attribute + one value of a
  different attribute of the same dataset.
* **MatchRow (MR)** — a row's values with one replaced by a value from a
  different row.
* **MatchConcept (MC)** — for a one-to-many attribute pair (A1 → A2,
  e.g. brand → product names): three A2 values co-occurring with an A1
  value x, plus one A2 value never co-occurring with x.

Tests are generated from the *normalised cell values* of each dataset, so
they are method-agnostic; an out-of-vocabulary token makes the test fail
for that method (the embedding failed to represent it).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.embeddings import EmbeddingSpace
from repro.core.tokenize import TOKEN_PREFIX

TEST_KINDS = ("MA", "MR", "MC")


@dataclass(frozen=True)
class QualityTest:
    kind: str
    tokens: tuple  # prefixed token names, outlier included
    outlier: str


def _norm(v) -> str | None:
    if v is None or (isinstance(v, float) and np.isnan(v)) or pd.isna(v):
        return None
    s = "_".join(str(v).strip().lower().split())
    return s or None


def _col_values(pdf: pd.DataFrame) -> dict[str, list[str]]:
    """Distinct normalised values per data column, sorted for determinism."""
    out = {}
    for c in pdf.columns:
        if c == "rid":
            continue
        vals = sorted({v for v in (_norm(x) for x in pdf[c]) if v is not None})
        if len(vals) >= 2:
            out[c] = vals
    return out


def _tok(v: str) -> str:
    return TOKEN_PREFIX + v


def generate_ma(pdf: pd.DataFrame, n: int, rng: np.random.Generator) -> list[QualityTest]:
    cols = _col_values(pdf)
    names = [c for c, vs in cols.items() if len(vs) >= 4]
    tests = []
    if len(names) < 2:
        return tests
    for _ in range(n * 4):  # retry head-room for degenerate samples
        if len(tests) >= n:
            break
        c = names[int(rng.integers(0, len(names)))]
        others = [x for x in cols if x != c]
        c2 = others[int(rng.integers(0, len(others)))]
        four = list(rng.choice(cols[c], 4, replace=False))
        odd = cols[c2][int(rng.integers(0, len(cols[c2])))]
        if odd in set(cols[c]) or odd in four:
            continue  # ambiguous test
        tests.append(
            QualityTest("MA", tuple(_tok(t) for t in four + [odd]), _tok(odd))
        )
    return tests


def generate_mr(pdf: pd.DataFrame, n: int, rng: np.random.Generator) -> list[QualityTest]:
    data_cols = [c for c in pdf.columns if c != "rid"]
    rows = []
    for _, r in pdf.iterrows():
        vals = [v for v in (_norm(r[c]) for c in data_cols) if v is not None]
        vals = list(dict.fromkeys(vals))
        if len(vals) >= 3:
            rows.append(vals)
    tests = []
    if len(rows) < 2:
        return tests
    for _ in range(n * 4):
        if len(tests) >= n:
            break
        i = int(rng.integers(0, len(rows)))
        j = int(rng.integers(0, len(rows)))
        if i == j:
            continue
        row = list(rows[i])
        foreign = [v for v in rows[j] if v not in set(row)]
        if not foreign:
            continue
        pos = int(rng.integers(0, len(row)))
        odd = foreign[int(rng.integers(0, len(foreign)))]
        row[pos] = odd
        tests.append(QualityTest("MR", tuple(_tok(t) for t in row), _tok(odd)))
    return tests


def generate_mc(
    pdf: pd.DataFrame, n: int, rng: np.random.Generator, pair: tuple[str, str]
) -> list[QualityTest]:
    a1, a2 = pair
    if a1 not in pdf.columns or a2 not in pdf.columns:
        return []
    groups: dict[str, list[str]] = {}
    for _, r in pdf.iterrows():
        k, v = _norm(r[a1]), _norm(r[a2])
        if k is None or v is None:
            continue
        groups.setdefault(k, [])
        if v not in groups[k]:
            groups[k].append(v)
    keys = sorted(k for k, vs in groups.items() if len(vs) >= 3)
    all_vals = sorted({v for vs in groups.values() for v in vs})
    tests = []
    if not keys or len(all_vals) < 4:
        return tests
    for _ in range(n * 4):
        if len(tests) >= n:
            break
        x = keys[int(rng.integers(0, len(keys)))]
        related = list(rng.choice(groups[x], 3, replace=False))
        pool = [v for v in all_vals if v not in set(groups[x])]
        if not pool:
            continue
        y = pool[int(rng.integers(0, len(pool)))]
        tests.append(
            QualityTest("MC", tuple(_tok(t) for t in [x] + related + [y]), _tok(y))
        )
    return tests


def generate_tests(
    pdf_a: pd.DataFrame,
    pdf_b: pd.DataFrame | None,
    mc_pair: tuple[str, str],
    n_per_kind: int = 200,
    seed: int = 0,
) -> list[QualityTest]:
    """Sample the full MA/MR/MC suite over both datasets (paper §7.1)."""
    rng = np.random.default_rng(seed)
    tests: list[QualityTest] = []
    frames = [pdf_a] + ([pdf_b] if pdf_b is not None else [])
    per_frame = max(1, n_per_kind // len(frames))
    for pdf in frames:
        tests += generate_ma(pdf, per_frame, rng)
        tests += generate_mr(pdf, per_frame, rng)
    # MC is defined on dataset A's column names (the clean side)
    tests += generate_mc(pdf_a, n_per_kind, rng, mc_pair)
    return tests


def evaluate_quality(space: EmbeddingSpace, tests: list[QualityTest]) -> dict:
    """Fraction of passed tests per kind + AVG (OOV counts as a failure)."""
    passed = {k: 0 for k in TEST_KINDS}
    total = {k: 0 for k in TEST_KINDS}
    for t in tests:
        total[t.kind] += 1
        try:
            guess = space.doesnt_match(list(t.tokens))
        except KeyError:
            continue
        if guess == t.outlier:
            passed[t.kind] += 1
    out = {}
    for k in TEST_KINDS:
        out[k] = passed[k] / total[k] if total[k] else float("nan")
    vals = [v for v in out.values() if not np.isnan(v)]
    out["AVG"] = float(np.mean(vals)) if vals else float("nan")
    out["n_tests"] = sum(total.values())
    return out
