"""Numeric-value handling (paper §4.1 + §5.3 "Handling Numeric Data").

* ``round_significant`` — the paper's default: numerical values are
  rounded to a user-chosen number of significant figures before becoming
  regular token nodes.
* ``distribution_aware_replacements`` — §5.3's heuristic: fit the
  attribute's distribution (mean/std), and for each value ``i`` draw a
  random ``r`` near ``i`` under those parameters; if ``r`` is itself part
  of the attribute's domain, register ``i → r`` as a probabilistic walk
  replacement. This links numerically-close tokens without ever merging
  values in tight domains (the ``{1, 1.00001, …}`` counterexample), since
  there the sampled neighbour rarely lands on another domain member at
  matching granularity.
"""
from __future__ import annotations

import math

import numpy as np
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F


def round_sig(x: float, sig: int) -> float:
    """Round a python float to ``sig`` significant figures."""
    if x == 0 or not math.isfinite(x):
        return x
    return round(x, -int(math.floor(math.log10(abs(x)))) + (sig - 1))


def round_significant(df: DataFrame, columns: list[str], sig: int = 3) -> DataFrame:
    """Round numeric columns to significant figures (Spark-side)."""
    if sig < 1:
        raise ValueError("sig must be >= 1")
    out = df
    for c in columns:
        x = F.col(c).cast("double")
        mag = F.floor(F.log10(F.abs(x)))
        scale = (F.lit(sig - 1) - mag).cast("int")
        # F.round only takes a literal scale, so scale dynamically via 10^k
        pow10 = F.pow(F.lit(10.0), scale)
        rounded = F.when(x.isNull() | (x == 0), x).otherwise(
            F.round(x * pow10) / pow10
        )
        out = out.withColumn(c, rounded)
    return out


def distribution_aware_replacements(
    values: list[float],
    sig: int = 3,
    spread: float = 0.25,
    conf: float = 0.5,
    seed: int = 0,
) -> list[tuple[str, str, float]]:
    """§5.3 numeric replacement pairs for one attribute's domain.

    Returns ``(token_i, token_r, conf)`` triples (normalised string form,
    ready for :func:`repro.optimize.merging.replacement_table`). ``spread``
    scales the fitted std when sampling the neighbour.
    """
    dom = sorted({round_sig(float(v), sig) for v in values if v is not None and math.isfinite(float(v))})
    if len(dom) < 2:
        return []
    arr = np.asarray(dom, dtype=float)
    std = float(arr.std())
    if std == 0:
        return []
    rng = np.random.default_rng(seed)
    dom_set = set(dom)
    out = []
    for i in dom:
        r = round_sig(float(i + rng.standard_normal() * std * spread), sig)
        if r != i and r in dom_set:
            out.append((_num_token(i, sig), _num_token(r, sig), conf))
    return out


def _num_token(x: float, sig: int) -> str:
    """String form a rounded numeric gets after value normalisation."""
    r = round_sig(float(x), sig)
    if float(r).is_integer():
        return str(int(r))
    return str(r)
