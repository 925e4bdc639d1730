"""External information: node merging & probabilistic replacement (§5.3).

* ``merge_values`` — when an external dictionary asserts two tokens denote
  the same entity (``NL`` ↔ ``Netherlands``), their graph nodes merge;
  implemented as a value rewrite *before* graph construction, which is
  exactly "reusing the same node for both tokens".
* ``replacement_table`` — when the mapping is only probable (confidence
  c < 1), §5.3 prescribes emitting the partner token with probability ∝ c
  during sentence construction while the walk itself stays on the true
  node. The walk kernel consumes this table (``WalkConfig.replacements``).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.tokenize import TOKEN_PREFIX, normalize_value


def merge_values(df: DataFrame, mapping: dict[str, str], columns: list[str] | None = None) -> DataFrame:
    """Rewrite dictionary synonyms to their canonical value.

    ``mapping`` is raw-value → raw-canonical (case-insensitive on the
    lookup side); applied to ``columns`` (default: all non-rid columns).
    """
    norm_map = { "_".join(k.strip().lower().split()): v for k, v in mapping.items() }
    cols = columns or [c for c in df.columns if c != "rid"]
    mexpr = F.create_map(
        *[x for kv in norm_map.items() for x in (F.lit(kv[0]), F.lit(kv[1]))]
    )
    out = df
    for c in cols:
        normed = normalize_value(F.col(c))
        out = out.withColumn(
            c, F.coalesce(F.element_at(mexpr, normed), F.col(c).cast("string"))
        )
    return out


def replacement_table(
    pairs: list[tuple[str, str, float]], symmetric: bool = True
) -> dict[str, tuple[str, float]]:
    """Build the walk kernel's replacement map from (token_a, token_b, conf).

    Tokens are raw normalised values; the ``tt__`` prefix is added here.
    With ``symmetric`` (the paper's "Ti is replaced by Tj and vice versa"),
    both directions are registered.
    """
    out: dict[str, tuple[str, float]] = {}
    for a, b, conf in pairs:
        if not (0.0 <= conf <= 1.0):
            raise ValueError(f"confidence must be in [0,1], got {conf}")
        ta = TOKEN_PREFIX + "_".join(str(a).strip().lower().split())
        tb = TOKEN_PREFIX + "_".join(str(b).strip().lower().split())
        out[ta] = (tb, conf)
        if symmetric:
            out[tb] = (ta, conf)
    return out
