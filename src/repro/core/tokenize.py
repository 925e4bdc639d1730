"""Cell-value tokenization for the EmbDI tripartite graph (paper §4.1, §5.5).

A *cell* is one ``(rid, cid, value)`` triple; tokenization turns it into one
or more ``(rid, cid, token)`` rows. The paper describes three strategies for
multi-word cells, evaluated as EmbDI-S / EmbDI-F / EmbDI-O in Table 4:

* ``simple``  — the whole (normalised) cell value is a single token node,
  e.g. ``"iPad 4th 2012"`` → ``ipad_4th_2012``.
* ``flatten`` — the cell is split into word tokens, each becoming its own
  node connected to the same RID and CID, e.g. ``ipad``, ``4th``, ``2012``.
* ``overlap`` — hybrid (paper §5.5): values whose *whole* normalised form
  occurs in **both** datasets stay single tokens (they are the bridges
  between the datasets); values local to one dataset are flattened.

All functions are pure DataFrame transformations; node-name prefixes keep
token / RID / CID vocabularies disjoint in the embedding space.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

TOKEN_PREFIX = "tt__"
RID_PREFIX = "idx__"
CID_PREFIX = "cid__"

STRATEGIES = ("simple", "flatten", "overlap")


def make_rid(dataset_idx: int, row_idx: int) -> str:
    """Node name for the RID of row ``row_idx`` of dataset ``dataset_idx``."""
    return f"{RID_PREFIX}{dataset_idx}_{row_idx}"


def make_cid(dataset_idx: int, column: str) -> str:
    """Node name for the CID of ``column`` of dataset ``dataset_idx``."""
    return f"{CID_PREFIX}{dataset_idx}_{column}"


def strip_prefix(node: str) -> str:
    """Drop the ``tt__`` / ``idx__`` / ``cid__`` namespace prefix."""
    for p in (TOKEN_PREFIX, RID_PREFIX, CID_PREFIX):
        if node.startswith(p):
            return node[len(p):]
    return node


def node_kind(node: str) -> str:
    """Classify a node name as ``token`` / ``rid`` / ``cid``."""
    if node.startswith(RID_PREFIX):
        return "rid"
    if node.startswith(CID_PREFIX):
        return "cid"
    return "token"


def normalize_value(col: Column) -> Column:
    """Canonical single-token form of a cell value.

    Lower-cased, trimmed, internal whitespace collapsed to ``_`` so the
    value survives as one word in a space-separated sentence corpus.
    """
    c = F.lower(F.trim(col.cast("string")))
    c = F.regexp_replace(c, r"\s+", "_")
    return F.when(c == "", None).otherwise(c)


def split_words(col: Column) -> Column:
    """Split a normalised value into its word tokens (array column)."""
    return F.filter(F.split(col, "_"), lambda w: w != F.lit(""))


def cells(df: DataFrame, dataset_idx: int, rid_col: str = "rid") -> DataFrame:
    """Melt a relation into its cell triples.

    Returns ``(rid, cid, value)`` with RID/CID node names already prefixed
    and values normalised; null / empty cells are dropped (the paper's
    default *Skip* strategy — §5.2's alternatives are applied upstream by
    :mod:`repro.optimize.missing` before this melt).
    """
    data_cols = [c for c in df.columns if c != rid_col]
    pairs = F.array(
        *[
            F.struct(
                F.lit(make_cid(dataset_idx, c)).alias("cid"),
                normalize_value(F.col(c)).alias("value"),
            )
            for c in data_cols
        ]
    )
    return (
        df.select(
            F.concat(F.lit(f"{RID_PREFIX}{dataset_idx}_"), F.col(rid_col).cast("string")).alias("rid"),
            F.explode(pairs).alias("cell"),
        )
        .select("rid", F.col("cell.cid").alias("cid"), F.col("cell.value").alias("value"))
        .where(F.col("value").isNotNull())
    )


def shared_values(cells_a: DataFrame, cells_b: DataFrame) -> DataFrame:
    """Distinct normalised values occurring in both datasets (the bridges).

    One column ``value``. Used by the ``overlap`` strategy and by the
    walk-start optimisation of §5.1.
    """
    return (
        cells_a.select("value")
        .distinct()
        .join(cells_b.select("value").distinct(), on="value", how="inner")
    )


def tokenize_cells(
    cell_df: DataFrame,
    strategy: str = "overlap",
    shared: DataFrame | None = None,
) -> DataFrame:
    """Apply a tokenization strategy to a cell triple frame.

    Returns ``(rid, cid, token)`` where ``token`` carries the ``tt__``
    prefix. For ``overlap``, ``shared`` must be the output of
    :func:`shared_values`; with no second dataset (``shared=None``)
    ``overlap`` degrades to ``simple``, mirroring the paper's single-table
    MSD setup.
    """
    if strategy not in STRATEGIES:
        raise ValueError(f"unknown tokenization strategy {strategy!r}; expected one of {STRATEGIES}")
    if strategy == "simple" or (strategy == "overlap" and shared is None):
        out = cell_df.select("rid", "cid", F.col("value").alias("word"))
    elif strategy == "flatten":
        out = cell_df.select(
            "rid", "cid", F.explode(split_words(F.col("value"))).alias("word")
        )
    else:  # overlap hybrid
        marked = cell_df.join(
            shared.withColumn("is_shared", F.lit(True)), on="value", how="left"
        )
        kept = marked.where(F.col("is_shared").isNotNull()).select(
            "rid", "cid", F.col("value").alias("word")
        )
        expanded = marked.where(F.col("is_shared").isNull()).select(
            "rid", "cid", F.explode(split_words(F.col("value"))).alias("word")
        )
        out = kept.unionByName(expanded)
    return out.select(
        "rid", "cid", F.concat(F.lit(TOKEN_PREFIX), F.col("word")).alias("token")
    )
