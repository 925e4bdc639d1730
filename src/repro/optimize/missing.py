"""Missing / noisy data handling (paper §5.2).

Strategies for NULL cells before graph construction:

* ``skip`` (paper default) — nulls contribute no node; implemented by the
  melt in :func:`repro.core.tokenize.cells`, nothing to do here.
* ``unique_node`` — each NULL becomes its own fresh placeholder token.
* ``single_node`` — one super-node for every NULL (the paper warns this
  is harmful; implemented so the ablation can demonstrate it).
* ``skolemize_fd`` — the paper's proposal: under a functional dependency
  ``LHS → RHS`` evaluated over the union of the relations, rows agreeing
  on LHS must agree on RHS; conflicting or missing RHS values in a group
  are replaced by one shared Skolem placeholder (merging ``c``/``c′``/nulls
  into ``X1`` in the §5.2 example), and the same placeholder is reused for
  *every* occurrence group-wide. Nulls in groups of size one get unique
  placeholders (no information either way).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.tokenize import normalize_value

NULL_STRATEGIES = ("skip", "unique_node", "single_node", "skolemize_fd")


def fill_nulls_unique(df: DataFrame, columns: list[str] | None = None, prefix: str = "null") -> DataFrame:
    """``unique_node``: every NULL gets a distinct deterministic placeholder."""
    cols = columns or [c for c in df.columns if c != "rid"]
    out = df
    for c in cols:
        out = out.withColumn(
            c,
            F.when(
                F.col(c).isNull(),
                F.concat(F.lit(f"{prefix}_{c}_"), F.col("rid").cast("string")),
            ).otherwise(F.col(c).cast("string")),
        )
    return out


def fill_nulls_single(df: DataFrame, columns: list[str] | None = None, token: str = "null") -> DataFrame:
    """``single_node``: one shared super-node for every NULL (anti-pattern)."""
    cols = columns or [c for c in df.columns if c != "rid"]
    out = df
    for c in cols:
        out = out.withColumn(
            c, F.coalesce(F.col(c).cast("string"), F.lit(token))
        )
    return out


def skolemize_fd(
    df_a: DataFrame,
    df_b: DataFrame | None,
    lhs: list[str],
    rhs: str,
    lhs_b: list[str] | None = None,
    rhs_b: str | None = None,
) -> tuple[DataFrame, DataFrame | None]:
    """Enforce FD ``lhs → rhs`` across both relations via Skolemization.

    Column names may differ between the relations (``lhs_b``/``rhs_b``);
    grouping happens on *normalised* LHS values so format-identical keys
    collide as intended. Groups whose RHS set contains a conflict (>1
    distinct non-null value) or a NULL get one shared Skolem constant
    ``sk_<group-id>`` substituted for every conflicting/missing RHS cell;
    singleton-null groups also get (necessarily unique) constants.
    Clean groups are left untouched.
    """
    lhs_b = lhs_b or lhs
    rhs_b = rhs_b or rhs

    def keyed(df: DataFrame, l: list[str], r: str, side: int) -> DataFrame:
        key = F.concat_ws("", *[normalize_value(F.col(c)) for c in l])
        return df.select(
            F.lit(side).alias("side"),
            F.col("rid").alias("rid"),
            key.alias("fd_key"),
            normalize_value(F.col(r)).alias("fd_val"),
        )

    parts = [keyed(df_a, lhs, rhs, 0)]
    if df_b is not None:
        parts.append(keyed(df_b, lhs_b, rhs_b, 1))
    union = parts[0]
    for p in parts[1:]:
        union = union.unionByName(p)

    groups = (
        union.groupBy("fd_key")
        .agg(
            F.countDistinct("fd_val").alias("n_vals"),
            F.sum(F.when(F.col("fd_val").isNull(), 1).otherwise(0)).alias("n_nulls"),
        )
        .withColumn("dirty", (F.col("n_vals") > 1) | (F.col("n_nulls") > 0))
        .where(F.col("dirty"))
        .withColumn(
            "skolem",
            F.concat(F.lit("sk_"), F.row_number().over(Window.orderBy("fd_key")).cast("string")),
        )
        .select("fd_key", "skolem")
    )

    def rewrite(df: DataFrame, l: list[str], r: str) -> DataFrame:
        key = F.concat_ws("", *[normalize_value(F.col(c)) for c in l])
        joined = df.withColumn("fd_key", key).join(
            F.broadcast(groups), on="fd_key", how="left"
        )
        return joined.withColumn(
            r, F.coalesce(F.col("skolem"), F.col(r).cast("string"))
        ).drop("fd_key", "skolem")

    out_a = rewrite(df_a, lhs, rhs)
    out_b = rewrite(df_b, lhs_b, rhs_b) if df_b is not None else None
    return out_a, out_b
