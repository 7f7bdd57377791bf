"""Multiplicity-bag algebra on Spark DataFrames (the TIP model's ``+#``).

Every TVR instance (snapshot or delta) is a DataFrame carrying a
``__mult__`` long column: ``+n`` means *n* copies inserted, ``-n`` means
*n* copies deleted. Snapshots are *normalized*: duplicates consolidated
and all multiplicities >= 1. Deltas may mix signs (retractions).

This module implements the merge operator ``+#`` (additive bag union),
its inverse ``-#``, normalization, and conversion to/from plain bags —
the intra-TVR algebra of the paper's §3.2 for the multiplicity
perspective.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, functions as F

MULT = "__mult__"


def data_cols(df: DataFrame) -> list[str]:
    """All columns except the multiplicity column."""
    return [c for c in df.columns if c != MULT]


def with_mult(df: DataFrame, mult: int = 1) -> DataFrame:
    """Attach a constant multiplicity column to a plain DataFrame."""
    return df.withColumn(MULT, F.lit(int(mult)).cast("long"))


def negate(df: DataFrame) -> DataFrame:
    """Flip the sign of every multiplicity (the unary minus of ``+#``)."""
    return df.withColumn(MULT, -F.col(MULT))


def consolidate(df: DataFrame) -> DataFrame:
    """Combine identical tuples by summing multiplicities; drop zeros.

    Nulls compare equal under ``groupBy`` (Spark and DuckDB agree), so
    null-padded outer-join rows consolidate correctly.
    """
    cols = data_cols(df)
    return (
        df.groupBy(*cols)
        .agg(F.sum(MULT).alias(MULT))
        .filter(F.col(MULT) != 0)
    )


def merge_mult(a: DataFrame, b: DataFrame) -> DataFrame:
    """The ``+#`` merge operator: additive union with consolidation."""
    return consolidate(a.unionByName(b))


def diff_mult(a: DataFrame, b: DataFrame) -> DataFrame:
    """The ``-#`` inverse operator: ``a -# b`` so ``b +# (a -# b) = a``."""
    return merge_mult(a, negate(b))


def to_bag(df: DataFrame) -> DataFrame:
    """Expand a normalized mult-relation into plain rows (mult copies).

    Fails loudly on negative multiplicities — only valid snapshots may
    be expanded for comparison against a plain-bag oracle result.
    """
    cols = data_cols(df)
    exploded = df.withColumn(
        "__copy__",
        F.explode(
            F.when(
                F.col(MULT) > 0, F.sequence(F.lit(1), F.col(MULT))
            ).otherwise(F.raise_error("negative multiplicity in snapshot"))
        ),
    )
    return exploded.select(*cols)


def snapshot_ok(df: DataFrame) -> bool:
    """True iff the consolidated relation has no negative multiplicities."""
    return consolidate(df).filter(F.col(MULT) < 0).limit(1).count() == 0
