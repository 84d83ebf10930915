"""Suffix forest for Schema-Agnostic Progressive Suffix Arrays Blocking (§4.2).

Every attribute value token is expanded into all of its suffixes with at
least ``l_min`` characters. Each distinct suffix is a node of the suffix
forest and indexes the profiles whose tokens it terminates; the node's
depth is the suffix length, so leaves are full tokens and roots are the
shortest (length ``l_min``) suffixes.

SA-PSAB processes nodes "leaves first, root last", starting from the
overall largest token, and orders nodes of the same layer in increasing
number of comparisons — i.e. ``(suffix length desc, ‖b‖ asc)``.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.common import check_er_type, pair_cardinality

DEFAULT_L_MIN = 3


def suffix_assignments(tokens: DataFrame, *, l_min: int = DEFAULT_L_MIN) -> DataFrame:
    """Distinct ``(suffix, pid, source)`` rows for suffixes of length ≥ l_min."""
    starts = F.sequence(F.lit(1), F.length("token") - F.lit(l_min) + 1)
    return (
        tokens.where(F.length("token") >= l_min)
        .select("pid", "source", "token", F.explode(starts).alias("start"))
        .select(
            F.expr("substring(token, start, length(token))").alias("suffix"),
            "pid",
            "source",
        )
        .distinct()
    )


def suffix_blocks(tokens: DataFrame, er_type: str, *, l_min: int = DEFAULT_L_MIN) -> DataFrame:
    """Suffix-forest nodes with ≥ 1 valid comparison.

    Returns ``(suffix, suffix_len, size, n1, n2, cardinality)``.
    """
    check_er_type(er_type)
    agg = suffix_assignments(tokens, l_min=l_min).groupBy("suffix").agg(
        F.count("*").alias("size"),
        F.sum(F.when(F.col("source") == 1, 1).otherwise(0)).alias("n1"),
        F.sum(F.when(F.col("source") == 2, 1).otherwise(0)).alias("n2"),
    )
    return (
        agg.withColumn(
            "cardinality",
            pair_cardinality(F.col("size"), F.col("n1"), F.col("n2"), er_type),
        )
        .where(F.col("cardinality") >= 1)
        .withColumn("suffix_len", F.length("suffix"))
        .select("suffix", "suffix_len", "size", "n1", "n2", "cardinality")
    )
