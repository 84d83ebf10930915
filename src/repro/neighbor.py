"""Neighbor List, Position Index and RCF weighting (§3.2, §5.1).

The Neighbor List is the global alphabetical sort of all blocking keys;
each profile occupies one position per key (multiple placements, Fig 3e).
Profiles sharing a key land in *coincidental proximity*: their relative
order within the equal-key run is arbitrary. We make it deterministic yet
pseudo-random with an ``xxhash64(key, pid, salt)`` tie-break, mirroring
the paper's "relatively random order" without sacrificing reproducibility.

Positions are assigned with ``zipWithIndex`` on the sorted DataFrame —
the one RDD touch in the codebase (Spark has no distributed consecutive
index at the DataFrame level); everything downstream is DataFrame joins.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import LongType, StructField, StructType

from repro.common import canonical_pair, check_er_type, valid_pair


def neighbor_list(keys: DataFrame, *, salt: int = 0) -> DataFrame:
    """Sorted list of blocking keys: ``(pos, key, pid, source)``.

    ``keys`` has columns (key, pid, source); the schema-agnostic variant
    passes attribute value tokens, PSN passes one schema-based key per
    profile. ``pos`` is 0-based and consecutive.
    """
    ordered = keys.select("key", "pid", "source").orderBy(
        F.col("key").asc(), F.xxhash64("key", "pid", F.lit(salt)).asc()
    )
    schema = StructType(
        [StructField("pos", LongType(), False)] + ordered.schema.fields
    )
    rdd = ordered.rdd.zipWithIndex().map(lambda t: (t[1], *t[0]))
    # The Neighbor List is referenced several times downstream (both join
    # sides of window_pairs plus the Position Index); checkpoint it so the
    # sort+index is computed once, not once per reference.
    return keys.sparkSession.createDataFrame(rdd, schema).localCheckpoint()


def position_counts(nl: DataFrame) -> DataFrame:
    """Position Index lengths: ``(pid, n_pos)`` — placements per profile."""
    return nl.groupBy("pid").agg(F.count("*").alias("n_pos"))


def window_pairs(nl: DataFrame, windows: list[int] | range, er_type: str) -> DataFrame:
    """Valid position pairs at exact distances ``w ∈ windows``.

    Returns ``(w, pos, i, j)`` where ``pos`` is the lower position of the
    pair — one row per *position pair*, so a profile pair recurring at
    several positions/distances yields several rows (that multiplicity is
    precisely the RCF frequency).
    """
    check_er_type(er_type)
    spark = nl.sparkSession
    wdf = spark.createDataFrame([(int(w),) for w in windows], "w long")
    a = nl.alias("a").crossJoin(wdf).withColumn("target", F.col("pos") + F.col("w"))
    b = nl.alias("b")
    joined = a.join(b, F.col("target") == F.col("b.pos"))
    return (
        joined.where(
            valid_pair(
                F.col("a.pid"), F.col("a.source"), F.col("b.pid"), F.col("b.source"), er_type
            )
        )
        .select(
            "w",
            F.col("a.pos").alias("pos"),
            *canonical_pair(F.col("a.pid"), F.col("b.pid")),
        )
    )


def rcf_weights(pairs: DataFrame, n_pos: DataFrame, *, per_window: bool) -> DataFrame:
    """Relative Co-occurrence Frequency weights (§5.1).

    ``RCF(i, j) = freq / (|PI_i| + |PI_j| − freq)`` where ``freq`` counts
    position pairs — at one exact distance for LS-PSN
    (``per_window=True``: grouped by ``w``) or accumulated over all
    distances ≤ w_max for GS-PSN (``per_window=False``).

    In the accumulated case ``freq`` can reach or exceed
    ``|PI_i| + |PI_j|`` (the same pair co-occurring at many distances),
    where the paper's union-style denominator degenerates; it is clamped
    to 1, which keeps such exceptionally strong co-occurrences at the top
    of the order instead of producing undefined/negative weights.
    """
    group = ["w", "i", "j"] if per_window else ["i", "j"]
    freq = pairs.groupBy(*group).agg(F.count("*").alias("freq"))
    ni = n_pos.select(F.col("pid").alias("i"), F.col("n_pos").alias("ni"))
    nj = n_pos.select(F.col("pid").alias("j"), F.col("n_pos").alias("nj"))
    return (
        freq.join(ni, "i")
        .join(nj, "j")
        .withColumn(
            "weight",
            F.col("freq")
            / F.greatest(F.col("ni") + F.col("nj") - F.col("freq"), F.lit(1)),
        )
        .select(*group, "freq", "weight")
    )
