"""Token Blocking workflow: Standard Blocking → Purging → Filtering.

This is the redundancy-positive block collection used by the
equality-based methods (§7, "Parameter configuration"):

1. **Schema-agnostic Standard Blocking** — one block per attribute value
   token that stems from at least two profiles (Clean-clean ER: at least
   one profile per source, otherwise the block yields no valid pair).
2. **Block Purging** — discard blocks larger than ``purge_ratio·|P|``
   (stop-word tokens; paper uses 10%).
3. **Block Filtering** — retain every profile only in the
   ``filter_ratio`` (paper: 80%) smallest of its blocks.

Blocks are identified by their token. ``schedule_blocks`` (Block
Scheduling, §5.2.1) then assigns the incremental block id used by PBS:
position after sorting blocks in non-decreasing cardinality.
"""
from __future__ import annotations


from dataclasses import dataclass

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.common import check_er_type, pair_cardinality


def block_stats(assignments: DataFrame, er_type: str) -> DataFrame:
    """Per-block statistics ``(token, size, n1, n2, cardinality)``.

    ``size`` = |b|; ``n1``/``n2`` = per-source membership (Clean-clean);
    ``cardinality`` = ‖b‖, the number of *valid* comparisons.
    """
    check_er_type(er_type)
    agg = assignments.groupBy("token").agg(
        F.count("*").alias("size"),
        F.sum(F.when(F.col("source") == 1, 1).otherwise(0)).alias("n1"),
        F.sum(F.when(F.col("source") == 2, 1).otherwise(0)).alias("n2"),
    )
    return agg.withColumn(
        "cardinality",
        pair_cardinality(F.col("size"), F.col("n1"), F.col("n2"), er_type),
    )


def _keep_valid(assignments: DataFrame, er_type: str) -> DataFrame:
    """Restrict to blocks entailing at least one valid comparison."""
    stats = block_stats(assignments, er_type).where(F.col("cardinality") >= 1)
    return assignments.join(stats.select("token"), "token")


def standard_blocking(tokens: DataFrame, er_type: str) -> DataFrame:
    """Step 1: block assignments ``(token, pid, source)`` for valid blocks."""
    return _keep_valid(tokens.select("token", "pid", "source"), er_type)


def purge_blocks(assignments: DataFrame, er_type: str, n_profiles: int, *, purge_ratio: float = 0.1) -> DataFrame:
    """Step 2: drop blocks with more than ``purge_ratio · n_profiles`` profiles."""
    limit = purge_ratio * n_profiles
    sizes = assignments.groupBy("token").agg(F.count("*").alias("size"))
    kept = sizes.where(F.col("size") <= F.lit(limit)).select("token")
    return assignments.join(kept, "token")


def filter_blocks(assignments: DataFrame, er_type: str, *, filter_ratio: float = 0.8) -> DataFrame:
    """Step 3: keep each profile in the ⌈ratio·|B_i|⌉ smallest of its blocks.

    "Smallest" ranks by block cardinality (ties broken by token so the
    result is deterministic). Blocks that lose so many profiles that they
    no longer yield a valid comparison are dropped afterwards.
    """
    stats = block_stats(assignments, er_type)
    ranked = (
        assignments.join(stats.select("token", "cardinality"), "token")
        .withColumn(
            "rank",
            F.row_number().over(
                Window.partitionBy("pid").orderBy(F.col("cardinality").asc(), F.col("token").asc())
            ),
        )
        .withColumn("n_blocks", F.count("*").over(Window.partitionBy("pid")))
        .where(F.col("rank") <= F.ceil(F.col("n_blocks") * F.lit(filter_ratio)))
        .select("token", "pid", "source")
    )
    return _keep_valid(ranked, er_type)


@dataclass(frozen=True)
class BlockCollection:
    """Final block collection: assignments + per-block stats (post-workflow)."""

    assignments: DataFrame  # (token, pid, source)
    stats: DataFrame  # (token, size, n1, n2, cardinality)
    er_type: str


def token_blocking_workflow(
    tokens: DataFrame,
    er_type: str,
    n_profiles: int,
    *,
    purge_ratio: float = 0.1,
    filter_ratio: float = 0.8,
) -> BlockCollection:
    """Run the full Token Blocking workflow of §7.

    The result is ``localCheckpoint``-ed: the workflow output is a diamond
    DAG (self-joined for co-occurrences, re-aggregated for stats), so
    keeping the lineage would recompute the whole workflow once per
    reference — checkpointing truncates it to the materialised blocks.
    """
    check_er_type(er_type)
    a = standard_blocking(tokens, er_type)
    a = purge_blocks(a, er_type, n_profiles, purge_ratio=purge_ratio)
    a = filter_blocks(a, er_type, filter_ratio=filter_ratio).localCheckpoint()
    return BlockCollection(a, block_stats(a, er_type).localCheckpoint(), er_type)


def schedule_blocks(collection: BlockCollection) -> DataFrame:
    """Block Scheduling: ``(token, block_id, cardinality)``.

    ``block_id`` is the 1-based position after sorting all blocks in
    non-decreasing cardinality (weight 1/‖b‖ descending, §5.2.1), ties
    broken by token. The id doubles as the LeCoBI ordinal: a pair is
    "first seen" in its minimum shared block id.
    """
    w = Window.orderBy(F.col("cardinality").asc(), F.col("token").asc())
    return collection.stats.select(
        "token", F.row_number().over(w).alias("block_id"), "cardinality"
    )


def profile_index(assignments: DataFrame) -> DataFrame:
    """Profile Index: ``(pid, n_blocks)`` — block-list length per profile."""
    return assignments.groupBy("pid").agg(F.count("*").alias("n_blocks"))
