"""Blocking Graph of Meta-blocking (§3.2) over a block collection.

Nodes are profiles, edges are block co-occurrences, edge weights estimate
matching likelihood from co-occurrence patterns. Implemented as one
self-join on the block token plus one aggregation — the canonical
Catalyst-friendly formulation of Meta-blocking edge weighting.

Weighting schemes (§3.2, [12]):

* ``arcs`` — ARCS(p_i, p_j) = Σ_{b ∈ B_i ∩ B_j} 1/‖b‖ (paper default).
* ``cbs``  — CBS(p_i, p_j) = |B_i ∩ B_j| (common-blocks count; used in
  tests to show the methods are scheme-generic).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.blocking import BlockCollection, schedule_blocks
from repro.common import canonical_pair, valid_pair

WEIGHTING_SCHEMES = ("arcs", "cbs")


def cooccurrence_pairs(collection: BlockCollection) -> DataFrame:
    """All valid block co-occurrences: ``(token, i, j)``, one row per
    (block, pair) — a pair sharing k blocks appears k times."""
    a = collection.assignments.alias("a")
    b = collection.assignments.alias("b")
    pairs = (
        a.join(b, F.col("a.token") == F.col("b.token"))
        .where(F.col("a.pid") < F.col("b.pid"))
        .where(
            valid_pair(
                F.col("a.pid"), F.col("a.source"), F.col("b.pid"), F.col("b.source"),
                collection.er_type,
            )
        )
        .select(
            F.col("a.token").alias("token"),
            *canonical_pair(F.col("a.pid"), F.col("b.pid")),
        )
    )
    return pairs


def _scheme_weight(scheme: str):
    if scheme == "arcs":
        return F.sum(1.0 / F.col("cardinality")).alias("weight")
    if scheme == "cbs":
        return F.count("*").cast("double").alias("weight")
    raise ValueError(f"unknown weighting scheme {scheme!r}; choose from {WEIGHTING_SCHEMES}")


def edge_weights(collection: BlockCollection, *, scheme: str = "arcs") -> DataFrame:
    """Blocking-graph edges ``(i, j, weight)`` under the given scheme."""
    pairs = cooccurrence_pairs(collection).join(
        collection.stats.select("token", "cardinality"), "token"
    )
    return pairs.groupBy("i", "j").agg(_scheme_weight(scheme))


def edge_weights_with_lecobi(collection: BlockCollection, *, scheme: str = "arcs") -> DataFrame:
    """Edges ``(i, j, weight, lecobi)`` where ``lecobi`` is the minimum
    shared block id after Block Scheduling — the block in which PBS first
    encounters (and therefore emits) the pair (§5.2.1)."""
    sched = schedule_blocks(collection)
    pairs = cooccurrence_pairs(collection).join(
        sched.select("token", "block_id", "cardinality"), "token"
    )
    return pairs.groupBy("i", "j").agg(
        _scheme_weight(scheme), F.min("block_id").alias("lecobi")
    )


def duplication_likelihood(edges: DataFrame) -> DataFrame:
    """Per-profile duplication likelihood ``(pid, dup_likelihood, degree)``.

    PPS (§5.2.2) estimates it as the *average* weight of the node's
    incident edges; the undirected edge list is expanded in both
    directions so each endpoint sees the edge once.
    """
    sym = edges.select(F.col("i").alias("pid"), "weight").unionByName(
        edges.select(F.col("j").alias("pid"), "weight")
    )
    return sym.groupBy("pid").agg(
        F.avg("weight").alias("dup_likelihood"), F.count("*").alias("degree")
    )


def top_edge_per_profile(edges: DataFrame) -> DataFrame:
    """Each node's top-weighted incident comparison ``(pid, i, j, weight)``.

    Ties are broken toward the smaller neighbour id, matching the
    deterministic-ties convention used throughout (DESIGN.md §1).
    """
    sym = edges.select(F.col("i").alias("pid"), F.col("j").alias("other"), "i", "j", "weight").unionByName(
        edges.select(F.col("j").alias("pid"), F.col("i").alias("other"), "i", "j", "weight")
    )
    from pyspark.sql import Window

    w = Window.partitionBy("pid").orderBy(F.col("weight").desc(), F.col("other").asc())
    return (
        sym.withColumn("rk", F.row_number().over(w))
        .where(F.col("rk") == 1)
        .select("pid", "i", "j", "weight")
    )
