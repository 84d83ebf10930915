"""Progressive Profile Scheduling (§5.2.2, Alg. 5–6).

Entity-centric equality-based method:

* **Initialization** (phase 0): every Blocking-Graph node contributes its
  top-weighted incident comparison; the deduplicated set is emitted in
  descending weight (Fig. 8a).
* **Emission** (phase 1): profiles are visited in descending duplication
  likelihood (average incident edge weight — the Sorted Profile List,
  Fig. 8b); each visit emits the profile's ``K_max`` top-weighted
  comparisons, skipping neighbours already visited (``checkedEntities``).

Static formulation of the skip rule: when profile ``p`` is visited,
``checkedEntities`` holds exactly the profiles ranked above ``p`` in the
Sorted Profile List, so comparison ``(p, q)`` survives iff
``rank(q) > rank(p)`` (DESIGN.md §1). ``K_max`` is not fixed by the
paper's experimental section; default 10, configurable.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.blocking import token_blocking_workflow
from repro.common import profile_counts
from repro.graph import duplication_likelihood, edge_weights, top_edge_per_profile
from repro.rank import assign_emission_idx
from repro.tokenize import DEFAULT_MIN_TOKEN_LEN, tokenize_profiles

DEFAULT_K_MAX = 10


def pps(
    profiles: DataFrame,
    er_type: str,
    *,
    n_max: int | None,
    k_max: int = DEFAULT_K_MAX,
    scheme: str = "arcs",
    purge_ratio: float = 0.1,
    filter_ratio: float = 0.8,
    min_len: int = DEFAULT_MIN_TOKEN_LEN,
) -> DataFrame:
    """Emission stream of PPS, capped at ``n_max`` comparisons."""
    n_profiles = profile_counts(profiles).count()
    tokens = tokenize_profiles(profiles, min_len=min_len)
    collection = token_blocking_workflow(
        tokens, er_type, n_profiles, purge_ratio=purge_ratio, filter_ratio=filter_ratio
    )
    # The edge list feeds four downstream consumers (duplication
    # likelihood, per-node top edges, both directions of phase 1);
    # checkpoint it so the co-occurrence aggregation runs once.
    edges = edge_weights(collection, scheme=scheme).localCheckpoint()

    # Sorted Profile List: rank 1 = highest duplication likelihood.
    dup = duplication_likelihood(edges)
    rank_w = Window.orderBy(F.col("dup_likelihood").desc(), F.col("pid").asc())
    ranks = dup.select(
        "pid", F.row_number().over(rank_w).alias("profile_rank")
    )

    # Phase 0 — deduplicated per-node top comparisons, weight desc.
    phase0 = (
        top_edge_per_profile(edges)
        .groupBy("i", "j")
        .agg(F.max("weight").alias("weight"))
        .select(
            F.lit(0).alias("phase"),
            (-F.col("weight")).alias("a"),
            F.lit(0.0).alias("b"),
            "i",
            "j",
        )
    )

    # Phase 1 — per profile (in Sorted-Profile-List order) the K_max
    # top comparisons toward not-yet-checked neighbours.
    sym = edges.select(
        F.col("i").alias("center"), F.col("j").alias("other"), "i", "j", "weight"
    ).unionByName(
        edges.select(
            F.col("j").alias("center"), F.col("i").alias("other"), "i", "j", "weight"
        )
    )
    rc = ranks.select(
        F.col("pid").alias("center"), F.col("profile_rank").alias("center_rank")
    )
    ro = ranks.select(
        F.col("pid").alias("other"), F.col("profile_rank").alias("other_rank")
    )
    top_w = Window.partitionBy("center").orderBy(
        F.col("weight").desc(), F.col("other").asc()
    )
    phase1 = (
        sym.join(rc, "center")
        .join(ro, "other")
        .where(F.col("other_rank") > F.col("center_rank"))
        .withColumn("rk", F.row_number().over(top_w))
        .where(F.col("rk") <= F.lit(int(k_max)))
        .select(
            F.lit(1).alias("phase"),
            F.col("center_rank").cast("double").alias("a"),
            (-F.col("weight")).alias("b"),
            "i",
            "j",
        )
    )

    candidates = phase0.unionByName(phase1)
    order = [
        F.col("phase").asc(),
        F.col("a").asc(),
        F.col("b").asc(),
        F.col("i").asc(),
        F.col("j").asc(),
    ]
    return assign_emission_idx(candidates, order, n_max=n_max)
