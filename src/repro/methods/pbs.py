"""Progressive Block Scheduling (§5.2.1, Alg. 3–4).

Blocks from the Token Blocking workflow are scheduled in non-decreasing
cardinality (weight 1/‖b‖). Inside each block, non-repeated comparisons
— those whose *least common block id* equals the current block (LeCoBI)
— are ordered by their Blocking-Graph edge weight descending.

Distributed formulation: one co-occurrence aggregation yields, per
distinct valid pair, its minimum shared block id (= the block where PBS
first meets and emits it) and its edge weight; sorting by
``(lecobi asc, weight desc)`` reproduces Alg. 3/4's stream exactly, with
zero repeats (Example 5 / Fig. 7).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.blocking import token_blocking_workflow
from repro.common import profile_counts
from repro.graph import edge_weights_with_lecobi
from repro.rank import assign_emission_idx
from repro.tokenize import DEFAULT_MIN_TOKEN_LEN, tokenize_profiles


def pbs(
    profiles: DataFrame,
    er_type: str,
    *,
    n_max: int | None,
    scheme: str = "arcs",
    purge_ratio: float = 0.1,
    filter_ratio: float = 0.8,
    min_len: int = DEFAULT_MIN_TOKEN_LEN,
) -> DataFrame:
    """Emission stream of PBS, capped at ``n_max`` comparisons."""
    n_profiles = profile_counts(profiles).count()
    tokens = tokenize_profiles(profiles, min_len=min_len)
    collection = token_blocking_workflow(
        tokens, er_type, n_profiles, purge_ratio=purge_ratio, filter_ratio=filter_ratio
    )
    edges = edge_weights_with_lecobi(collection, scheme=scheme)
    order = [
        F.col("lecobi").asc(),
        F.col("weight").desc(),
        F.col("i").asc(),
        F.col("j").asc(),
    ]
    return assign_emission_idx(edges, order, n_max=n_max)
