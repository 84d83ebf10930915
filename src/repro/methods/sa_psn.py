"""Schema-Agnostic Progressive Sorted Neighborhood (§4.1).

PSN's incrementally-widened sliding window applied to the schema-agnostic
Neighbor List (every attribute value token is a blocking key, so every
profile has multiple placements). Naïve by design: repeated comparisons
are emitted without detection, and equal-key runs order profiles in
*coincidental proximity* (pseudo-random, deterministic under ``salt``).

Emission order: window size ascending, then position in the list from the
top — exactly Fig. 4b.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.methods._sliding import grow_windows
from repro.neighbor import neighbor_list, window_pairs
from repro.rank import assign_emission_idx
from repro.tokenize import DEFAULT_MIN_TOKEN_LEN, tokenize_profiles


def sa_psn(
    profiles: DataFrame,
    er_type: str,
    *,
    n_max: int | None,
    salt: int = 0,
    min_len: int = DEFAULT_MIN_TOKEN_LEN,
) -> DataFrame:
    """Emission stream of SA-PSN, capped at ``n_max`` comparisons."""
    keys = tokenize_profiles(profiles, min_len=min_len).withColumnRenamed("token", "key")
    nl = neighbor_list(keys, salt=salt)
    pairs, _ = grow_windows(lambda ws: window_pairs(nl, ws, er_type), nl.count(), n_max)
    order = [F.col("w").asc(), F.col("pos").asc(), F.col("i").asc(), F.col("j").asc()]
    return assign_emission_idx(pairs, order, n_max=n_max)
