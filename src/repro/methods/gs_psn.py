"""Global Schema-Agnostic PSN (§5.1.2).

RCF frequencies are accumulated over *all* window sizes in
``[1, w_max]`` and one weight is computed per distinct pair, defining a
single global execution order — this is the reading under which GS-PSN
"eliminates all repeated comparisons" (DESIGN.md §1). The extra
configuration parameter ``w_max`` bounds the considered co-occurrence
range (paper: 20 for structured, 200 for heterogeneous datasets).

Emission order: ``(RCF desc, pair id)``.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.neighbor import neighbor_list, position_counts, rcf_weights, window_pairs
from repro.rank import assign_emission_idx
from repro.tokenize import DEFAULT_MIN_TOKEN_LEN, tokenize_profiles

DEFAULT_W_MAX = 20


def gs_psn(
    profiles: DataFrame,
    er_type: str,
    *,
    n_max: int | None,
    w_max: int = DEFAULT_W_MAX,
    salt: int = 0,
    min_len: int = DEFAULT_MIN_TOKEN_LEN,
) -> DataFrame:
    """Emission stream of GS-PSN: repeat-free, global order over [1, w_max]."""
    keys = tokenize_profiles(profiles, min_len=min_len).withColumnRenamed("token", "key")
    nl = neighbor_list(keys, salt=salt)
    upper = min(w_max, max(1, nl.count() - 1))
    pairs = window_pairs(nl, range(1, upper + 1), er_type)
    weighted = rcf_weights(pairs, position_counts(nl), per_window=False)
    order = [F.col("weight").desc(), F.col("i").asc(), F.col("j").asc()]
    return assign_emission_idx(weighted, order, n_max=n_max)
