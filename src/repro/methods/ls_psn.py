"""Local Schema-Agnostic PSN (§5.1.1, Alg. 1–2).

For each window size ``w`` the distinct valid profile pairs lying at
exact distance ``w`` in the Neighbor List are weighted with RCF and
emitted in descending weight — a *local* execution order per window.
Pairs may re-appear at a later window size (the paper's stated drawback
of LS-PSN versus GS-PSN).

Emission order: ``(w asc, RCF desc, pair id)`` — Fig. 6 Steps 1.i–1.iv.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.methods._sliding import grow_windows
from repro.neighbor import neighbor_list, position_counts, rcf_weights, window_pairs
from repro.rank import assign_emission_idx
from repro.tokenize import DEFAULT_MIN_TOKEN_LEN, tokenize_profiles


def ls_psn(
    profiles: DataFrame,
    er_type: str,
    *,
    n_max: int | None,
    salt: int = 0,
    min_len: int = DEFAULT_MIN_TOKEN_LEN,
) -> DataFrame:
    """Emission stream of LS-PSN, capped at ``n_max`` comparisons."""
    keys = tokenize_profiles(profiles, min_len=min_len).withColumnRenamed("token", "key")
    nl = neighbor_list(keys, salt=salt)
    n_pos = position_counts(nl)

    def build(ws: range) -> DataFrame:
        return rcf_weights(window_pairs(nl, ws, er_type), n_pos, per_window=True)

    weighted, _ = grow_windows(build, nl.count(), n_max)
    order = [F.col("w").asc(), F.col("weight").desc(), F.col("i").asc(), F.col("j").asc()]
    return assign_emission_idx(weighted, order, n_max=n_max)
