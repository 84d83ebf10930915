"""Progressive Sorted Neighborhood — the schema-based baseline (§2, [4,5]).

Every profile gets exactly one schema-based blocking key (supplied by the
dataset's ``key_fn``, e.g. Soundex(surname)+initial+zipcode for the
census analogue, §7 fn. 6). The sorted key list is swept by a sliding
window of iteratively incremented size; comparisons are emitted in
``(window, position)`` order — exactly Fig. 4a. With one placement per
profile the stream is repeat-free by construction.
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.methods._sliding import grow_windows
from repro.neighbor import neighbor_list, window_pairs
from repro.rank import assign_emission_idx

KeyFn = Callable[[DataFrame], DataFrame]


def psn(
    profiles: DataFrame,
    er_type: str,
    *,
    n_max: int | None,
    key_fn: KeyFn,
    salt: int = 0,
) -> DataFrame:
    """Emission stream of schema-based PSN.

    ``key_fn(profiles)`` must return one ``(key, pid, source)`` row per
    profile — the schema-based blocking key (`repro.keys`).
    """
    keys = key_fn(profiles)
    nl = neighbor_list(keys, salt=salt)
    pairs, _ = grow_windows(lambda ws: window_pairs(nl, ws, er_type), nl.count(), n_max)
    order = [F.col("w").asc(), F.col("pos").asc(), F.col("i").asc(), F.col("j").asc()]
    return assign_emission_idx(pairs, order, n_max=n_max)
