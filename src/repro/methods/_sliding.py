"""Shared incremental-window machinery for the Neighbor-List methods.

PSN / SA-PSN / LS-PSN conceptually widen the sliding window one step at a
time until the consumer stops asking for comparisons. Materialising the
capped stream therefore needs the smallest window range whose candidate
count covers the emission budget; ``grow_windows`` finds it by geometric
growth (a handful of Spark jobs, each a cheap count over equi-joins).
"""
from __future__ import annotations

import math
from typing import Callable

from pyspark.sql import DataFrame


def grow_windows(
    build: Callable[[range], DataFrame], list_len: int, n_max: int | None
) -> tuple[DataFrame, int]:
    """Return ``(candidates, W)`` where ``candidates = build(range(1, W+1))``
    yields at least ``n_max`` rows, or the full window range ``W = L-1``
    (every profile compared with all others) if the budget exceeds it.

    ``n_max=None`` asks for the complete stream directly.
    """
    max_w = max(1, list_len - 1)
    if n_max is None:
        return build(range(1, max_w + 1)), max_w
    w = max(1, min(max_w, math.ceil(n_max / max(list_len, 1)) + 1))
    while True:
        df = build(range(1, w + 1))
        if w >= max_w or df.count() >= n_max:
            return df, w
        w = min(max_w, w * 2 + 1)
