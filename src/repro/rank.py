"""Turn a method's order-key columns into a capped emission stream.

Every progressive method reduces to a DataFrame of candidate emissions
plus a total order over them. ``assign_emission_idx`` sorts by the order
keys, truncates to the emission budget, and numbers the survivors
1..N — the *static processing order* all methods in the paper define.

The sort+limit runs distributed (Spark's TakeOrdered); only the final
``row_number`` sees a single partition, and by then at most ``n_max``
rows remain (bounded by ``ec*_max · |D_P|`` — a few 100k in the largest
experiment), which is the documented safety condition (DESIGN.md §4).
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame, Window
from pyspark.sql import functions as F

EMISSION_COLUMNS = ["emission_idx", "i", "j"]


def assign_emission_idx(candidates: DataFrame, order_keys: list[Column], *, n_max: int | None) -> DataFrame:
    """Rank candidates by ``order_keys`` (must be a total order for
    determinism), keep the first ``n_max`` (None = unbounded), and return
    ``(emission_idx, i, j)`` with 1-based consecutive indices."""
    ordered = candidates.orderBy(*order_keys)
    if n_max is not None:
        ordered = ordered.limit(int(n_max))
    w = Window.orderBy(*order_keys)
    return ordered.withColumn("emission_idx", F.row_number().over(w)).select(
        "emission_idx", "i", "j"
    )
