"""Schema-Agnostic Progressive Suffix Arrays Blocking (§4.2).

The suffix forest over all attribute value tokens is processed "leaves
first, root last": nodes ordered by suffix length descending (deepest
layer = the overall largest tokens first), nodes of the same layer in
increasing number of comparisons, and within a node every valid pair is
emitted. Naïve: no repeat detection across nodes.

The emission budget prunes the node list by cumulative cardinality
before pairs are generated, so the (potentially quadratic) root blocks
that make SA-PSAB unscalable (§7.2) are only expanded when the budget
actually reaches them.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.common import canonical_pair, valid_pair
from repro.rank import assign_emission_idx
from repro.suffix import DEFAULT_L_MIN, suffix_assignments, suffix_blocks
from repro.tokenize import DEFAULT_MIN_TOKEN_LEN, tokenize_profiles


def sa_psab(
    profiles: DataFrame,
    er_type: str,
    *,
    n_max: int | None,
    l_min: int = DEFAULT_L_MIN,
    min_len: int = DEFAULT_MIN_TOKEN_LEN,
) -> DataFrame:
    """Emission stream of SA-PSAB, capped at ``n_max`` comparisons."""
    # Tokens feed both the node statistics and the pair expansion (twice,
    # via the self-join); checkpoint so tokenization runs once.
    tokens = tokenize_profiles(profiles, min_len=min_len).localCheckpoint()
    blocks = suffix_blocks(tokens, er_type, l_min=l_min)
    order_w = Window.orderBy(
        F.col("suffix_len").desc(), F.col("cardinality").asc(), F.col("suffix").asc()
    )
    nodes = blocks.withColumn("node_rank", F.row_number().over(order_w)).withColumn(
        "cum_before",
        F.coalesce(
            F.sum("cardinality").over(
                order_w.rowsBetween(Window.unboundedPreceding, -1)
            ),
            F.lit(0),
        ),
    )
    if n_max is not None:
        nodes = nodes.where(F.col("cum_before") < F.lit(int(n_max)))
    selected = nodes.select("suffix", "node_rank")
    assign = suffix_assignments(tokens, l_min=l_min).join(selected, "suffix")
    a, b = assign.alias("a"), assign.alias("b")
    pairs = (
        a.join(b, F.col("a.suffix") == F.col("b.suffix"))
        .where(F.col("a.pid") < F.col("b.pid"))
        .where(
            valid_pair(
                F.col("a.pid"), F.col("a.source"), F.col("b.pid"), F.col("b.source"), er_type
            )
        )
        .select(
            F.col("a.node_rank").alias("node_rank"),
            *canonical_pair(F.col("a.pid"), F.col("b.pid")),
        )
    )
    order = [F.col("node_rank").asc(), F.col("i").asc(), F.col("j").asc()]
    return assign_emission_idx(pairs, order, n_max=n_max)
