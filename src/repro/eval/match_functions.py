"""Match functions for the time-efficiency experiment (§7.3).

The paper pairs each progressive method with an *expensive* match
function (edit distance, O(s·t)) and a *cheap* one (Jaccard similarity,
O(s+t)) over the textual representation of the two profiles. As in the
paper, no threshold is applied — only the cost of evaluating the
function matters, the outcome is taken from the ground truth.

The Spark-side implementations use native Catalyst expressions
(``levenshtein``, array intersection/union) — no Python UDF on the hot
path; pure-Python references back the unit tests.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

MATCH_FUNCTIONS = ("js", "ed")

# Edit distance is quadratic; cap the compared text so a single pathological
# profile cannot dominate the benchmark (documented deviation: the paper
# compares full profile strings).
ED_MAX_LEN = 512


def profile_strings(profiles: DataFrame) -> DataFrame:
    """Textual representation per profile: sorted ``attr:value`` pairs joined
    by spaces — the string the match functions compare."""
    return profiles.groupBy("pid").agg(
        F.concat_ws(
            " ", F.sort_array(F.collect_list(F.concat_ws(":", "attr", "value")))
        ).alias("text")
    )


def _js_expr(a: Column, b: Column) -> Column:
    ta, tb = F.split(a, r"\s+"), F.split(b, r"\s+")
    inter = F.size(F.array_intersect(ta, tb)).cast("double")
    union = F.size(F.array_union(ta, tb)).cast("double")
    return F.when(union > 0, inter / union).otherwise(F.lit(0.0))


def _ed_expr(a: Column, b: Column) -> Column:
    return F.levenshtein(F.substring(a, 1, ED_MAX_LEN), F.substring(b, 1, ED_MAX_LEN)).cast(
        "double"
    )


def apply_match_function(emissions: DataFrame, strings: DataFrame, fn: str) -> DataFrame:
    """Score every emitted comparison: ``(emission_idx, i, j, score)``."""
    si = strings.select(F.col("pid").alias("i"), F.col("text").alias("text_i"))
    sj = strings.select(F.col("pid").alias("j"), F.col("text").alias("text_j"))
    joined = emissions.join(si, "i").join(sj, "j")
    if fn == "js":
        score = _js_expr(F.col("text_i"), F.col("text_j"))
    elif fn == "ed":
        score = _ed_expr(F.col("text_i"), F.col("text_j"))
    else:
        raise ValueError(f"unknown match function {fn!r}; choose from {MATCH_FUNCTIONS}")
    return joined.select("emission_idx", "i", "j", score.alias("score"))


def jaccard_py(a: str, b: str) -> float:
    """Pure-Python Jaccard similarity over whitespace tokens (test oracle)."""
    sa, sb = set(a.split()), set(b.split())
    if not sa and not sb:
        return 0.0
    return len(sa & sb) / len(sa | sb)


def levenshtein_py(a: str, b: str) -> int:
    """Pure-Python Levenshtein distance (test oracle for the Spark expr)."""
    if len(a) < len(b):
        a, b = b, a
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i]
        for j, cb in enumerate(b, 1):
            cur.append(min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + (ca != cb)))
        prev = cur
    return prev[-1]
