"""Schema-agnostic tokenizer: profiles → attribute value tokens.

Token Blocking (§3, Fig. 3d) treats every token that appears in any
attribute *value* as a blocking key, ignoring attribute names entirely —
that is what makes the methods schema-agnostic.

Tokenization rule (documented in DESIGN.md §4): lowercase, split on
whitespace, strip leading/trailing non-alphanumeric characters, drop
tokens shorter than ``min_len``. Internal punctuation is preserved, so a
URI like ``http://dbpedia.org/resource/Foo`` stays a single token — the
property that lets equality-based methods exploit URI semantics while the
alphabetical ordering of URIs stays uninformative (§7.2, freebase).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

DEFAULT_MIN_TOKEN_LEN = 2

_EDGE_PUNCT = r"^[^0-9a-z]+|[^0-9a-z]+$"


def tokenize_profiles(profiles: DataFrame, *, min_len: int = DEFAULT_MIN_TOKEN_LEN) -> DataFrame:
    """Explode profiles into distinct ``(pid, source, token)`` rows.

    A profile contributes each distinct token once, no matter how many
    attribute values mention it (a blocking key indexes a profile once).
    """
    tok = (
        profiles
        .select(
            "pid",
            "source",
            F.explode(F.split(F.lower(F.col("value")), r"\s+")).alias("raw"),
        )
        .withColumn("token", F.regexp_replace("raw", _EDGE_PUNCT, ""))
        .where(F.length("token") >= min_len)
        .select("pid", "source", "token")
        .distinct()
    )
    return tok


def profile_token_counts(tokens: DataFrame) -> DataFrame:
    """``(pid, n_tokens)`` — distinct tokens per profile (Position-Index lengths)."""
    return tokens.groupBy("pid").agg(F.count("*").alias("n_tokens"))
