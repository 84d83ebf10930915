"""Schema-based blocking keys for the PSN baseline (§7).

The paper takes "the best schema-based blocking keys known from the
literature" for the four structured datasets (fn. 3/6 — e.g. Soundex-
encoded surnames concatenated to initials and zipcodes for census).
The analogues here mirror those recipes on the synthetic schemas.

Each ``*_key`` function maps a long-format profile DataFrame to exactly
one ``(key, pid, source)`` row per profile, as `repro.methods.psn`
expects.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.common import profile_counts


def _attr(profiles: DataFrame, name: str, alias: str) -> DataFrame:
    """First value of attribute ``name`` per profile, aliased ``alias``."""
    return (
        profiles.where(F.col("attr") == name)
        .groupBy("pid")
        .agg(F.min("value").alias(alias))
    )


def _assemble(profiles: DataFrame, parts: list[tuple[str, str]], expr) -> DataFrame:
    """Join the requested attributes onto the node set and build the key."""
    base = profile_counts(profiles)
    for name, alias in parts:
        base = base.join(_attr(profiles, name, alias), "pid", "left")
    return base.select(
        F.coalesce(expr, F.lit("")).alias("key"), "pid", "source"
    )


def census_key(profiles: DataFrame) -> DataFrame:
    """Soundex(surname) + first-name initial + zipcode (paper fn. 6)."""
    return _assemble(
        profiles,
        [("surname", "sn"), ("firstname", "fn"), ("zipcode", "zc")],
        F.concat(
            F.coalesce(F.soundex("sn"), F.lit("")),
            F.coalesce(F.upper(F.substring("fn", 1, 1)), F.lit("")),
            F.coalesce(F.col("zc"), F.lit("")),
        ),
    )


def restaurant_key(profiles: DataFrame) -> DataFrame:
    """First 4 letters of the name + first 3 of the city."""
    return _assemble(
        profiles,
        [("name", "nm"), ("city", "ct")],
        F.concat(
            F.coalesce(F.substring(F.lower("nm"), 1, 4), F.lit("")),
            F.coalesce(F.substring(F.lower("ct"), 1, 3), F.lit("")),
        ),
    )


def cora_key(profiles: DataFrame) -> DataFrame:
    """Soundex of first author's surname + publication year."""
    return _assemble(
        profiles,
        [("author", "au"), ("year", "yr")],
        F.concat(
            F.coalesce(F.soundex(F.element_at(F.split(F.col("au"), r"\s+"), -1)), F.lit("")),
            F.coalesce(F.col("yr"), F.lit("")),
        ),
    )


def cddb_key(profiles: DataFrame) -> DataFrame:
    """First 5 letters of artist + first 5 of the disc title."""
    return _assemble(
        profiles,
        [("artist", "ar"), ("dtitle", "dt")],
        F.concat(
            F.coalesce(F.substring(F.lower("ar"), 1, 5), F.lit("")),
            F.coalesce(F.substring(F.lower("dt"), 1, 5), F.lit("")),
        ),
    )


SCHEMA_KEYS = {
    "census": census_key,
    "restaurant": restaurant_key,
    "cora": cora_key,
    "cddb": cddb_key,
}
