"""Shared primitives for the progressive-ER reproduction.

Conventions used across every module:

* **Profiles** are long-format DataFrames with columns
  ``(pid: long, source: int, attr: string, value: string)`` — one row per
  attribute name-value pair. ``pid`` is globally unique even in
  Clean-clean ER (source-2 ids are offset by the generator).
* **ER type** is ``"dirty"`` (one collection, duplicates inside) or
  ``"clean"`` (two duplicate-free collections, ``source`` ∈ {1, 2}).
* **Comparisons** are canonical pairs ``(i, j)`` with ``i < j`` by pid.
  For Clean-clean ER the source-1 profile always has the smaller pid, so
  the same canonicalization applies.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

DIRTY = "dirty"
CLEAN = "clean"

PROFILE_COLUMNS = ["pid", "source", "attr", "value"]


def check_er_type(er_type: str) -> str:
    """Validate and return the ER type string."""
    if er_type not in (DIRTY, CLEAN):
        raise ValueError(f"er_type must be '{DIRTY}' or '{CLEAN}', got {er_type!r}")
    return er_type


def valid_pair(pid_a: Column, src_a: Column, pid_b: Column, src_b: Column, er_type: str) -> Column:
    """Predicate: is (a, b) a valid comparison for this ER type?

    Dirty ER compares any two distinct profiles of the single collection;
    Clean-clean ER only compares profiles from different sources (§4.1).
    """
    check_er_type(er_type)
    if er_type == DIRTY:
        return pid_a != pid_b
    return (pid_a != pid_b) & (src_a != src_b)


def canonical_pair(pid_a: Column, pid_b: Column) -> tuple[Column, Column]:
    """Return (i, j) = (min, max) so each unordered pair has one identity."""
    return F.least(pid_a, pid_b).alias("i"), F.greatest(pid_a, pid_b).alias("j")


def pair_cardinality(size: Column, n1: Column, n2: Column, er_type: str) -> Column:
    """Number of valid comparisons in a block.

    Dirty ER: C(|b|, 2). Clean-clean ER: |b ∩ P1| · |b ∩ P2| (cross-source
    pairs only) — the definition under which Block Scheduling and ARCS
    count comparisons.
    """
    check_er_type(er_type)
    if er_type == DIRTY:
        return (size * (size - F.lit(1)) / F.lit(2)).cast("long")
    return (n1 * n2).cast("long")


def profile_counts(profiles: DataFrame) -> DataFrame:
    """One row per profile: ``(pid, source)`` — the node set."""
    return profiles.select("pid", "source").distinct()
