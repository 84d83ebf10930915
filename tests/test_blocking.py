"""Unit tests for the Token Blocking workflow (standard blocking, purging,
filtering, scheduling, profile index)."""
import math

import pytest
from pyspark.sql import functions as F

from repro.blocking import (
    block_stats,
    filter_blocks,
    profile_index,
    purge_blocks,
    schedule_blocks,
    standard_blocking,
    token_blocking_workflow,
)
from repro.common import CLEAN, DIRTY
from repro.tokenize import tokenize_profiles
from tests.conftest import make_profiles


@pytest.fixture(scope="module")
def micro_tokens(spark, micro_dirty):
    return tokenize_profiles(micro_dirty)


def test_standard_blocking_drops_singleton_blocks(spark, micro_tokens):
    blocks = {r.token for r in standard_blocking(micro_tokens, DIRTY).collect()}
    assert blocks == {"alpha", "beta"}  # gamma/delta stem from one profile


def test_standard_blocking_clean_requires_both_sources(spark, micro_clean):
    tokens = tokenize_profiles(micro_clean)
    blocks = {r.token for r in standard_blocking(tokens, CLEAN).collect()}
    # gamma only in source 1, delta only in source 2 → no valid pair
    assert blocks == {"alpha", "beta"}


def test_block_stats_dirty_cardinality(spark, micro_tokens):
    a = standard_blocking(micro_tokens, DIRTY)
    stats = {r.token: r for r in block_stats(a, DIRTY).collect()}
    assert stats["alpha"].size == 2 and stats["alpha"].cardinality == 1
    assert stats["beta"].size == 3 and stats["beta"].cardinality == 3


def test_block_stats_clean_cardinality_is_cross_product(spark, micro_clean):
    tokens = tokenize_profiles(micro_clean)
    a = standard_blocking(tokens, CLEAN)
    stats = {r.token: r for r in block_stats(a, CLEAN).collect()}
    assert stats["alpha"].n1 == 2 and stats["alpha"].n2 == 1
    assert stats["alpha"].cardinality == 2  # 2×1 cross-source pairs
    assert stats["beta"].cardinality == 1
    assert "delta" not in stats  # single-source block has no valid pair


def test_purging_threshold_boundary(spark):
    # 10 profiles; token "stop" in 3 of them (30% > 10%) must be purged,
    # token "rare" in 2 (20% with ratio 0.2 — kept at the boundary |b| ≤ r·|P|).
    rows = [(p, 0, "a", "stop") for p in range(3)] + [
        (p, 0, "a", "rare") for p in range(8, 10)
    ] + [(p, 0, "a", f"fill{p}") for p in range(3, 8)]
    tokens = tokenize_profiles(make_profiles(spark, rows))
    a = standard_blocking(tokens, DIRTY)
    kept = {r.token for r in purge_blocks(a, DIRTY, 10, purge_ratio=0.1).collect()}
    assert kept == set()  # both blocks exceed 10% of 10 profiles? rare=2 ≤ 1? no
    kept2 = {r.token for r in purge_blocks(a, DIRTY, 10, purge_ratio=0.2).collect()}
    assert kept2 == {"rare"}


def test_filtering_keeps_smallest_blocks_per_profile(spark):
    # p0 occurs in blocks big (3 profiles) and small (2 profiles); with
    # ratio 0.5 it must stay only in the smaller one.
    rows = [
        (0, 0, "a", "big small"),
        (1, 0, "a", "big"),
        (2, 0, "a", "big small2"),
        (3, 0, "a", "small small2"),
    ]
    tokens = tokenize_profiles(make_profiles(spark, rows))
    a = standard_blocking(tokens, DIRTY)
    filtered = filter_blocks(a, DIRTY, filter_ratio=0.5)
    memb = {(r.token, r.pid) for r in filtered.collect()}
    assert ("small", 0) in memb and ("big", 0) not in memb


def test_filtering_ceils_the_ratio(spark, micro_tokens):
    # Each profile in ≤2 blocks: ⌈0.8·1⌉=1, ⌈0.8·2⌉=2 — nothing with a
    # single block may be dropped.
    a = standard_blocking(micro_tokens, DIRTY)
    before = {r.pid for r in a.collect()}
    after = {r.pid for r in filter_blocks(a, DIRTY, filter_ratio=0.8).collect()}
    assert before == after


def test_filtering_drops_blocks_with_no_valid_pair(spark):
    rows = [
        (0, 0, "a", "x y"),
        (1, 0, "a", "x y"),
        (2, 0, "a", "x z w q r t u"),  # many blocks → x gets filtered out
        (3, 0, "a", "z w q r t u"),
    ]
    tokens = tokenize_profiles(make_profiles(spark, rows))
    a = standard_blocking(tokens, DIRTY)
    filtered = filter_blocks(a, DIRTY, filter_ratio=0.5)
    stats = {r.token: r.size for r in block_stats(filtered, DIRTY).collect()}
    assert all(s >= 2 for s in stats.values())


def test_workflow_end_to_end_counts(spark, micro_tokens):
    coll = token_blocking_workflow(
        micro_tokens, DIRTY, 4, purge_ratio=1.0, filter_ratio=1.0
    )
    stats = {r.token: r.cardinality for r in coll.stats.collect()}
    assert stats == {"alpha": 1, "beta": 3}


def test_schedule_blocks_orders_by_cardinality(spark, micro_tokens):
    coll = token_blocking_workflow(
        micro_tokens, DIRTY, 4, purge_ratio=1.0, filter_ratio=1.0
    )
    sched = {r.token: r.block_id for r in schedule_blocks(coll).collect()}
    assert sched == {"alpha": 1, "beta": 2}


def test_schedule_blocks_tie_broken_by_token(spark):
    rows = [(0, 0, "a", "aa bb"), (1, 0, "a", "aa bb")]
    coll = token_blocking_workflow(
        tokenize_profiles(make_profiles(spark, rows)), DIRTY, 2,
        purge_ratio=1.0, filter_ratio=1.0,
    )
    sched = {r.token: r.block_id for r in schedule_blocks(coll).collect()}
    assert sched == {"aa": 1, "bb": 2}


def test_profile_index_lengths(spark, micro_tokens):
    a = standard_blocking(micro_tokens, DIRTY)
    idx = {r.pid: r.n_blocks for r in profile_index(a).collect()}
    assert idx == {0: 2, 1: 2, 2: 1}


def test_workflow_deterministic(spark, micro_tokens):
    c1 = token_blocking_workflow(micro_tokens, DIRTY, 4, purge_ratio=1.0, filter_ratio=1.0)
    c2 = token_blocking_workflow(micro_tokens, DIRTY, 4, purge_ratio=1.0, filter_ratio=1.0)
    assert sorted(map(tuple, c1.assignments.collect())) == sorted(
        map(tuple, c2.assignments.collect())
    )


def test_er_type_validated(spark, micro_tokens):
    with pytest.raises(ValueError):
        token_blocking_workflow(micro_tokens, "weird", 4)


def test_purging_keeps_assignment_columns(spark, micro_tokens):
    a = standard_blocking(micro_tokens, DIRTY)
    out = purge_blocks(a, DIRTY, 4, purge_ratio=1.0)
    assert set(out.columns) == {"token", "pid", "source"}
