"""Unit tests for the suffix forest substrate of SA-PSAB."""
import pytest

from repro.common import CLEAN, DIRTY
from repro.suffix import suffix_assignments, suffix_blocks
from repro.tokenize import tokenize_profiles
from tests.conftest import make_profiles


def test_all_suffixes_at_least_lmin(spark):
    df = make_profiles(spark, [(0, 0, "a", "coin")])
    tokens = tokenize_profiles(df)
    sufs = {r.suffix for r in suffix_assignments(tokens, l_min=2).collect()}
    assert sufs == {"coin", "oin", "in"}


def test_lmin_filters_short_tokens_entirely(spark):
    df = make_profiles(spark, [(0, 0, "a", "ab cdef")])
    tokens = tokenize_profiles(df)
    sufs = {r.suffix for r in suffix_assignments(tokens, l_min=3).collect()}
    assert sufs == {"cdef", "def", "ef"} - {"ef"}


def test_shared_suffix_merges_tokens(spark):
    # "coin" and "join" share suffixes "oin"/"in" — the paper's Fig. 5 idea.
    df = make_profiles(spark, [(0, 0, "a", "coin"), (1, 0, "a", "join")])
    tokens = tokenize_profiles(df)
    blocks = {r.suffix: r for r in suffix_blocks(tokens, DIRTY, l_min=2).collect()}
    assert set(blocks) == {"oin", "in"}
    assert blocks["oin"].size == 2 and blocks["oin"].cardinality == 1


def test_suffix_assignment_distinct_per_profile(spark):
    # two tokens of one profile sharing a suffix index the profile once
    df = make_profiles(spark, [(0, 0, "a", "pain gain"), (1, 0, "a", "rain")])
    tokens = tokenize_profiles(df)
    a = suffix_assignments(tokens, l_min=3).where("suffix = 'ain'").collect()
    assert sorted(r.pid for r in a) == [0, 1]


def test_suffix_blocks_clean_validity(spark):
    df = make_profiles(
        spark, [(0, 1, "a", "coin"), (1, 1, "a", "join"), (2, 2, "a", "loin")]
    )
    tokens = tokenize_profiles(df)
    blocks = {r.suffix: r for r in suffix_blocks(tokens, CLEAN, l_min=2).collect()}
    # cross-source cardinality: {coin, join} × {loin} on suffixes oin/in
    assert blocks["oin"].cardinality == 2
    assert blocks["in"].cardinality == 2


def test_suffix_len_column(spark):
    df = make_profiles(spark, [(0, 0, "a", "abcd"), (1, 0, "a", "abcd")])
    tokens = tokenize_profiles(df)
    rows = suffix_blocks(tokens, DIRTY, l_min=2).collect()
    assert {(r.suffix, r.suffix_len) for r in rows} == {
        ("abcd", 4), ("bcd", 3), ("cd", 2),
    }
