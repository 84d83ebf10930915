"""Unit tests for the schema-agnostic tokenizer."""
import pytest

from repro.tokenize import profile_token_counts, tokenize_profiles
from tests.conftest import make_profiles


def toks(spark, value, **kw):
    df = make_profiles(spark, [(0, 0, "a", value)])
    return {r.token for r in tokenize_profiles(df, **kw).collect()}


def test_lowercases(spark):
    assert toks(spark, "Alpha BETA") == {"alpha", "beta"}


def test_splits_on_whitespace(spark):
    assert toks(spark, "one two\tthree") == {"one", "two", "three"}


def test_strips_edge_punctuation(spark):
    assert toks(spark, "(hello), world!") == {"hello", "world"}


def test_keeps_internal_punctuation(spark):
    assert toks(spark, "o'brien") == {"o'brien"}


def test_uri_survives_as_single_token(spark):
    uri = "http://dbpedia.org/resource/Foo_Bar"
    assert toks(spark, uri) == {uri.lower()}


def test_min_len_filters_short_tokens(spark):
    assert toks(spark, "a bb ccc") == {"bb", "ccc"}
    assert toks(spark, "a bb ccc", min_len=3) == {"ccc"}


def test_digits_kept(spark):
    assert toks(spark, "zip 94110") == {"zip", "94110"}


def test_distinct_per_profile(spark):
    df = make_profiles(
        spark, [(0, 0, "a", "dup dup"), (0, 0, "b", "dup other")]
    )
    rows = tokenize_profiles(df).collect()
    assert sorted(r.token for r in rows) == ["dup", "other"]


def test_tokens_carry_pid_and_source(spark):
    df = make_profiles(spark, [(7, 2, "a", "xyz")])
    [r] = tokenize_profiles(df).collect()
    assert (r.pid, r.source, r.token) == (7, 2, "xyz")


def test_multiple_profiles_independent(spark):
    df = make_profiles(spark, [(0, 0, "a", "foo"), (1, 0, "a", "foo bar")])
    got = {(r.pid, r.token) for r in tokenize_profiles(df).collect()}
    assert got == {(0, "foo"), (1, "foo"), (1, "bar")}


def test_punctuation_only_token_dropped(spark):
    assert toks(spark, "word -- !!") == {"word"}


def test_profile_token_counts(spark):
    df = make_profiles(
        spark, [(0, 0, "a", "x1 x2 x3"), (1, 0, "a", "x1"), (1, 0, "b", "x1 x9")]
    )
    counts = {r.pid: r.n_tokens for r in profile_token_counts(tokenize_profiles(df)).collect()}
    assert counts == {0: 3, 1: 2}


def test_empty_value_yields_nothing(spark):
    df = make_profiles(spark, [(0, 0, "a", "!"), (1, 0, "a", "keepme")])
    rows = tokenize_profiles(df).collect()
    assert {r.token for r in rows} == {"keepme"}
