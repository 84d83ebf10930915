"""Unit tests for match functions: Spark expressions vs Python references."""
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.eval.match_functions import (
    apply_match_function,
    jaccard_py,
    levenshtein_py,
    profile_strings,
)
from tests.conftest import make_profiles

words = st.lists(
    st.text(alphabet="abcde", min_size=1, max_size=5), min_size=1, max_size=6
).map(" ".join)


def test_profile_strings_sorted_attr_value(spark):
    df = make_profiles(spark, [(0, 0, "b", "two"), (0, 0, "a", "one")])
    [r] = profile_strings(df).collect()
    assert r.text == "a:one b:two"


def _apply(spark, a, b, fn):
    em = spark.createDataFrame(
        pd.DataFrame({"emission_idx": [1], "i": [0], "j": [1]}),
        "emission_idx long, i long, j long",
    )
    strings = spark.createDataFrame(
        pd.DataFrame({"pid": [0, 1], "text": [a, b]}), "pid long, text string"
    )
    [row] = apply_match_function(em, strings, fn).collect()
    return row.score


def test_jaccard_spark_matches_python(spark):
    a, b = "one two three", "two three four"
    assert _apply(spark, a, b, "js") == pytest.approx(jaccard_py(a, b)) == pytest.approx(0.5)


def test_edit_distance_spark_matches_python(spark):
    a, b = "kitten", "sitting"
    assert _apply(spark, a, b, "ed") == levenshtein_py(a, b) == 3


def test_unknown_match_function_raises(spark):
    with pytest.raises(ValueError):
        _apply(spark, "x", "y", "cosine")


def test_levenshtein_py_properties():
    assert levenshtein_py("", "") == 0
    assert levenshtein_py("abc", "abc") == 0
    assert levenshtein_py("abc", "") == 3
    assert levenshtein_py("abc", "axc") == 1


@given(words, words)
@settings(deadline=None, max_examples=25)
def test_jaccard_py_symmetric_bounded(a, b):
    s = jaccard_py(a, b)
    assert 0.0 <= s <= 1.0
    assert s == jaccard_py(b, a)


@given(st.text(alphabet="abc", max_size=8), st.text(alphabet="abc", max_size=8))
@settings(deadline=None, max_examples=40)
def test_levenshtein_py_metric_axioms(a, b):
    d = levenshtein_py(a, b)
    assert d == levenshtein_py(b, a)
    assert (d == 0) == (a == b)
    assert d <= max(len(a), len(b))


def test_identical_profiles_score(spark):
    assert _apply(spark, "same text here", "same text here", "js") == pytest.approx(1.0)
    assert _apply(spark, "same text here", "same text here", "ed") == 0.0
