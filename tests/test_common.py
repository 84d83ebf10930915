"""Unit tests for shared primitives in repro.common."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.common import (
    CLEAN,
    DIRTY,
    canonical_pair,
    check_er_type,
    pair_cardinality,
    profile_counts,
    valid_pair,
)
from tests.conftest import make_profiles


def test_check_er_type_accepts_known():
    assert check_er_type(DIRTY) == DIRTY
    assert check_er_type(CLEAN) == CLEAN


@pytest.mark.parametrize("bad", ["", "both", "DIRTY", None])
def test_check_er_type_rejects_unknown(bad):
    with pytest.raises((ValueError, TypeError)):
        check_er_type(bad)


def _pairs_df(spark):
    pdf = pd.DataFrame(
        {
            "pa": [0, 0, 1, 2],
            "sa": [1, 1, 1, 2],
            "pb": [0, 1, 2, 3],
            "sb": [1, 2, 2, 2],
        }
    )
    return spark.createDataFrame(pdf, "pa long, sa int, pb long, sb int")


def test_valid_pair_dirty_excludes_self(spark):
    df = _pairs_df(spark).where(
        valid_pair(F.col("pa"), F.col("sa"), F.col("pb"), F.col("sb"), DIRTY)
    )
    got = {(r.pa, r.pb) for r in df.collect()}
    assert got == {(0, 1), (1, 2), (2, 3)}


def test_valid_pair_clean_requires_cross_source(spark):
    df = _pairs_df(spark).where(
        valid_pair(F.col("pa"), F.col("sa"), F.col("pb"), F.col("sb"), CLEAN)
    )
    got = {(r.pa, r.pb) for r in df.collect()}
    assert got == {(0, 1), (1, 2)}  # (2,3) same source, (0,0) same pid


def test_canonical_pair_orders_by_pid(spark):
    df = spark.createDataFrame(
        pd.DataFrame({"a": [5, 1], "b": [2, 9]}), "a long, b long"
    ).select(*canonical_pair(F.col("a"), F.col("b")))
    got = sorted((r.i, r.j) for r in df.collect())
    assert got == [(1, 9), (2, 5)]


@pytest.mark.parametrize(
    "size,expected", [(0, 0), (1, 0), (2, 1), (3, 3), (4, 6), (10, 45)]
)
def test_pair_cardinality_dirty(spark, size, expected):
    df = spark.createDataFrame(pd.DataFrame({"s": [size]}), "s long").select(
        pair_cardinality(F.col("s"), F.lit(0), F.lit(0), DIRTY).alias("c")
    )
    assert df.first().c == expected


@pytest.mark.parametrize("n1,n2,expected", [(0, 5, 0), (2, 3, 6), (1, 1, 1)])
def test_pair_cardinality_clean(spark, n1, n2, expected):
    df = spark.createDataFrame(pd.DataFrame({"x": [1]}), "x long").select(
        pair_cardinality(F.lit(10), F.lit(n1), F.lit(n2), CLEAN).alias("c")
    )
    assert df.first().c == expected


def test_profile_counts_distinct(spark):
    df = make_profiles(
        spark, [(0, 1, "a", "x"), (0, 1, "b", "y"), (1, 2, "a", "z")]
    )
    got = sorted((r.pid, r.source) for r in profile_counts(df).collect())
    assert got == [(0, 1), (1, 2)]
