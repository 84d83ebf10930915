"""Unit tests for the emission-index ranker."""
import pandas as pd
from pyspark.sql import functions as F

from repro.rank import assign_emission_idx


def cand(spark):
    pdf = pd.DataFrame(
        {"w": [2, 1, 1, 3], "i": [0, 0, 1, 0], "j": [2, 1, 2, 3]}
    )
    return spark.createDataFrame(pdf, "w long, i long, j long")


def order_keys():
    return [F.col("w").asc(), F.col("i").asc(), F.col("j").asc()]


def test_orders_and_numbers_from_one(spark):
    out = assign_emission_idx(cand(spark), order_keys(), n_max=None).collect()
    got = [(r.emission_idx, r.i, r.j) for r in sorted(out, key=lambda r: r.emission_idx)]
    assert got == [(1, 0, 1), (2, 1, 2), (3, 0, 2), (4, 0, 3)]


def test_cap_truncates(spark):
    out = assign_emission_idx(cand(spark), order_keys(), n_max=2).collect()
    assert sorted((r.emission_idx, r.i, r.j) for r in out) == [(1, 0, 1), (2, 1, 2)]


def test_cap_larger_than_data_is_fine(spark):
    out = assign_emission_idx(cand(spark), order_keys(), n_max=100).collect()
    assert len(out) == 4


def test_deterministic(spark):
    a = sorted(map(tuple, assign_emission_idx(cand(spark), order_keys(), n_max=None).collect()))
    b = sorted(map(tuple, assign_emission_idx(cand(spark), order_keys(), n_max=None).collect()))
    assert a == b


def test_only_emission_columns_returned(spark):
    out = assign_emission_idx(cand(spark), order_keys(), n_max=None)
    assert out.columns == ["emission_idx", "i", "j"]
