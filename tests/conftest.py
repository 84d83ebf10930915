"""Shared fixtures: micro examples with hand-computable expectations, plus
lazily-built synthetic datasets reused across test modules."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.data.base import PROFILE_SCHEMA


def make_profiles(spark, rows):
    """rows = [(pid, source, attr, value), ...] → profiles DataFrame."""
    return spark.createDataFrame(
        pd.DataFrame(rows, columns=["pid", "source", "attr", "value"]), PROFILE_SCHEMA
    )


@pytest.fixture(scope="session")
def micro_dirty(spark):
    """4 dirty profiles with fully hand-computable blocking/graph numbers.

    Tokens: alpha{0,1}, beta{0,1,2}, gamma{2}, delta{3}.
    Valid blocks (≥2 profiles): alpha (‖b‖=1), beta (‖b‖=3).
    ARCS: (0,1)=1+1/3=4/3, (0,2)=(1,2)=1/3.
    """
    return make_profiles(
        spark,
        [
            (0, 0, "a", "alpha beta"),
            (1, 0, "a", "alpha beta"),
            (2, 0, "a", "beta gamma"),
            (3, 0, "a", "delta"),
        ],
    )


@pytest.fixture(scope="session")
def micro_clean(spark):
    """2+2 clean-clean profiles; only cross-source pairs are valid.

    Tokens: alpha{0,1,2}, beta{0,3}, gamma{1}, delta{2,3}.
    """
    return make_profiles(
        spark,
        [
            (0, 1, "a", "alpha beta"),
            (1, 1, "a", "alpha gamma"),
            (2, 2, "a", "alpha delta"),
            (3, 2, "a", "beta delta"),
        ],
    )


@pytest.fixture(scope="session")
def chain_profiles(spark):
    """3 profiles with unique single tokens aa < ab < ac — the Neighbor
    List order is fully determined, so emission orders are exact."""
    return make_profiles(
        spark, [(0, 0, "a", "aa"), (1, 0, "a", "ab"), (2, 0, "a", "ac")]
    )


@pytest.fixture(scope="session")
def restaurant_ds(spark):
    from repro.data.structured import restaurant_like

    return restaurant_like(spark)


@pytest.fixture(scope="session")
def census_ds(spark):
    from repro.data.structured import census_like

    return census_like(spark)


@pytest.fixture(scope="session")
def movies_tiny(spark):
    from repro.data.heterogeneous import movies_like

    return movies_like(spark, scale=0.02)


@pytest.fixture(scope="session")
def freebase_tiny(spark):
    from repro.data.heterogeneous import freebase_like

    return freebase_like(spark, scale=0.0002)
