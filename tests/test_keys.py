"""Unit tests for the schema-based blocking keys (PSN substrate)."""
import pytest
from pyspark.sql import functions as F

from repro.keys import SCHEMA_KEYS, cddb_key, cora_key, restaurant_key
from tests.conftest import make_profiles


def test_registry_covers_structured_datasets():
    assert set(SCHEMA_KEYS) == {"census", "restaurant", "cora", "cddb"}


def test_restaurant_key_shape(spark):
    df = make_profiles(
        spark,
        [(0, 0, "name", "Great Kitchen"), (0, 0, "city", "Springfield")],
    )
    [r] = restaurant_key(df).collect()
    assert r.key == "greaspr"


def test_cora_key_uses_last_author_token_and_year(spark):
    df = make_profiles(
        spark, [(0, 0, "author", "maria baker"), (0, 0, "year", "1999")]
    )
    [r] = cora_key(df).collect()
    assert r.key.endswith("1999")
    # Soundex of "baker": B260
    assert r.key.startswith("B260")


def test_cddb_key_prefixes(spark):
    df = make_profiles(
        spark, [(0, 0, "artist", "Longartist"), (0, 0, "dtitle", "Longtitle")]
    )
    [r] = cddb_key(df).collect()
    assert r.key == "longalongt"


def test_missing_attributes_yield_partial_key(spark):
    df = make_profiles(spark, [(0, 0, "city", "springfield")])
    [r] = restaurant_key(df).collect()
    assert r.key == "spr"  # name absent → empty name part, never null


def test_key_fn_one_row_even_with_repeated_attrs(spark):
    df = make_profiles(
        spark,
        [(0, 0, "name", "bb"), (0, 0, "name", "aa"), (1, 0, "name", "cc")],
    )
    rows = restaurant_key(df).collect()
    assert len(rows) == 2  # min(value) per profile resolves duplicates
