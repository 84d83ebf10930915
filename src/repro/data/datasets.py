"""Dataset registry + measured characteristics (Table 2 reproduction).

``load(name, spark, scale=...)`` returns a `repro.data.base.Dataset`;
``dataset_stats`` measures the Table 2 columns on the generated data so
EXPERIMENTS.md can diff them against the published values.
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.common import CLEAN
from repro.data.base import Dataset
from repro.data.heterogeneous import dbpedia_like, freebase_like, movies_like
from repro.data.structured import cddb_like, census_like, cora_like, restaurant_like
from repro.keys import SCHEMA_KEYS

STRUCTURED = ("census", "restaurant", "cora", "cddb")
HETEROGENEOUS = ("movies", "dbpedia", "freebase")

# Default scales for the heterogeneous analogues: chosen so the full
# 6-method × 3-dataset harness completes on this 16-core container
# (DESIGN.md §5; full-size collections need the paper's 80 GB JVM).
BENCH_SCALES = {"movies": 0.3, "dbpedia": 0.003, "freebase": 0.001}

_GENERATORS: dict[str, Callable] = {
    "census": lambda spark, scale=None: census_like(spark),
    "restaurant": lambda spark, scale=None: restaurant_like(spark),
    "cora": lambda spark, scale=None: cora_like(spark),
    "cddb": lambda spark, scale=None: cddb_like(spark),
    "movies": lambda spark, scale=None: movies_like(
        spark, scale=scale if scale is not None else BENCH_SCALES["movies"]
    ),
    "dbpedia": lambda spark, scale=None: dbpedia_like(
        spark, scale=scale if scale is not None else BENCH_SCALES["dbpedia"]
    ),
    "freebase": lambda spark, scale=None: freebase_like(
        spark, scale=scale if scale is not None else BENCH_SCALES["freebase"]
    ),
}

# Published Table 2 rows: (|P| or |P1|—|P2|, #attributes, |D_P|, |p̄|).
PAPER_TABLE2 = {
    "census": ("841", 5, 344, 4.65),
    "restaurant": ("864", 5, 112, 5.00),
    "cora": ("1.3k", 12, 17_000, 5.53),
    "cddb": ("9.8k", 106, 300, 18.75),
    "movies": ("28k—23k", "4—7", 23_000, 7.11),
    "dbpedia": ("1.2M—2.2M", "30k—50k", 893_000, 15.47),
    "freebase": ("4.2M—3.7M", "37k—11k", 1_500_000, 24.54),
}


def load(name: str, spark: SparkSession, *, scale: float | None = None) -> Dataset:
    if name not in _GENERATORS:
        raise KeyError(f"unknown dataset {name!r}; choose from {sorted(_GENERATORS)}")
    return _GENERATORS[name](spark, scale)


def schema_key_fn(name: str):
    """The best schema-based blocking key for PSN (structured datasets only)."""
    return SCHEMA_KEYS[name]


def dataset_stats(ds: Dataset) -> dict:
    """Measured Table 2 columns for a generated dataset."""
    per_source = {
        int(r["source"]): int(r["n"])
        for r in ds.profiles.groupBy("source")
        .agg(F.countDistinct("pid").alias("n"))
        .collect()
    }
    n_profiles = sum(per_source.values())
    n_attrs = ds.profiles.select("attr").distinct().count()
    attrs_per_source = {
        int(r["source"]): int(r["n"])
        for r in ds.profiles.groupBy("source")
        .agg(F.countDistinct("attr").alias("n"))
        .collect()
    }
    nv_pairs = ds.profiles.count()
    return {
        "name": ds.name,
        "er_type": ds.er_type,
        "profiles": (
            f"{per_source.get(1, 0)}—{per_source.get(2, 0)}"
            if ds.er_type == CLEAN
            else str(n_profiles)
        ),
        "n_profiles": n_profiles,
        "n_attrs": n_attrs,
        "attrs": (
            f"{attrs_per_source.get(1, 0)}—{attrs_per_source.get(2, 0)}"
            if ds.er_type == CLEAN
            else str(n_attrs)
        ),
        "n_matches": ds.n_matches,
        "avg_nv_pairs": round(nv_pairs / n_profiles, 2),
    }
