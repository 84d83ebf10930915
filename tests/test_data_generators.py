"""Tests for the synthetic dataset analogues: Table 2 characteristics,
determinism, structural invariants."""
import pytest
from pyspark.sql import functions as F

from repro.common import CLEAN, DIRTY
from repro.data import heterogeneous as het
from repro.data import structured as struct
from repro.data.datasets import (
    BENCH_SCALES,
    HETEROGENEOUS,
    PAPER_TABLE2,
    STRUCTURED,
    dataset_stats,
    load,
    schema_key_fn,
)


# ------------------------------------------------ structured (paper scale)

def test_census_table2_characteristics(census_ds):
    s = dataset_stats(census_ds)
    assert s["n_profiles"] == 841
    assert s["n_matches"] == 344
    assert s["n_attrs"] == 5
    assert 4.2 <= s["avg_nv_pairs"] <= 5.0  # paper: 4.65


def test_restaurant_table2_characteristics(restaurant_ds):
    s = dataset_stats(restaurant_ds)
    assert s["n_profiles"] == 864
    assert s["n_matches"] == 112
    assert s["n_attrs"] == 5
    assert 4.5 <= s["avg_nv_pairs"] <= 5.0  # paper: 5.00


def test_cora_table2_characteristics(spark):
    ds = struct.cora_like(spark)
    s = dataset_stats(ds)
    assert s["n_profiles"] == 1295
    assert s["n_matches"] == 17_184  # paper: 17k
    assert s["n_attrs"] == 12
    assert 4.8 <= s["avg_nv_pairs"] <= 6.2  # paper: 5.53


@pytest.mark.slow
def test_cddb_table2_characteristics(spark):
    ds = struct.cddb_like(spark)
    s = dataset_stats(ds)
    assert s["n_profiles"] == 9763
    assert s["n_matches"] == 300
    assert s["n_attrs"] == 106  # 7 core + track00..track98
    assert 16.0 <= s["avg_nv_pairs"] <= 21.5  # paper: 18.75


def test_dirty_gt_pairs_are_canonical(census_ds):
    rows = census_ds.ground_truth.collect()
    assert all(r.i < r.j for r in rows)
    pids = {r.pid for r in census_ds.profiles.select("pid").distinct().collect()}
    assert all(r.i in pids and r.j in pids for r in rows)


def test_structured_sources_are_zero(census_ds):
    assert census_ds.er_type == DIRTY
    srcs = {r.source for r in census_ds.profiles.select("source").distinct().collect()}
    assert srcs == {0}


def test_generators_deterministic(spark):
    a = struct.restaurant_like(spark, seed=1)
    b = struct.restaurant_like(spark, seed=1)
    assert sorted(map(tuple, a.profiles.collect())) == sorted(
        map(tuple, b.profiles.collect())
    )
    assert sorted(map(tuple, a.ground_truth.collect())) == sorted(
        map(tuple, b.ground_truth.collect())
    )


def test_generator_seed_changes_data(spark):
    a = struct.restaurant_like(spark, seed=1)
    b = struct.restaurant_like(spark, seed=99)
    assert sorted(map(tuple, a.profiles.collect())) != sorted(
        map(tuple, b.profiles.collect())
    )


# ------------------------------------------- heterogeneous (scaled counts)

def test_movies_scaled_counts(movies_tiny):
    s = dataset_stats(movies_tiny)
    n1, n2 = (int(x) for x in s["profiles"].split("—"))
    assert n1 == int(round(27_615 * 0.02))
    assert n2 == int(round(23_182 * 0.02))
    assert s["n_matches"] == int(round(22_863 * 0.02))
    assert movies_tiny.er_type == CLEAN


def test_movies_schema_asymmetry(movies_tiny):
    per_src = {
        r.source: r.n
        for r in movies_tiny.profiles.groupBy("source")
        .agg(F.countDistinct("attr").alias("n"))
        .collect()
    }
    assert per_src[1] == 4 and per_src[2] == 7  # paper: 4—7


def test_freebase_scaled_counts(freebase_tiny):
    s = dataset_stats(freebase_tiny)
    n1, n2 = (int(x) for x in s["profiles"].split("—"))
    assert n1 == int(round(4_157_429 * 0.0002))
    assert n2 == int(round(3_712_075 * 0.0002))
    assert s["n_matches"] == int(round(1_497_546 * 0.0002))


def test_freebase_values_dominated_by_uris(freebase_tiny):
    n = freebase_tiny.profiles.count()
    n_uri = freebase_tiny.profiles.where(F.col("value").startswith("http://")).count()
    assert n_uri / n > 0.7


def test_clean_pids_disjoint_and_gt_cross_source(movies_tiny):
    p = movies_tiny.profiles
    s1 = {r.pid for r in p.where("source = 1").select("pid").distinct().collect()}
    s2 = {r.pid for r in p.where("source = 2").select("pid").distinct().collect()}
    assert not (s1 & s2)
    gts = movies_tiny.ground_truth.collect()
    assert all(r.i in s1 and r.j in s2 for r in gts)


def test_dbpedia_snapshot_overlap_near_25_percent(spark):
    ds = het.dbpedia_like(spark, scale=0.0003)
    p = ds.profiles.withColumn("nv", F.concat_ws("=", "attr", "value"))
    left = p.where("source = 1").select(F.col("pid").alias("i"), "nv")
    right = p.where("source = 2").select(F.col("pid").alias("j"), "nv")
    gt = ds.ground_truth
    shared = gt.join(left, "i").join(right, ["j", "nv"]).groupBy("i", "j").count()
    tot_l = left.join(gt, "i").groupBy("i").count().agg(F.avg("count")).first()[0]
    avg_shared = (
        shared.agg(F.sum("count")).first()[0] or 0
    ) / max(gt.count(), 1)
    # expected ≈ 2.7 shared facts (7·7/18) of a ~12-pair union ≈ 25%
    assert 1.5 <= avg_shared <= 5.0
    assert tot_l >= 6


@pytest.mark.parametrize("name", STRUCTURED)
def test_registry_loads_structured(spark, name):
    # census/restaurant load fast; cora/cddb covered above — use tiny call
    if name in ("cora", "cddb"):
        pytest.skip("covered by dedicated characteristic tests")
    ds = load(name, spark)
    assert ds.name == name and ds.n_matches == PAPER_TABLE2[name][2]


def test_registry_rejects_unknown(spark):
    with pytest.raises(KeyError):
        load("nope", spark)


@pytest.mark.parametrize("name", STRUCTURED)
def test_schema_keys_exist_for_structured(name):
    assert callable(schema_key_fn(name))


@pytest.mark.parametrize("name", HETEROGENEOUS)
def test_bench_scales_defined(name):
    assert 0 < BENCH_SCALES[name] <= 1


def test_schema_key_one_row_per_profile(census_ds):
    keys = schema_key_fn("census")(census_ds.profiles)
    assert keys.count() == 841
    assert keys.select("pid").distinct().count() == 841
    assert keys.where(F.col("key").isNull()).count() == 0


def test_census_key_uses_soundex_shape(census_ds):
    [r] = schema_key_fn("census")(census_ds.profiles).limit(1).collect()
    # Soundex: letter + 3 digits, then initial + zip digits
    assert r.key[0].isalpha() and r.key[1:4].isdigit()
