"""Exact emission-order tests for all seven methods on hand-computable
micro examples (the repo's analogue of the paper's Figures 4, 6, 7, 8)."""
import pytest
from pyspark.sql import functions as F

from repro.common import CLEAN, DIRTY, profile_counts
from repro.methods import gs_psn, ls_psn, pbs, pps, psn, sa_psab, sa_psn
from tests.conftest import make_profiles


def stream(df):
    return [(r.i, r.j) for r in df.orderBy("emission_idx").collect()]


# --------------------------------------------------------------- similarity

def test_sa_psn_window_major_position_minor(spark, chain_profiles):
    # NL is aa(p0) ab(p1) ac(p2): w=1 from the top, then w=2 — Fig. 4b.
    assert stream(sa_psn(chain_profiles, DIRTY, n_max=None)) == [
        (0, 1), (1, 2), (0, 2),
    ]


def test_sa_psn_emits_repeats(spark):
    profiles = make_profiles(
        spark, [(0, 0, "a", "ka kb"), (1, 0, "a", "ka kb")]
    )
    s = stream(sa_psn(profiles, DIRTY, n_max=None))
    assert s.count((0, 1)) >= 2  # naïve: same pair in both equal-key runs


def test_sa_psn_cap(spark, chain_profiles):
    assert stream(sa_psn(chain_profiles, DIRTY, n_max=2)) == [(0, 1), (1, 2)]


def test_ls_psn_orders_by_weight_within_window(spark):
    # Window 1: (0,1) co-occurs twice (RCF 1.0), (1,2) once (RCF 1/3);
    # higher weight must be emitted first regardless of position.
    profiles = make_profiles(
        spark,
        [(0, 0, "a", "ka kb"), (1, 0, "a", "ka kb"), (2, 0, "a", "kc")],
    )
    s = stream(ls_psn(profiles, DIRTY, n_max=None))
    assert s.index((0, 1)) < s.index((1, 2))


def test_ls_psn_window_major(spark, chain_profiles):
    assert stream(ls_psn(chain_profiles, DIRTY, n_max=None)) == [
        (0, 1), (1, 2), (0, 2),
    ]


def test_gs_psn_no_repeats_global_order(spark, chain_profiles):
    s = stream(gs_psn(chain_profiles, DIRTY, n_max=None, w_max=2))
    assert sorted(s) == [(0, 1), (0, 2), (1, 2)]
    assert len(set(s)) == len(s)


def test_gs_psn_respects_w_max(spark, chain_profiles):
    s = stream(gs_psn(chain_profiles, DIRTY, n_max=None, w_max=1))
    assert sorted(s) == [(0, 1), (1, 2)]  # (0,2) lies at distance 2


def test_gs_psn_weight_ranks_first(spark):
    profiles = make_profiles(
        spark,
        [(0, 0, "a", "ka kb"), (1, 0, "a", "ka kb"), (2, 0, "a", "kc")],
    )
    s = stream(gs_psn(profiles, DIRTY, n_max=None, w_max=3))
    assert s[0] == (0, 1)  # freq 2 beats every freq-1 pair


def test_psn_schema_key_order(spark):
    profiles = make_profiles(
        spark,
        [(0, 0, "k", "aa"), (1, 0, "k", "ab"), (2, 0, "k", "ac")],
    )

    def key_fn(p):
        return (
            p.where(F.col("attr") == "k")
            .groupBy("pid")
            .agg(F.min("value").alias("key"))
            .join(profile_counts(p), "pid")
            .select("key", "pid", "source")
        )

    assert stream(psn(profiles, DIRTY, n_max=None, key_fn=key_fn)) == [
        (0, 1), (1, 2), (0, 2),
    ]


def test_psn_one_placement_no_repeats(spark, census_ds):
    from repro.keys import census_key

    s = stream(psn(census_ds.profiles, DIRTY, n_max=500, key_fn=census_key))
    assert len(s) == 500 and len(set(s)) == 500


# ----------------------------------------------------------------- equality

def test_pbs_exact_order_micro(spark, micro_dirty):
    # Blocks: alpha id1 (‖b‖=1), beta id2 (‖b‖=3). LeCoBI assigns (0,1)
    # to alpha; inside beta the tie 1/3–1/3 breaks by pair id — Fig. 7.
    s = stream(pbs(micro_dirty, DIRTY, n_max=None, purge_ratio=1.0, filter_ratio=1.0))
    assert s == [(0, 1), (0, 2), (1, 2)]


def test_pbs_no_repeats(spark, micro_dirty):
    s = stream(pbs(micro_dirty, DIRTY, n_max=None, purge_ratio=1.0, filter_ratio=1.0))
    assert len(set(s)) == len(s)


def test_pps_exact_order_micro(spark, micro_dirty):
    # Phase 0: dedup'd per-node top edges {(0,1) w=4/3, (0,2) w=1/3} by
    # weight; phase 1 visits profiles by duplication likelihood
    # (p0, p1, p2): p0 → (0,1), (0,2); p1 → (1,2); p2 → nothing (all
    # neighbours already checked) — Fig. 8 semantics.
    s = stream(pps(micro_dirty, DIRTY, n_max=None, purge_ratio=1.0, filter_ratio=1.0))
    assert s == [(0, 1), (0, 2), (0, 1), (0, 2), (1, 2)]


def test_pps_k_max_limits_per_profile(spark, micro_dirty):
    s = stream(
        pps(micro_dirty, DIRTY, n_max=None, k_max=1, purge_ratio=1.0, filter_ratio=1.0)
    )
    # phase 1 keeps only the top comparison per profile: (0,1) for p0,
    # (1,2) for p1.
    assert s == [(0, 1), (0, 2), (0, 1), (1, 2)]


def test_sa_psab_leaves_first_with_repeats(spark):
    profiles = make_profiles(
        spark, [(0, 0, "a", "coin"), (1, 0, "a", "join"), (2, 0, "a", "coin")]
    )
    s = stream(sa_psab(profiles, DIRTY, n_max=None, l_min=2))
    # deepest node "coin" (len 4) first, then "oin", then root "in".
    assert s == [
        (0, 2),
        (0, 1), (0, 2), (1, 2),
        (0, 1), (0, 2), (1, 2),
    ]


def test_sa_psab_cap_skips_unreached_nodes(spark):
    profiles = make_profiles(
        spark, [(0, 0, "a", "coin"), (1, 0, "a", "join"), (2, 0, "a", "coin")]
    )
    s = stream(sa_psab(profiles, DIRTY, n_max=2, l_min=2))
    assert s == [(0, 2), (0, 1)]


# --------------------------------------------------------- clean-clean mode

@pytest.mark.parametrize(
    "method,params",
    [
        (sa_psn, {}),
        (ls_psn, {}),
        (gs_psn, {"w_max": 5}),
        (sa_psab, {"l_min": 2}),
        (pbs, {"purge_ratio": 1.0, "filter_ratio": 1.0}),
        (pps, {"purge_ratio": 1.0, "filter_ratio": 1.0}),
    ],
)
def test_clean_clean_only_cross_source_pairs(spark, micro_clean, method, params):
    s = stream(method(micro_clean, CLEAN, n_max=None, **params))
    assert s, f"{method.__name__} emitted nothing"
    assert all(i in (0, 1) and j in (2, 3) for i, j in s)


@pytest.mark.parametrize(
    "method,params",
    [
        (sa_psn, {}),
        (ls_psn, {}),
        (gs_psn, {"w_max": 5}),
        (sa_psab, {"l_min": 2}),
        (pbs, {"purge_ratio": 1.0, "filter_ratio": 1.0}),
        (pps, {"purge_ratio": 1.0, "filter_ratio": 1.0}),
    ],
)
def test_dirty_pairs_canonical(spark, micro_dirty, method, params):
    s = stream(method(micro_dirty, DIRTY, n_max=None, **params))
    assert s and all(i < j for i, j in s)
