"""Parameter-behaviour tests for the methods: weighting schemes, salts,
token length, purge/filter ratios."""
import pytest

from repro.common import DIRTY
from repro.methods import gs_psn, pbs, pps, sa_psn
from tests.conftest import make_profiles


def stream(df):
    return [(r.i, r.j) for r in df.orderBy("emission_idx").collect()]


def test_pbs_cbs_scheme_runs(spark, micro_dirty):
    s = stream(
        pbs(micro_dirty, DIRTY, n_max=None, scheme="cbs", purge_ratio=1.0, filter_ratio=1.0)
    )
    # CBS: (0,1) shares 2 blocks, others 1 → first emission unchanged
    assert s[0] == (0, 1) and len(s) == 3


def test_pps_cbs_scheme_runs(spark, micro_dirty):
    s = stream(
        pps(micro_dirty, DIRTY, n_max=None, scheme="cbs", purge_ratio=1.0, filter_ratio=1.0)
    )
    assert s[0] == (0, 1)


def test_pbs_unknown_scheme_raises(spark, micro_dirty):
    with pytest.raises(ValueError):
        pbs(micro_dirty, DIRTY, n_max=3, scheme="bogus").collect()


def test_sa_psn_salt_changes_coincidental_order(spark):
    rows = [(p, 0, "a", "same other%d" % p) for p in range(20)]
    profiles = make_profiles(spark, rows)
    s0 = stream(sa_psn(profiles, DIRTY, n_max=30, salt=0))
    s1 = stream(sa_psn(profiles, DIRTY, n_max=30, salt=1))
    assert s0 != s1


def test_sa_psn_same_salt_reproducible(spark):
    rows = [(p, 0, "a", "same other%d" % p) for p in range(20)]
    profiles = make_profiles(spark, rows)
    assert stream(sa_psn(profiles, DIRTY, n_max=30, salt=5)) == stream(
        sa_psn(profiles, DIRTY, n_max=30, salt=5)
    )


def test_min_len_excludes_short_tokens_from_blocking(spark):
    profiles = make_profiles(
        spark, [(0, 0, "a", "zz hello"), (1, 0, "a", "zz hello")]
    )
    with_short = stream(
        pbs(profiles, DIRTY, n_max=None, min_len=2, purge_ratio=1.0, filter_ratio=1.0)
    )
    without_short = stream(
        pbs(profiles, DIRTY, n_max=None, min_len=3, purge_ratio=1.0, filter_ratio=1.0)
    )
    assert with_short == without_short == [(0, 1)]  # same pair either way
    # but the shared-block count differs under CBS weighting
    from repro.blocking import token_blocking_workflow
    from repro.tokenize import tokenize_profiles

    c2 = token_blocking_workflow(
        tokenize_profiles(profiles, min_len=2), DIRTY, 2, purge_ratio=1.0, filter_ratio=1.0
    )
    c3 = token_blocking_workflow(
        tokenize_profiles(profiles, min_len=3), DIRTY, 2, purge_ratio=1.0, filter_ratio=1.0
    )
    assert c2.stats.count() == 2 and c3.stats.count() == 1


def test_purge_ratio_zero_drops_everything(spark, micro_dirty):
    out = pbs(micro_dirty, DIRTY, n_max=None, purge_ratio=0.0, filter_ratio=1.0)
    assert out.count() == 0


def test_gs_psn_w_max_one_equals_window_one(spark, micro_dirty):
    s = stream(gs_psn(micro_dirty, DIRTY, n_max=None, w_max=1))
    assert all(i < j for i, j in s) and len(set(s)) == len(s)
