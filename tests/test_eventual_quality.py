"""Same-Eventual-Quality checks (§3.1): the uncapped emission stream of
each method must cover exactly its method-specific candidate space —
batch and progressive processing yield identical end results."""
import pytest
from pyspark.sql import functions as F

from repro.blocking import token_blocking_workflow
from repro.common import DIRTY
from repro.graph import edge_weights
from repro.methods import gs_psn, ls_psn, pbs, pps, sa_psab, sa_psn
from repro.neighbor import neighbor_list, window_pairs
from repro.tokenize import tokenize_profiles
from tests.conftest import make_profiles


@pytest.fixture(scope="module")
def mini(spark):
    """8 dirty profiles with overlapping vocabulary."""
    rows = [
        (0, 0, "a", "red apple pie"),
        (1, 0, "a", "red apple tart"),
        (2, 0, "a", "green apple pie"),
        (3, 0, "a", "blue berry tart"),
        (4, 0, "a", "blue berry pie"),
        (5, 0, "a", "plain bread"),
        (6, 0, "a", "plain toast"),
        (7, 0, "a", "unrelated zebra"),
    ]
    return make_profiles(spark, rows)


def distinct_pairs(df):
    return {(r.i, r.j) for r in df.select("i", "j").distinct().collect()}


def all_valid_pairs(n):
    return {(i, j) for i in range(n) for j in range(i + 1, n)}


def test_sa_psn_eventually_covers_all_pairs(spark, mini):
    got = distinct_pairs(sa_psn(mini, DIRTY, n_max=None))
    assert got == all_valid_pairs(8)


def test_ls_psn_eventually_covers_all_pairs(spark, mini):
    got = distinct_pairs(ls_psn(mini, DIRTY, n_max=None))
    assert got == all_valid_pairs(8)


def test_gs_psn_covers_exactly_w_max_range(spark, mini):
    tokens = tokenize_profiles(mini).withColumnRenamed("token", "key")
    nl = neighbor_list(tokens, salt=0)
    expected = distinct_pairs(window_pairs(nl, range(1, 6), DIRTY))
    got = distinct_pairs(gs_psn(mini, DIRTY, n_max=None, w_max=5, salt=0))
    assert got == expected


def test_pbs_covers_exactly_cooccurring_pairs(spark, mini):
    coll = token_blocking_workflow(
        tokenize_profiles(mini), DIRTY, 8, purge_ratio=1.0, filter_ratio=1.0
    )
    expected = distinct_pairs(edge_weights(coll))
    got = distinct_pairs(pbs(mini, DIRTY, n_max=None, purge_ratio=1.0, filter_ratio=1.0))
    assert got == expected


def test_pps_with_large_k_covers_all_edges(spark, mini):
    coll = token_blocking_workflow(
        tokenize_profiles(mini), DIRTY, 8, purge_ratio=1.0, filter_ratio=1.0
    )
    expected = distinct_pairs(edge_weights(coll))
    got = distinct_pairs(
        pps(mini, DIRTY, n_max=None, k_max=100, purge_ratio=1.0, filter_ratio=1.0)
    )
    assert got == expected


def test_sa_psab_covers_at_least_token_blocks(spark, mini):
    # every pair sharing a full token shares that token's suffix blocks
    coll = token_blocking_workflow(
        tokenize_profiles(mini), DIRTY, 8, purge_ratio=1.0, filter_ratio=1.0
    )
    expected = distinct_pairs(edge_weights(coll))
    got = distinct_pairs(sa_psab(mini, DIRTY, n_max=None, l_min=3))
    assert expected <= got


@pytest.mark.parametrize("n_max", [1, 5, 17])
def test_cap_is_prefix_of_uncapped_stream(spark, mini, n_max):
    full = [(r.i, r.j) for r in pbs(
        mini, DIRTY, n_max=None, purge_ratio=1.0, filter_ratio=1.0
    ).orderBy("emission_idx").collect()]
    capped = [(r.i, r.j) for r in pbs(
        mini, DIRTY, n_max=n_max, purge_ratio=1.0, filter_ratio=1.0
    ).orderBy("emission_idx").collect()]
    assert capped == full[:n_max]


@pytest.mark.parametrize("method,params", [
    (sa_psn, {}),
    (ls_psn, {}),
    (gs_psn, {"w_max": 4}),
    (sa_psab, {"l_min": 3}),
    (pbs, {"purge_ratio": 1.0, "filter_ratio": 1.0}),
    (pps, {"purge_ratio": 1.0, "filter_ratio": 1.0}),
])
def test_emission_indices_consecutive(spark, mini, method, params):
    rows = method(mini, DIRTY, n_max=20, **params).orderBy("emission_idx").collect()
    assert [r.emission_idx for r in rows] == list(range(1, len(rows) + 1))
