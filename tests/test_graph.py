"""Unit tests for the Blocking Graph (edge weighting, LeCoBI, duplication
likelihood) against hand-computed values on the micro example."""
import math

import pytest

from repro.blocking import token_blocking_workflow
from repro.common import CLEAN, DIRTY
from repro.graph import (
    cooccurrence_pairs,
    duplication_likelihood,
    edge_weights,
    edge_weights_with_lecobi,
    top_edge_per_profile,
)
from repro.tokenize import tokenize_profiles


@pytest.fixture(scope="module")
def micro_collection(spark, micro_dirty):
    tokens = tokenize_profiles(micro_dirty)
    return token_blocking_workflow(
        tokens, DIRTY, 4, purge_ratio=1.0, filter_ratio=1.0
    )


def test_cooccurrence_pairs_one_row_per_shared_block(spark, micro_collection):
    rows = sorted((r.token, r.i, r.j) for r in cooccurrence_pairs(micro_collection).collect())
    assert rows == [
        ("alpha", 0, 1),
        ("beta", 0, 1),
        ("beta", 0, 2),
        ("beta", 1, 2),
    ]


def test_arcs_weights_hand_computed(spark, micro_collection):
    w = {(r.i, r.j): r.weight for r in edge_weights(micro_collection, scheme="arcs").collect()}
    assert w[(0, 1)] == pytest.approx(1 + 1 / 3)
    assert w[(0, 2)] == pytest.approx(1 / 3)
    assert w[(1, 2)] == pytest.approx(1 / 3)


def test_cbs_weights_count_shared_blocks(spark, micro_collection):
    w = {(r.i, r.j): r.weight for r in edge_weights(micro_collection, scheme="cbs").collect()}
    assert w == {(0, 1): 2.0, (0, 2): 1.0, (1, 2): 1.0}


def test_unknown_scheme_raises(spark, micro_collection):
    with pytest.raises(ValueError):
        edge_weights(micro_collection, scheme="nope").collect()


def test_lecobi_is_min_shared_block_id(spark, micro_collection):
    # Block Scheduling: alpha (‖b‖=1) → id 1, beta (‖b‖=3) → id 2.
    e = {(r.i, r.j): r.lecobi for r in edge_weights_with_lecobi(micro_collection).collect()}
    assert e == {(0, 1): 1, (0, 2): 2, (1, 2): 2}


def test_duplication_likelihood_is_mean_incident_weight(spark, micro_collection):
    edges = edge_weights(micro_collection)
    d = {r.pid: (r.dup_likelihood, r.degree) for r in duplication_likelihood(edges).collect()}
    assert d[0][0] == pytest.approx((4 / 3 + 1 / 3) / 2) and d[0][1] == 2
    assert d[1][0] == pytest.approx((4 / 3 + 1 / 3) / 2)
    assert d[2][0] == pytest.approx(1 / 3) and d[2][1] == 2
    assert 3 not in d  # isolated profile has no graph node neighbourhood


def test_top_edge_per_profile(spark, micro_collection):
    edges = edge_weights(micro_collection)
    top = {r.pid: (r.i, r.j, r.weight) for r in top_edge_per_profile(edges).collect()}
    assert top[0][:2] == (0, 1)
    assert top[1][:2] == (0, 1)
    assert top[2][:2] == (0, 2)  # tie 1/3–1/3 broken toward smaller neighbour


def test_clean_graph_has_only_cross_source_edges(spark, micro_clean):
    coll = token_blocking_workflow(
        tokenize_profiles(micro_clean), CLEAN, 4, purge_ratio=1.0, filter_ratio=1.0
    )
    pairs = {(r.i, r.j) for r in edge_weights(coll).collect()}
    # sources: {0,1} vs {2,3} — intra-source pairs must be absent
    assert pairs and all(i in (0, 1) and j in (2, 3) for i, j in pairs)


def test_clean_arcs_hand_computed(spark, micro_clean):
    # alpha{0,1|2} ‖b‖=2, beta{0|3} ‖b‖=1, delta{|2,3} invalid (one source)
    coll = token_blocking_workflow(
        tokenize_profiles(micro_clean), CLEAN, 4, purge_ratio=1.0, filter_ratio=1.0
    )
    w = {(r.i, r.j): r.weight for r in edge_weights(coll).collect()}
    assert w[(0, 2)] == pytest.approx(0.5)
    assert w[(1, 2)] == pytest.approx(0.5)
    assert w[(0, 3)] == pytest.approx(1.0)


def test_edges_are_canonical_pairs(spark, micro_collection):
    rows = edge_weights(micro_collection).collect()
    assert all(r.i < r.j for r in rows)
