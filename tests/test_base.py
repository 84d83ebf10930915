"""Unit tests for the dataset-builder plumbing."""
import pytest

from repro.common import CLEAN, DIRTY
from repro.data.base import Dataset, ProfileBuilder


def test_new_pid_increments():
    b = ProfileBuilder()
    assert [b.new_pid() for _ in range(3)] == [0, 1, 2]


def test_add_skips_empty_values():
    b = ProfileBuilder()
    b.add(0, 0, {"a": "x", "b": None, "c": ""})
    assert [(r[2], r[3]) for r in b.rows] == [("a", "x")]


def test_add_stringifies_values():
    b = ProfileBuilder()
    b.add(0, 0, {"n": 42})
    assert b.rows[0][3] == "42"


@pytest.mark.parametrize("size,expected", [(2, 1), (3, 3), (5, 10)])
def test_cluster_pairs_count(size, expected):
    b = ProfileBuilder()
    pids = [b.new_pid() for _ in range(size)]
    b.add_cluster_pairs(pids)
    assert len(b.matches) == expected
    assert all(i < j for i, j in b.matches)


def test_build_round_trip(spark):
    b = ProfileBuilder()
    p0, p1 = b.new_pid(), b.new_pid()
    b.add(p0, 1, {"a": "x"})
    b.add(p1, 2, {"a": "y"})
    b.matches.append((p0, p1))
    profiles, gt = b.build(spark)
    assert profiles.count() == 2 and gt.count() == 1
    assert set(profiles.columns) == {"pid", "source", "attr", "value"}


def test_dataset_of_counts_matches(spark):
    b = ProfileBuilder()
    pids = [b.new_pid() for _ in range(3)]
    for p in pids:
        b.add(p, 0, {"a": f"v{p}"})
    b.add_cluster_pairs(pids)
    profiles, gt = b.build(spark)
    ds = Dataset.of("t", DIRTY, profiles, gt)
    assert ds.n_matches == 3 and ds.er_type == DIRTY


def test_dataset_of_rejects_bad_er_type(spark):
    b = ProfileBuilder()
    b.add(b.new_pid(), 0, {"a": "v"})
    profiles, gt = b.build(spark)
    with pytest.raises(AssertionError):
        Dataset.of("t", "nope", profiles, gt)
