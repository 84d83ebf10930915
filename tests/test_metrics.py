"""Unit tests for recall progressiveness metrics (mostly Spark-free)."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.eval import metrics


def test_recall_at_counts_within_budget():
    det = np.array([1, 2, 10, 100])
    assert metrics.recall_at(det, 4, 1.0) == pytest.approx(0.5)  # budget 4
    assert metrics.recall_at(det, 4, 5.0) == pytest.approx(0.75)
    assert metrics.recall_at(det, 4, 25.0) == pytest.approx(1.0)


def test_ideal_auc_star_is_one():
    det = np.arange(1, 101)
    assert metrics.auc_star_at(det, 100, 1.0) == pytest.approx(1.0)
    assert metrics.auc_star_at(det, 100, 10.0) == pytest.approx(1.0)


def test_no_detections_auc_zero():
    det = np.array([], dtype=np.int64)
    assert metrics.auc_at(det, 10, 5.0) == 0.0
    assert metrics.recall_at(det, 10, 5.0) == 0.0


def test_auc_hand_computed():
    # 2 matches, detections at emissions 1 and 4 → x = 0.5, 2.0.
    # AUC@2 = (2-0.5)/2 + (2-2)/2 = 0.75
    det = np.array([1, 4])
    assert metrics.auc_at(det, 2, 2.0) == pytest.approx(0.75)
    # ideal: detections 1,2 → (2-0.5)/2 + (2-1)/2 = 1.25
    assert metrics.ideal_auc_at(2, 2.0) == pytest.approx(1.25)
    assert metrics.auc_star_at(det, 2, 2.0) == pytest.approx(0.75 / 1.25)


def test_earlier_detection_larger_auc():
    early = np.array([1, 2, 3])
    late = np.array([5, 6, 7])
    assert metrics.auc_at(early, 3, 5.0) > metrics.auc_at(late, 3, 5.0)


@given(
    st.lists(st.integers(min_value=1, max_value=10_000), min_size=1, max_size=50),
    st.floats(min_value=0.5, max_value=40.0),
)
@settings(deadline=None, max_examples=50)
def test_auc_star_bounded(dets, ec):
    det = np.sort(np.array(sorted(set(dets)), dtype=np.int64))
    n = max(len(det), 5)
    s = metrics.auc_star_at(det, n, ec)
    assert 0.0 <= s <= 1.0 + 1e-9


@given(st.integers(min_value=1, max_value=500))
@settings(deadline=None, max_examples=30)
def test_ideal_auc_monotone_in_budget(n):
    assert metrics.ideal_auc_at(n, 2.0) < metrics.ideal_auc_at(n, 3.0)


def test_detection_indices_take_first_emission(spark):
    em = spark.createDataFrame(
        pd.DataFrame(
            {"emission_idx": [1, 2, 3, 5], "i": [0, 0, 0, 1], "j": [1, 2, 1, 2]}
        ),
        "emission_idx long, i long, j long",
    )
    gt = spark.createDataFrame(pd.DataFrame({"i": [0, 1], "j": [1, 2]}), "i long, j long")
    det = metrics.detection_indices(em, gt)
    assert det.tolist() == [1, 5]  # repeat of (0,1) at idx 3 ignored


def test_detection_indices_ignores_non_matches(spark):
    em = spark.createDataFrame(
        pd.DataFrame({"emission_idx": [1, 2], "i": [0, 7], "j": [9, 8]}),
        "emission_idx long, i long, j long",
    )
    gt = spark.createDataFrame(pd.DataFrame({"i": [0], "j": [1]}), "i long, j long")
    assert metrics.detection_indices(em, gt).size == 0


def test_nonpositive_matches_raises():
    with pytest.raises(ValueError):
        metrics.auc_at(np.array([1]), 0, 1.0)
