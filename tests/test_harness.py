"""Tests for the evaluation harness and timing harness."""
import numpy as np
import pytest

from repro.eval.harness import (
    MethodResult,
    evaluate_dataset,
    format_table,
    mean_auc_star,
    resolve_method,
    run_method,
)
from repro.eval.timing import time_method
from repro.keys import restaurant_key


@pytest.fixture(scope="module")
def rest_gs(restaurant_ds):
    return run_method(restaurant_ds, "GS-PSN", ec_max=10.0, w_max=20)


def test_run_method_populates_checkpoints(rest_gs):
    assert set(rest_gs.recall) == {1.0, 2.0, 5.0, 10.0}
    assert set(rest_gs.auc_star) == {1.0, 5.0, 10.0}


def test_recall_monotone_in_budget(rest_gs):
    vals = [rest_gs.recall[k] for k in sorted(rest_gs.recall)]
    assert all(a <= b for a, b in zip(vals, vals[1:]))
    assert all(0 <= v <= 1 for v in vals)


def test_auc_star_bounded(rest_gs):
    assert all(0 <= v <= 1 for v in rest_gs.auc_star.values())


def test_detections_sorted_unique(rest_gs):
    d = rest_gs.detections
    assert (np.diff(d) > 0).all()


def test_run_method_psn_needs_key_fn(restaurant_ds):
    r = run_method(restaurant_ds, "PSN", ec_max=2.0, key_fn=restaurant_key)
    assert 0 <= r.recall[2.0] <= 1


def test_resolve_method_unknown():
    with pytest.raises(KeyError):
        resolve_method("FOO")


def test_evaluate_dataset_and_mean(restaurant_ds):
    results = evaluate_dataset(
        restaurant_ds,
        ["GS-PSN", "SA-PSN"],
        ec_max=5.0,
        method_params={"GS-PSN": {"w_max": 10}},
    )
    mean = mean_auc_star(results, auc_checkpoints=(1.0, 5.0))
    assert set(mean) == {"GS-PSN", "SA-PSN"}
    assert mean["GS-PSN"][5.0] > mean["SA-PSN"][5.0]  # advanced beats naïve


def test_row_shapes(rest_gs):
    row = rest_gs.row()
    assert row["method"] == "GS-PSN" and row["dataset"] == "restaurant"
    assert "AUC*@10" in row and "recall@1" in row


def test_format_table_markdown():
    rows = [{"a": 1, "b": "x"}, {"a": 2, "b": "y"}]
    table = format_table(rows)
    assert table.splitlines()[0] == "| a | b |"
    assert "| 2 | y |" in table
    assert format_table([]) == "(no rows)"


def test_timing_harness(restaurant_ds):
    t = time_method(restaurant_ds, "PBS", ec_pairs=2.0)
    assert t.init_s > 0
    assert set(t.comparison_us) == {"js", "ed"}
    assert all(v > 0 for v in t.comparison_us.values())
    assert t.n_pairs > 0
    row = t.row()
    assert row["method"] == "PBS" and "comp_us_ed" in row
