"""Bench F1: regenerate Figure 1 (PSN baseline progressiveness, structured)."""
from benchmarks._jobs import load_job, once


def test_fig1_psn_baseline(benchmark, spark):
    rows = once(benchmark, lambda: load_job("fig1_psn_baseline").main(spark))
    assert {r["dataset"] for r in rows} == {"census", "restaurant", "cora", "cddb"}
