"""Bench F13: regenerate the time-efficiency experiment (initialization
time + per-comparison time under Jaccard and edit-distance matchers)."""
from benchmarks._jobs import load_job, once


def test_timing_eval(benchmark, spark):
    rows = once(benchmark, lambda: load_job("timing_eval").main(spark))
    assert all(r["comp_us_ed"] > 0 and r["comp_us_js"] > 0 for r in rows)
