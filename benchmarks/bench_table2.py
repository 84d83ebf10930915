"""Bench T2: regenerate Table 2 (dataset characteristics) at the default
experiment scales."""
from benchmarks._jobs import load_job, once


def test_table2_generation(benchmark, spark):
    rows = once(benchmark, lambda: load_job("table2_dataset_stats").main(spark))
    assert len(rows) == 7
