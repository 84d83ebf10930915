"""Bench F11/F12: regenerate the heterogeneous-dataset evaluation (six
schema-agnostic methods at the documented scales, w_max=200)."""
from benchmarks._jobs import load_job, once


def test_hetero_eval(benchmark, spark):
    rows = once(benchmark, lambda: load_job("hetero_eval").main(spark))
    datasets = {r["dataset"] for r in rows if "dataset" in r}
    assert datasets == {"movies", "dbpedia", "freebase"}
