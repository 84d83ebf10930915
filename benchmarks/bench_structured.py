"""Bench F9/F10: regenerate the structured-dataset evaluation (all seven
methods, recall checkpoints + AUC*, mean AUC* table)."""
from benchmarks._jobs import load_job, once


def test_structured_eval(benchmark, spark):
    rows = once(benchmark, lambda: load_job("structured_eval").main(spark))
    methods = {r["method"] for r in rows if "dataset" in r}
    assert {"PSN", "SA-PSN", "SA-PSAB", "LS-PSN", "GS-PSN", "PBS", "PPS"} <= methods
