"""Figure 13 reproduction: initialization time and mean per-comparison
time (cheap Jaccard vs expensive edit-distance match functions) for the
baseline and the advanced methods on movies and dbpedia analogues.

The paper omits SA-PSAB here (an order of magnitude slower) and freebase
(needs iterative matchers); so do we.

    spark-submit jobs/timing_eval.py
"""
from __future__ import annotations

from repro.data.datasets import load
from repro.eval.harness import format_table
from repro.eval.timing import time_method

METHODS = ("SA-PSN", "LS-PSN", "GS-PSN", "PBS", "PPS")
DATASETS = ("movies", "dbpedia")


def main(
    spark,
    *,
    names: tuple[str, ...] = DATASETS,
    methods: tuple[str, ...] = METHODS,
    ec_pairs: float = 5.0,
    w_max: int = 200,
    scale_overrides: dict | None = None,
) -> list[dict]:
    scale_overrides = scale_overrides or {}
    rows = []
    for name in names:
        ds = load(name, spark, scale=scale_overrides.get(name))
        for m in methods:
            params = {"w_max": w_max} if m == "GS-PSN" else {}
            rows.append(time_method(ds, m, ec_pairs=ec_pairs, **params).row())
        ds.profiles.unpersist()
        ds.ground_truth.unpersist()
    print(format_table(rows))
    return rows


if __name__ == "__main__":
    from _common import run_cli

    run_cli("timing_eval", main)
