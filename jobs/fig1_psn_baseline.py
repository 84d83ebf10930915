"""Figure 1 reproduction: recall progressiveness of schema-based PSN over
the four structured datasets — the motivation plot showing PSN stays far
from the ideal method.

    spark-submit jobs/fig1_psn_baseline.py
"""
from __future__ import annotations

from repro.data.datasets import STRUCTURED, load, schema_key_fn
from repro.eval.harness import format_table, run_method


def main(spark, *, names: tuple[str, ...] = STRUCTURED, ec_max: float = 30.0) -> list[dict]:
    rows = []
    for name in names:
        ds = load(name, spark)
        res = run_method(ds, "PSN", ec_max=ec_max, key_fn=schema_key_fn(name))
        rows.append(res.row())
        ds.profiles.unpersist()
        ds.ground_truth.unpersist()
    print(format_table(rows))
    return rows


if __name__ == "__main__":
    from _common import run_cli

    run_cli("fig1_psn_baseline", main)
