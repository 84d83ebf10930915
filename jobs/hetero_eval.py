"""Figures 11 + 12 reproduction: recall progressiveness and normalized AUC
of the six schema-agnostic methods over the three large heterogeneous
dataset analogues (GS-PSN w_max = 200; scales from BENCH_SCALES — the
documented scale-down of the paper's million-profile collections).

    spark-submit jobs/hetero_eval.py
"""
from __future__ import annotations

from repro.data.datasets import HETEROGENEOUS, load
from repro.eval.harness import evaluate_dataset, format_table, mean_auc_star

METHODS = ("SA-PSN", "SA-PSAB", "LS-PSN", "GS-PSN", "PBS", "PPS")


def main(
    spark,
    *,
    names: tuple[str, ...] = HETEROGENEOUS,
    methods: tuple[str, ...] = METHODS,
    ec_max: float = 30.0,
    w_max: int = 200,
    scale_overrides: dict | None = None,
) -> list[dict]:
    scale_overrides = scale_overrides or {}
    all_results = []
    for name in names:
        ds = load(name, spark, scale=scale_overrides.get(name))
        params = {"GS-PSN": {"w_max": w_max}}
        results = evaluate_dataset(ds, list(methods), ec_max=ec_max, method_params=params)
        all_results.extend(results)
        print(f"\n== {name} ==")
        print(format_table([r.row() for r in results]))
        ds.profiles.unpersist()
        ds.ground_truth.unpersist()

    mean = mean_auc_star(all_results)
    mean_rows = [
        {"method": m, **{f"mean AUC*@{k:g}": round(v, 4) for k, v in per.items()}}
        for m, per in mean.items()
    ]
    print("\n== mean AUC* across heterogeneous datasets (Fig. 12) ==")
    print(format_table(mean_rows))
    return [r.row() for r in all_results] + mean_rows


if __name__ == "__main__":
    from _common import run_cli

    run_cli("hetero_eval", main)
