"""Figures 9 + 10 reproduction: recall progressiveness and normalized AUC
of all 7 methods over the four structured datasets (GS-PSN w_max = 20,
ARCS weighting, Token Blocking workflow — §7 parameter configuration).

    spark-submit jobs/structured_eval.py
"""
from __future__ import annotations

from repro.data.datasets import STRUCTURED, load, schema_key_fn
from repro.eval.harness import evaluate_dataset, format_table, mean_auc_star

METHODS = ("PSN", "SA-PSN", "SA-PSAB", "LS-PSN", "GS-PSN", "PBS", "PPS")


def main(
    spark,
    *,
    names: tuple[str, ...] = STRUCTURED,
    methods: tuple[str, ...] = METHODS,
    ec_max: float = 30.0,
    w_max: int = 20,
    k_max: int = 100,
) -> list[dict]:
    all_results = []
    for name in names:
        ds = load(name, spark)
        # K_max is unspecified in the paper; 100 lets PPS's emission phase
        # cover cora's up-to-100-profile equivalence clusters (a smaller
        # K_max caps PPS's eventual recall at K_max·|P| comparisons).
        params = {
            "GS-PSN": {"w_max": w_max},
            "PSN": {"key_fn": schema_key_fn(name)},
            "PPS": {"k_max": k_max},
        }
        results = evaluate_dataset(
            ds, [m for m in methods], ec_max=ec_max, method_params=params
        )
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
    print("\n== mean AUC* across structured datasets (Fig. 10) ==")
    print(format_table(mean_rows))
    return [r.row() for r in all_results] + mean_rows


if __name__ == "__main__":
    from _common import run_cli

    run_cli("structured_eval", main)
