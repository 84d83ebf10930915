"""Table 2 reproduction: generate all 7 dataset analogues and print their
measured characteristics next to the published ones.

    spark-submit jobs/table2_dataset_stats.py
"""
from __future__ import annotations

from repro.data.datasets import HETEROGENEOUS, PAPER_TABLE2, STRUCTURED, dataset_stats, load
from repro.eval.harness import format_table


def main(spark, *, names: tuple[str, ...] | None = None, scale_overrides: dict | None = None) -> list[dict]:
    names = names or (*STRUCTURED, *HETEROGENEOUS)
    scale_overrides = scale_overrides or {}
    rows = []
    for name in names:
        ds = load(name, spark, scale=scale_overrides.get(name))
        s = dataset_stats(ds)
        paper = PAPER_TABLE2[name]
        rows.append(
            {
                "dataset": name,
                "er_type": s["er_type"],
                "|P| (measured)": s["profiles"],
                "|P| (paper)": paper[0],
                "#attr (measured)": s["attrs"],
                "#attr (paper)": paper[1],
                "|D_P| (measured)": s["n_matches"],
                "|D_P| (paper)": paper[2],
                "|p̄| (measured)": s["avg_nv_pairs"],
                "|p̄| (paper)": paper[3],
            }
        )
        ds.profiles.unpersist()
        ds.ground_truth.unpersist()
    print(format_table(rows))
    return rows


if __name__ == "__main__":
    from _common import run_cli

    run_cli("table2_dataset_stats", main)
