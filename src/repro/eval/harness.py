"""Evaluation harness: run progressive methods over a dataset and compute
the recall-progressiveness numbers behind the paper's Figures 1/9–12.

Per (method, dataset) run the harness materialises the capped emission
stream once, extracts the match-detection indices, and evaluates
``recall@ec*`` checkpoints plus ``AUC*@ec*`` — everything EXPERIMENTS.md
reports.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

import numpy as np

from repro.data.base import Dataset
from repro.eval import metrics
from repro.methods import METHODS, SCHEMA_BASED_METHODS

EC_CHECKPOINTS = (1.0, 2.0, 5.0, 10.0, 20.0, 30.0)
AUC_CHECKPOINTS = (1.0, 5.0, 10.0, 20.0)


@dataclass
class MethodResult:
    """Progressiveness of one method on one dataset (capped at ``ec_max``)."""

    method: str
    dataset: str
    n_matches: int
    ec_max: float
    detections: np.ndarray
    recall: dict[float, float] = field(default_factory=dict)
    auc_star: dict[float, float] = field(default_factory=dict)

    def row(self) -> dict:
        out = {"method": self.method, "dataset": self.dataset}
        out.update({f"recall@{k:g}": round(v, 4) for k, v in self.recall.items()})
        out.update({f"AUC*@{k:g}": round(v, 4) for k, v in self.auc_star.items()})
        return out


def resolve_method(name: str):
    if name in METHODS:
        return METHODS[name]
    if name in SCHEMA_BASED_METHODS:
        return SCHEMA_BASED_METHODS[name]
    raise KeyError(f"unknown method {name!r}")


def run_method(
    ds: Dataset,
    method: str,
    *,
    ec_max: float = 30.0,
    ec_checkpoints=EC_CHECKPOINTS,
    auc_checkpoints=AUC_CHECKPOINTS,
    **params,
) -> MethodResult:
    """Run one method with an emission budget of ``ec_max · |D_P|``."""
    fn = resolve_method(method)
    n_max = int(math.ceil(ec_max * ds.n_matches))
    emissions = fn(ds.profiles, ds.er_type, n_max=n_max, **params).cache()
    try:
        emissions.count()
        det = metrics.detection_indices(emissions, ds.ground_truth)
    finally:
        emissions.unpersist()
    res = MethodResult(method, ds.name, ds.n_matches, ec_max, det)
    for ec in ec_checkpoints:
        if ec <= ec_max:
            res.recall[ec] = metrics.recall_at(det, ds.n_matches, ec)
    for ec in auc_checkpoints:
        if ec <= ec_max:
            res.auc_star[ec] = metrics.auc_star_at(det, ds.n_matches, ec)
    return res


def evaluate_dataset(
    ds: Dataset,
    methods: list[str],
    *,
    ec_max: float = 30.0,
    method_params: dict[str, dict] | None = None,
) -> list[MethodResult]:
    """Run several methods on one dataset; ``method_params`` overrides
    per-method keyword arguments (e.g. GS-PSN's ``w_max``, PSN's ``key_fn``)."""
    method_params = method_params or {}
    return [
        run_method(ds, m, ec_max=ec_max, **method_params.get(m, {})) for m in methods
    ]


def mean_auc_star(results: list[MethodResult], auc_checkpoints=AUC_CHECKPOINTS) -> dict[str, dict[float, float]]:
    """Mean AUC*@ec* per method across datasets (Figures 10 and 12)."""
    by_method: dict[str, list[MethodResult]] = {}
    for r in results:
        by_method.setdefault(r.method, []).append(r)
    return {
        m: {
            ec: float(np.mean(vals))
            for ec in auc_checkpoints
            if (vals := [r.auc_star[ec] for r in rs if ec in r.auc_star])
        }
        for m, rs in by_method.items()
    }


def format_table(rows: list[dict], columns: list[str] | None = None) -> str:
    """Render result rows as a GitHub-flavoured markdown table."""
    if not rows:
        return "(no rows)"
    columns = columns or list(rows[0])
    head = "| " + " | ".join(columns) + " |"
    sep = "|" + "|".join("---" for _ in columns) + "|"
    body = [
        "| " + " | ".join(str(r.get(c, "")) for c in columns) + " |" for r in rows
    ]
    return "\n".join([head, sep, *body])
