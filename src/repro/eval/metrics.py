"""Recall progressiveness metrics (§7, "Metrics").

The unit of the horizontal axis is the *normalized number of emitted
comparisons* ``ec* = ec / |D_P|``. Detected-match positions are the only
thing needed to evaluate any metric: ``recall@ec*`` is a step-count and
``AUC@ec*`` is the exact integral of the discrete step curve. The ideal
method detects the k-th match at emission k, and normalizing by its AUC
gives ``AUC*@ec* ∈ [0, 1]``.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def detection_indices(emissions: DataFrame, ground_truth: DataFrame) -> np.ndarray:
    """Sorted 1-based emission indices at which each match is *first* seen.

    ``emissions`` is a (possibly repeating) capped stream
    ``(emission_idx, i, j)``; ``ground_truth`` holds canonical match pairs
    ``(i, j)``. Matches never emitted within the cap are simply absent.
    """
    det = (
        emissions.join(ground_truth.select("i", "j"), ["i", "j"])
        .groupBy("i", "j")
        .agg(F.min("emission_idx").alias("d"))
        .select("d")
        .collect()
    )
    return np.sort(np.array([r.d for r in det], dtype=np.int64))


def recall_at(detections: np.ndarray, n_matches: int, ec_star: float) -> float:
    """Fraction of all matches detected within ``ec_star · |D_P|`` emissions."""
    budget = ec_star * n_matches
    return float(np.count_nonzero(detections <= budget)) / n_matches


def auc_at(detections: np.ndarray, n_matches: int, ec_star: float) -> float:
    """Exact area under recall(ec*) over [0, ec_star] for the step curve
    that jumps by 1/|D_P| at each detection position d/|D_P|."""
    if n_matches <= 0:
        raise ValueError("n_matches must be positive")
    x = detections / n_matches
    return float(np.sum(np.clip(ec_star - x, 0.0, None)) / n_matches)


def ideal_auc_at(n_matches: int, ec_star: float) -> float:
    """AUC of the ideal method (k-th match at emission k)."""
    ideal = np.arange(1, n_matches + 1, dtype=np.int64)
    return auc_at(ideal, n_matches, ec_star)


def auc_star_at(detections: np.ndarray, n_matches: int, ec_star: float) -> float:
    """Normalized AUC*@ec* — 1.0 for the ideal method, higher is better."""
    return auc_at(detections, n_matches, ec_star) / ideal_auc_at(n_matches, ec_star)
