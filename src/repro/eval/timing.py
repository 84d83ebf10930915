"""Time-efficiency experiment (§7.3, Fig. 13).

Two wall-clock measurements per (method, dataset):

* **initialization time** — time to produce the *first* comparison,
  including all preprocessing (here: running the method's dataflow with
  an emission budget of 1, which for the window-based methods builds only
  the first window — matching the paper's phased semantics);
* **comparison time** — average time per emitted comparison when a match
  function is applied to each: measured by scoring the first ``n_pairs``
  emissions with the cheap (Jaccard) and expensive (edit-distance)
  functions and dividing wall time by the pair count.

Absolute numbers are not comparable to the paper's single-node Java 8
testbed (DESIGN.md §5); the reproduction targets are the *orderings*
(which method initialises fastest; ED ≫ JS per-comparison cost).
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass

from pyspark.sql import functions as F

from repro.data.base import Dataset
from repro.eval.harness import resolve_method
from repro.eval.match_functions import apply_match_function, profile_strings


@dataclass
class TimingResult:
    method: str
    dataset: str
    n_pairs: int
    init_s: float
    comparison_us: dict[str, float]  # match function -> µs per comparison

    def row(self) -> dict:
        out = {
            "method": self.method,
            "dataset": self.dataset,
            "init_s": round(self.init_s, 2),
        }
        out.update(
            {f"comp_us_{k}": round(v, 1) for k, v in self.comparison_us.items()}
        )
        return out


def time_method(
    ds: Dataset,
    method: str,
    *,
    ec_pairs: float = 5.0,
    match_fns: tuple[str, ...] = ("js", "ed"),
    **params,
) -> TimingResult:
    """Measure init and per-comparison time for one method on one dataset."""
    fn = resolve_method(method)

    t0 = time.perf_counter()
    fn(ds.profiles, ds.er_type, n_max=1, **params).collect()
    init_s = time.perf_counter() - t0

    n_pairs = int(math.ceil(ec_pairs * ds.n_matches))
    emissions = fn(ds.profiles, ds.er_type, n_max=n_pairs, **params).cache()
    strings = profile_strings(ds.profiles).cache()
    try:
        n = emissions.count()
        strings.count()
        comp: dict[str, float] = {}
        for mf in match_fns:
            t0 = time.perf_counter()
            apply_match_function(emissions, strings, mf).agg(
                F.sum("score")
            ).collect()
            comp[mf] = (time.perf_counter() - t0) / max(n, 1) * 1e6
        return TimingResult(method, ds.name, n, init_s, comp)
    finally:
        emissions.unpersist()
        strings.unpersist()
