"""Bench T1: empirical spot-check of Table 1's complexity claims —
initialization cost of a similarity-based (SA-PSN) and an equality-based
(PBS) method should grow near-linearly in the input size.

The bench times time-to-first-emission at three movie-analogue scales and
prints the measured ratios; Table 1's asymptotic statements live in
DESIGN.md (T1 row).
"""
import time

from repro.data.heterogeneous import movies_like
from repro.methods import pbs, sa_psn

SCALES = (0.05, 0.1, 0.2)


def _first_emission_seconds(fn, ds, **params):
    t0 = time.perf_counter()
    fn(ds.profiles, ds.er_type, n_max=1, **params).collect()
    return time.perf_counter() - t0


def test_init_scaling(benchmark, spark):
    def run():
        rows = []
        for scale in SCALES:
            ds = movies_like(spark, scale=scale)
            rows.append(
                {
                    "scale": scale,
                    "n_profiles": ds.profiles.select("pid").distinct().count(),
                    "sa_psn_init_s": round(_first_emission_seconds(sa_psn, ds), 2),
                    "pbs_init_s": round(_first_emission_seconds(pbs, ds), 2),
                }
            )
            ds.profiles.unpersist()
            ds.ground_truth.unpersist()
        return rows

    rows = benchmark.pedantic(run, rounds=1, iterations=1, warmup_rounds=0)
    print()
    for r in rows:
        print(r)
    # 4× the data must not cost anything near quadratically (16×) in
    # either method — generous 8× bound to stay robust on shared CI boxes.
    assert rows[-1]["sa_psn_init_s"] < max(8 * rows[0]["sa_psn_init_s"], 30.0)
    assert rows[-1]["pbs_init_s"] < max(8 * rows[0]["pbs_init_s"], 30.0)
