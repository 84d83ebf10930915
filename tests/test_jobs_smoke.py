"""Smoke tests: every jobs/ entrypoint runs end-to-end on tiny inputs and
returns printable table rows."""
import importlib.util
import pathlib

import pytest

JOBS = pathlib.Path(__file__).resolve().parent.parent / "jobs"


def load_job(name):
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


def test_table2_job(spark):
    mod = load_job("table2_dataset_stats")
    rows = mod.main(
        spark,
        names=("restaurant", "movies"),
        scale_overrides={"movies": 0.01},
    )
    assert {r["dataset"] for r in rows} == {"restaurant", "movies"}
    assert all("|D_P| (paper)" in r for r in rows)


def test_fig1_job(spark):
    mod = load_job("fig1_psn_baseline")
    rows = mod.main(spark, names=("restaurant",), ec_max=5.0)
    [r] = rows
    assert r["method"] == "PSN" and 0 <= r["recall@5"] <= 1


def test_structured_eval_job(spark):
    mod = load_job("structured_eval")
    rows = mod.main(
        spark, names=("restaurant",), methods=("GS-PSN", "SA-PSN"), ec_max=5.0
    )
    methods = {r["method"] for r in rows}
    assert methods == {"GS-PSN", "SA-PSN"}
    assert any("mean AUC*@1" in r for r in rows)


def test_hetero_eval_job(spark):
    mod = load_job("hetero_eval")
    rows = mod.main(
        spark,
        names=("movies",),
        methods=("PPS", "SA-PSN"),
        ec_max=5.0,
        w_max=10,
        scale_overrides={"movies": 0.01},
    )
    assert {r["method"] for r in rows} == {"PPS", "SA-PSN"}


def test_timing_eval_job(spark):
    mod = load_job("timing_eval")
    rows = mod.main(
        spark,
        names=("movies",),
        methods=("PBS",),
        ec_pairs=1.0,
        scale_overrides={"movies": 0.01},
    )
    [r] = rows
    assert r["init_s"] > 0 and r["comp_us_js"] > 0 and r["comp_us_ed"] > 0
