"""Helpers for the benchmark suite: load jobs/ entrypoints by path so each
bench regenerates exactly the table its job prints."""
import importlib.util
import pathlib

JOBS = pathlib.Path(__file__).resolve().parent.parent / "jobs"


def load_job(name):
    spec = importlib.util.spec_from_file_location(f"jobs_{name}", JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


def once(benchmark, fn):
    """Run an expensive harness exactly once under pytest-benchmark."""
    return benchmark.pedantic(fn, rounds=1, iterations=1, warmup_rounds=0)
