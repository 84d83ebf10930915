"""Evaluation stack: progressiveness metrics, match functions, harness, timing."""
