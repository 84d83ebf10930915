"""Shared machinery for the dataset generators.

Generators assemble profiles driver-side (the analogues are ≤ tens of
thousands of profiles — Table 2 scale or a documented scale-down) as
long-format rows and return ``(profiles, ground_truth)`` Spark
DataFrames in the repo-wide convention (`repro.common`).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.common import CLEAN, DIRTY

PROFILE_SCHEMA = "pid long, source int, attr string, value string"
GT_SCHEMA = "i long, j long"


@dataclass
class ProfileBuilder:
    """Accumulates long-format profile rows and canonical match pairs."""

    rows: list[tuple[int, int, str, str]] = field(default_factory=list)
    matches: list[tuple[int, int]] = field(default_factory=list)
    _next_pid: int = 0

    def new_pid(self) -> int:
        pid = self._next_pid
        self._next_pid += 1
        return pid

    def add(self, pid: int, source: int, attrs: dict[str, str]) -> None:
        for k, v in attrs.items():
            if v is not None and str(v) != "":
                self.rows.append((pid, source, k, str(v)))

    def add_cluster_pairs(self, pids: list[int]) -> None:
        """Register all pairs of a Dirty-ER equivalence cluster as matches."""
        for a in range(len(pids)):
            for b in range(a + 1, len(pids)):
                i, j = sorted((pids[a], pids[b]))
                self.matches.append((i, j))

    def build(self, spark: SparkSession) -> tuple[DataFrame, DataFrame]:
        profiles = spark.createDataFrame(
            pd.DataFrame(self.rows, columns=["pid", "source", "attr", "value"]),
            PROFILE_SCHEMA,
        )
        gt = spark.createDataFrame(
            pd.DataFrame(self.matches, columns=["i", "j"]), GT_SCHEMA
        )
        return profiles, gt


@dataclass(frozen=True)
class Dataset:
    """A ready-to-evaluate dataset bundle."""

    name: str
    er_type: str  # DIRTY or CLEAN
    profiles: DataFrame
    ground_truth: DataFrame
    n_matches: int

    @staticmethod
    def of(name: str, er_type: str, profiles: DataFrame, gt: DataFrame) -> "Dataset":
        assert er_type in (DIRTY, CLEAN)
        return Dataset(name, er_type, profiles.cache(), gt.cache(), gt.count())
