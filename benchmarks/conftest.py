"""Benchmark fixtures: one MethodCache shared across all table benches.

Benchmarks run each table harness once (``pedantic`` round) at bench
scale: full scenario row counts but a reduced scenario subset so the
whole suite stays within a CI budget. ``BENCH_SCENARIOS=all`` in the
environment sweeps every scenario (what EXPERIMENTS.md reports comes
from ``jobs/``, which always runs the full roster).
"""
import os

import pytest

from repro.scenarios import SCENARIOS, TWO_DATASET_SCENARIOS
from repro.tables.common import MethodCache, RunConfig

BENCH_RUN = RunConfig(corpus_k=60, max_iter=4, quality_tests=100)


def scenario_roster(two_dataset_only: bool = False) -> list[str]:
    roster = TWO_DATASET_SCENARIOS if two_dataset_only else list(SCENARIOS)
    if os.environ.get("BENCH_SCENARIOS", "").lower() == "all":
        return roster
    subset = ["FZ", "AG", "DA"] if two_dataset_only else ["FZ", "AG", "DA", "MSD"]
    return [s for s in subset if s in roster]


@pytest.fixture(scope="session")
def cache(spark):
    return MethodCache(spark, BENCH_RUN)
