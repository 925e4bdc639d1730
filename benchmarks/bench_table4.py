"""Benchmark: regenerate Table 4 (entity resolution)."""
from benchmarks.conftest import BENCH_RUN, scenario_roster

from repro.tables.table4 import run_table4


def bench_table4(benchmark, spark, cache):
    df = benchmark.pedantic(
        lambda: run_table4(spark, BENCH_RUN, scenario_roster(two_dataset_only=True), cache=cache),
        rounds=1, iterations=1,
    )
    assert "EmbDI-O" in df.columns
