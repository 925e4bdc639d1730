"""Benchmark: regenerate Table 3 (schema matching)."""
from benchmarks.conftest import BENCH_RUN, scenario_roster

from repro.tables.table3 import run_table3


def bench_table3(benchmark, spark, cache):
    df = benchmark.pedantic(
        lambda: run_table3(spark, BENCH_RUN, scenario_roster(two_dataset_only=True), cache=cache),
        rounds=1, iterations=1,
    )
    assert "EmbDI" in df.columns
