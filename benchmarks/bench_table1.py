"""Benchmark: regenerate Table 1 (dataset properties)."""
from benchmarks.conftest import BENCH_RUN, scenario_roster

from repro.tables.table1 import run_table1


def bench_table1(benchmark, spark, cache):
    df = benchmark.pedantic(
        lambda: run_table1(spark, BENCH_RUN, scenario_roster(), cache=cache),
        rounds=1, iterations=1,
    )
    assert len(df) == len(scenario_roster())
