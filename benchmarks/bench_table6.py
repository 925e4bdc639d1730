"""Benchmark: regenerate Table 6 (execution times)."""
from benchmarks.conftest import BENCH_RUN, scenario_roster

from repro.tables.table6 import run_table6


def bench_table6(benchmark, spark, cache):
    df = benchmark.pedantic(
        lambda: run_table6(spark, BENCH_RUN, scenario_roster(), cache=cache),
        rounds=1, iterations=1,
    )
    assert (df["W+E"] > 0).all()
