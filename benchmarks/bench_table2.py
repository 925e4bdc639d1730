"""Benchmark: regenerate Table 2 (embedding-quality tests)."""
from benchmarks.conftest import BENCH_RUN, scenario_roster

from repro.tables.table2 import run_table2


def bench_table2(benchmark, spark, cache):
    df = benchmark.pedantic(
        lambda: run_table2(spark, BENCH_RUN, scenario_roster(), cache=cache),
        rounds=1, iterations=1,
    )
    assert {"MA", "MR", "MC", "AVG"} <= set(df.columns)
