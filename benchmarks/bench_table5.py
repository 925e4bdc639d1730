"""Benchmark: regenerate Table 5 (n_top sweep)."""
from benchmarks.conftest import BENCH_RUN, scenario_roster

from repro.tables.table5 import run_table5


def bench_table5(benchmark, spark, cache):
    scen = tuple(scenario_roster(two_dataset_only=True))
    df = benchmark.pedantic(
        lambda: run_table5(spark, BENCH_RUN, scenarios=scen, cache=cache),
        rounds=1, iterations=1,
    )
    assert set(df["n_top"]) == {1, 5, 10, 100}
