"""Shared SparkSession builder for the spark-submit job entrypoints.

Mirrors the conftest fixture's post-launch settings (shuffle partitions,
Arrow, broadcast joins disabled) so job runs and test runs exercise the
same plans. Driver memory/master must be given pre-launch (spark-submit
flags or PYSPARK_SUBMIT_ARGS); plain ``python jobs/<name>.py`` also works
because pyspark falls back to local mode.
"""
import os

from pyspark.sql import SparkSession


def make_session(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "32"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def save(df, name: str) -> None:
    """Write a harness result table under results/ for EXPERIMENTS.md."""
    out_dir = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), "results")
    os.makedirs(out_dir, exist_ok=True)
    path = os.path.join(out_dir, f"{name}.csv")
    df.to_csv(path, index=False)
    print(f"[saved] {path}")
