"""spark-submit entrypoint for Table 1 (dataset properties)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _session import make_session, save

from repro.tables.table1 import run_table1

if __name__ == "__main__":
    spark = make_session("table1")
    df = run_table1(spark)
    save(df, "table1")
    spark.stop()
