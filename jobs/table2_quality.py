"""spark-submit entrypoint for Table 2 (embedding-quality tests)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _session import make_session, save

from repro.tables.table2 import run_table2

if __name__ == "__main__":
    spark = make_session("table2")
    df = run_table2(spark)
    save(df, "table2")
    spark.stop()
