"""spark-submit entrypoint for Table 4 (entity resolution)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _session import make_session, save

from repro.tables.table4 import run_table4

if __name__ == "__main__":
    spark = make_session("table4")
    df = run_table4(spark)
    save(df, "table4")
    spark.stop()
