"""spark-submit entrypoint for Table 6 (execution times)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _session import make_session, save

from repro.tables.table6 import run_table6

if __name__ == "__main__":
    spark = make_session("table6")
    df = run_table6(spark)
    save(df, "table6")
    spark.stop()
