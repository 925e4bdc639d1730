"""spark-submit entrypoint for Table 3 (schema matching)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _session import make_session, save

from repro.tables.table3 import run_table3

if __name__ == "__main__":
    spark = make_session("table3")
    df = run_table3(spark)
    save(df, "table3")
    spark.stop()
