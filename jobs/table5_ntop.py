"""spark-submit entrypoint for Table 5 (n_top sweep on ER)."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _session import make_session, save

from repro.tables.table5 import run_table5

if __name__ == "__main__":
    spark = make_session("table5")
    df = run_table5(spark)
    save(df, "table5")
    spark.stop()
