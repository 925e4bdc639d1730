"""spark-submit entrypoint for the §7.2 Token-Matching experiment."""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _session import make_session, save

from repro.tables.token_matching_exp import run_token_matching

if __name__ == "__main__":
    spark = make_session("token_matching")
    df = run_token_matching(spark)
    save(df, "token_matching")
    spark.stop()
