"""Job: Table 2 — exact verdicts + fractional scores on the Figure-1 toy.

Usage: spark-submit jobs/table2_toy.py  (or plain `python jobs/table2_toy.py`)
"""
import argparse

from repro.tables import table2
from repro.tables.runner import emit, make_session

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--w", type=float, default=0.4, help="w+ = w- weight")
    args = ap.parse_args()
    spark = make_session("table2")
    emit(table2.run(spark, w=args.w), "table2")
    spark.stop()
