"""Job: Table 5 — Pearson correlation across initialization functions."""
import argparse

from repro.tables import table5
from repro.tables.runner import emit, make_session

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=0.0015,
                    help="NELL-like graph scale (nodes ~ 75k * scale)")
    args = ap.parse_args()
    spark = make_session("table5")
    emit(table5.run(spark, scale=args.scale), "table5")
    spark.stop()
