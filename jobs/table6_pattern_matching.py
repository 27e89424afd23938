"""Job: Table 6 — pattern-matching F1 across noise scenarios."""
import argparse

from repro.tables import table6
from repro.tables.runner import emit, make_session

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=0.002,
                    help="Amazon-like graph scale")
    ap.add_argument("--queries", type=int, default=30)
    args = ap.parse_args()
    spark = make_session("table6")
    emit(table6.run(spark, scale=args.scale, n_queries=args.queries), "table6")
    spark.stop()
