"""Job: Table 4 — dataset statistics (paper vs scaled synthetic)."""
import argparse

from repro.tables import table4
from repro.tables.runner import emit, make_session

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=0.01)
    args = ap.parse_args()
    spark = make_session("table4")
    emit(table4.run(spark, scale=args.scale), "table4")
    spark.stop()
