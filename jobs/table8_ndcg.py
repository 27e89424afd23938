"""Job: Table 8 — nDCG of venue-similarity rankings on DBIS-like data."""
import argparse

from repro.tables import table8
from repro.tables.runner import emit, make_session

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--venues", type=int, default=40)
    ap.add_argument("--papers", type=int, default=260)
    ap.add_argument("--authors", type=int, default=160)
    args = ap.parse_args()
    spark = make_session("table8")
    emit(table8.run(spark, n_venues=args.venues, n_papers=args.papers,
                    n_authors=args.authors), "table8")
    spark.stop()
