"""Job: run every evaluation table and write results/ + EXPERIMENTS inputs.

This is the one-shot reproduction driver:
    python jobs/run_all_tables.py [--fast]
--fast shrinks every workload (used for CI-style smoke runs).
"""
import argparse
import time

from repro.tables import (table2, table4, table5, table6, table7, table8,
                          table9)
from repro.tables.runner import emit, make_session

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--fast", action="store_true")
    args = ap.parse_args()
    spark = make_session("run_all_tables")
    t0 = time.time()
    emit(table2.run(spark), "table2")
    emit(table4.run(spark, scale=0.005 if args.fast else 0.01), "table4")
    emit(table5.run(spark, scale=0.0008 if args.fast else 0.0015), "table5")
    emit(table6.run(spark, scale=0.001 if args.fast else 0.002,
                    n_queries=10 if args.fast else 30), "table6")
    dbis = dict(n_venues=40, n_papers=160 if args.fast else 260,
                n_authors=100 if args.fast else 160)
    emit(table7.run(spark, **dbis), "table7")
    emit(table8.run(spark, **dbis), "table8")
    emit(table9.run(spark, n_nodes=250 if args.fast else 500,
                    n_edges=550 if args.fast else 1100), "table9")
    print(f"\nall tables done in {time.time() - t0:.0f}s")
    spark.stop()
