"""Job: Table 9 — alignment F1 on evolving graph versions."""
import argparse

from repro.tables import table9
from repro.tables.runner import emit, make_session

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--nodes", type=int, default=500)
    ap.add_argument("--edges", type=int, default=1100)
    args = ap.parse_args()
    spark = make_session("table9")
    emit(table9.run(spark, n_nodes=args.nodes, n_edges=args.edges), "table9")
    spark.stop()
