"""Table 4 — dataset statistics, paper vs scaled synthetic stand-ins.

For each of the eight datasets: generate the synthetic substitute at
``scale`` and compute |V|, |E|, |Sigma|, average degree and max out/in
degree with Spark aggregations, next to the paper's recorded values.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from ..graphs.generators import (DATASET_SPECS, PAPER_TABLE4,
                                 PAPER_TABLE4_DEGREES, dataset)


def run(spark: SparkSession, scale: float = 0.01,
        names: list[str] | None = None) -> pd.DataFrame:
    rows = []
    for name in names or list(DATASET_SPECS):
        g = dataset(spark, name, scale=scale)
        s = g.stats()
        paper = PAPER_TABLE4[name]
        pd_deg = PAPER_TABLE4_DEGREES[name]
        rows.append({
            "dataset": name,
            "paper_V": paper["V"], "our_V": s["V"],
            "paper_E": paper["E"], "our_E": s["E"],
            "paper_labels": paper["labels"], "our_labels": s["labels"],
            "paper_avg_deg": pd_deg[0], "our_avg_deg": round(s["avg_degree"], 1),
            "paper_max_dout": pd_deg[1], "our_max_dout": s["max_out_degree"],
            "paper_max_din": pd_deg[2], "our_max_din": s["max_in_degree"],
        })
    return pd.DataFrame(rows)
