"""Table 7 — top-5 venues most similar to WWW, per algorithm.

Shape to reproduce: every algorithm puts WWW itself first and related
venues (CIKM/SIGIR/...) high, but only FSim_bj surfaces all the WWW
near-duplicates (WWW_1..WWW_3) inside its top-5.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from .dbis_common import ALGOS, load_dbis, venue_rankings

#: Paper Table 7 columns.
PAPER_TABLE7 = {
    "PCRW": ["WWW", "SIGIR", "ICDE", "VLDB", "Hypertext"],
    "PathSim": ["WWW", "CIKM", "SIGKDD", "WISE", "ICDM"],
    "JoinSim": ["WWW", "WWW_1", "CIKM", "WSDM", "WWW_2"],
    "nSimGram": ["WWW", "CIKM", "SIGIR", "WWW_1", "SIGKDD"],
    "FSim_b": ["WWW", "CIKM", "ICDE", "VLDB", "SIGIR"],
    "FSim_bj": ["WWW", "WWW_1", "CIKM", "WWW_2", "WWW_3"],
}


def run(spark: SparkSession, *, n_venues: int = 60, n_papers: int = 400,
        n_authors: int = 300, seed: int = 11, **fsim_kw) -> pd.DataFrame:
    data = load_dbis(spark, n_venues=n_venues, n_papers=n_papers,
                     n_authors=n_authors, seed=seed)
    rankings = venue_rankings(spark, data, **fsim_kw)
    rows = []
    for rank in range(5):
        row = {"rank": rank + 1}
        for algo in ALGOS:
            ranked = rankings[algo].get("WWW", [])
            row[f"paper_{algo}"] = PAPER_TABLE7[algo][rank]
            row[f"our_{algo}"] = ranked[rank] if rank < len(ranked) else "-"
        rows.append(row)
    return pd.DataFrame(rows)
