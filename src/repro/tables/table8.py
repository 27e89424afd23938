"""Table 8 — nDCG of venue-similarity ranking over subject venues.

Protocol (Section 5.4): for each of 15 subject venues, rank the top-15
most similar venues per algorithm; relevance of a returned venue is 2
(same area, tier 1), 1 (same area) or 0, from the generator's
area/tier ground truth; report mean nDCG@15. Shape: FSim_bj wins,
FSim_b is competitive with the meta-path baselines.

The subject venue itself is excluded from its ranking (it carries the
same constant gain for every algorithm); the WWW duplicates are
distinct nodes and count as relevant results.
"""
from __future__ import annotations

import math
from typing import Dict, List

import pandas as pd
from pyspark.sql import SparkSession

from ..graphs.generators import SUBJECT_VENUES
from .dbis_common import ALGOS, load_dbis, venue_rankings

#: Paper Table 8 (mean nDCG): PCRW, PathSim, JoinSim, nSimGram, FSim_b, FSim_bj.
PAPER_TABLE8 = {"PCRW": 0.684, "PathSim": 0.684, "JoinSim": 0.689,
                "nSimGram": 0.700, "FSim_b": 0.699, "FSim_bj": 0.733}


def _relevance(venues: pd.DataFrame) -> Dict[str, Dict[str, int]]:
    area = dict(zip(venues["name"], venues["area"]))
    tier = dict(zip(venues["name"], venues["tier"]))
    rel: Dict[str, Dict[str, int]] = {}
    for s in venues["name"]:
        rel[s] = {}
        for v in venues["name"]:
            if area[v] == area[s]:
                rel[s][v] = 2 if tier[v] == 1 else 1
            else:
                rel[s][v] = 0
    return rel


def ndcg_at_k(ranked: List[str], rel: Dict[str, int], k: int = 15) -> float:
    gains = [rel.get(v, 0) for v in ranked[:k]]
    dcg = sum((2 ** g - 1) / math.log2(i + 2) for i, g in enumerate(gains))
    ideal = sorted(rel.values(), reverse=True)[:k]
    idcg = sum((2 ** g - 1) / math.log2(i + 2) for i, g in enumerate(ideal))
    return dcg / idcg if idcg > 0 else 0.0


def run(spark: SparkSession, *, n_venues: int = 60, n_papers: int = 400,
        n_authors: int = 300, seed: int = 11, k: int = 15,
        **fsim_kw) -> pd.DataFrame:
    data = load_dbis(spark, n_venues=n_venues, n_papers=n_papers,
                     n_authors=n_authors, seed=seed)
    rankings = venue_rankings(spark, data, **fsim_kw)
    rel = _relevance(data.venues)
    subjects = [s for s in SUBJECT_VENUES if s in rel]
    rows = []
    for algo in ALGOS:
        scores = []
        for s in subjects:
            ranked = [v for v in rankings[algo].get(s, []) if v != s]
            r = dict(rel[s])
            r.pop(s, None)
            scores.append(ndcg_at_k(ranked, r, k=k))
        rows.append({
            "algorithm": algo,
            "paper_ndcg": PAPER_TABLE8[algo],
            "our_ndcg": round(sum(scores) / len(scores), 3) if scores else None,
        })
    return pd.DataFrame(rows)
