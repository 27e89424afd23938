"""Table 6 — pattern-matching F1 across query scenarios (Amazon-like).

Protocol (Section 5.4): random queries of size 3-13 extracted from the
data graph, four scenarios (Exact / Noisy-E / Noisy-L / Combined, noise
up to 33%), top-1 match per query, paper F1. Algorithms: NAGA-like,
G-Finder-like, TSpan-1/-3-like, strong simulation, FSim_s, FSim_dp.

Shape to reproduce: everything is perfect-ish on Exact except NAGA;
strong simulation collapses under noise; TSpan-3 stays strong on
Noisy-E but has no results under label noise; FSim_s beats FSim_dp and
all baselines on the noisy scenarios.
"""
from __future__ import annotations

from typing import List

import pandas as pd
from pyspark.sql import SparkSession

from ..graphs.generators import dataset_pd
from ..graphs.model import AdjGraph, Graph
from ..graphs.noise import Query, make_workload, noise_query
from ..matching.baselines import run_baseline_parallel
from ..matching.harness import run_fsim_scenario

SCENARIOS = ["Exact", "Noisy-E", "Noisy-L", "Combined"]

#: Paper Table 6 (Amazon, avg F1 % over 100 queries).
PAPER_TABLE6 = {
    "NAGA": {"Exact": 30.2, "Noisy-E": 30.5, "Noisy-L": 20.6, "Combined": 21.2},
    "G-Finder": {"Exact": 100.0, "Noisy-E": 49.2, "Noisy-L": 40.7, "Combined": 40.9},
    "TSpan-1": {"Exact": 100.0, "Noisy-E": 71.0, "Noisy-L": None, "Combined": None},
    "TSpan-3": {"Exact": 100.0, "Noisy-E": 95.8, "Noisy-L": None, "Combined": None},
    "StrongSim": {"Exact": 100.0, "Noisy-E": 50.0, "Noisy-L": 33.3, "Combined": 29.2},
    "FSim_s": {"Exact": 100.0, "Noisy-E": 84.0, "Noisy-L": 75.1, "Combined": 76.6},
    "FSim_dp": {"Exact": 100.0, "Noisy-E": 65.7, "Noisy-L": 73.2, "Combined": 66.7},
}


def run(spark: SparkSession, *, scale: float = 0.003, n_queries: int = 30,
        seed: int = 3, w_star: float = 0.2, eps: float = 1e-2) -> pd.DataFrame:
    nodes_pd, edges_pd = dataset_pd("Amazon", scale=scale, seed=seed)
    data = Graph.from_pandas(spark, nodes_pd, edges_pd)
    adj = AdjGraph.build(nodes_pd, edges_pd)
    all_labels = sorted(nodes_pd.label.unique())
    base = make_workload(nodes_pd, edges_pd, n_queries=n_queries, seed=seed)

    def workload(scenario: str) -> List[Query]:
        if scenario == "Exact":
            return base
        return [noise_query(q, scenario, all_labels, seed=seed + 77 + q.qid)
                for q in base]

    rows = []
    for scenario in SCENARIOS:
        qs = workload(scenario)
        measured = {
            "NAGA": run_baseline_parallel(spark, qs, adj, "naga"),
            "G-Finder": run_baseline_parallel(spark, qs, adj, "gfinder"),
            "TSpan-1": run_baseline_parallel(spark, qs, adj, "tspan", max_missing=1),
            "TSpan-3": run_baseline_parallel(spark, qs, adj, "tspan", max_missing=3),
            "StrongSim": run_baseline_parallel(spark, qs, adj, "strong"),
            "FSim_s": run_fsim_scenario(spark, qs, data, adj, "s",
                                        w_star=w_star, eps=eps),
            "FSim_dp": run_fsim_scenario(spark, qs, data, adj, "dp",
                                         w_star=w_star, eps=eps),
        }
        for algo, f1 in measured.items():
            rows.append({
                "scenario": scenario, "algorithm": algo,
                "paper_f1": PAPER_TABLE6[algo][scenario],
                "our_f1": None if f1 is None else round(f1, 1),
            })
    return pd.DataFrame(rows)
