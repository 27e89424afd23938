"""Graph perturbation and query extraction (pandas-level).

Implements the paper's experimental protocols:

- structural errors: randomly add / remove edges (Fig. 5, Table 6
  "Noisy-E": insert edges, up to 33% of the query's edges);
- label errors: randomly reassign node labels (Table 6 "Noisy-L");
- query extraction: random connected subgraphs of the data graph,
  |Q| in [3, 13], which serve as their own ground truth (Section 5.4).

These run on pandas frames because queries and per-query noise are tiny;
the noisy *data-graph* variants are converted back to Spark Graphs by
the callers.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Tuple

import numpy as np
import pandas as pd


def add_random_edges(edges: pd.DataFrame, n_nodes: int, frac: float,
                     seed: int = 0) -> pd.DataFrame:
    """Insert ``frac * |E|`` random non-duplicate edges."""
    rng = np.random.default_rng(seed)
    k = int(len(edges) * frac)
    if k == 0:
        return edges.copy()
    existing = set(zip(edges.src, edges.dst))
    rows: List[Tuple[int, int]] = []
    attempts = 0
    while len(rows) < k and attempts < 50 * k + 100:
        s, d = int(rng.integers(n_nodes)), int(rng.integers(n_nodes))
        attempts += 1
        if s != d and (s, d) not in existing:
            existing.add((s, d))
            rows.append((s, d))
    return pd.concat(
        [edges, pd.DataFrame(rows, columns=["src", "dst"], dtype="int64")],
        ignore_index=True,
    )


def remove_random_edges(edges: pd.DataFrame, frac: float, seed: int = 0) -> pd.DataFrame:
    """Drop ``frac * |E|`` random edges."""
    rng = np.random.default_rng(seed)
    k = int(len(edges) * frac)
    if k == 0:
        return edges.copy()
    drop = rng.choice(len(edges), size=k, replace=False)
    return edges.drop(edges.index[drop]).reset_index(drop=True)


def corrupt_labels(nodes: pd.DataFrame, frac: float, seed: int = 0) -> pd.DataFrame:
    """Reassign ``frac * |V|`` node labels to a *different* existing label."""
    rng = np.random.default_rng(seed)
    out = nodes.copy().reset_index(drop=True)
    k = int(len(out) * frac)
    if k == 0:
        return out
    pool = sorted(out.label.unique())
    if len(pool) < 2:
        return out
    idx = rng.choice(len(out), size=k, replace=False)
    for i in idx:
        cur = out.at[i, "label"]
        alternatives = [l for l in pool if l != cur]
        out.at[i, "label"] = alternatives[int(rng.integers(len(alternatives)))]
    return out


# ------------------------------------------------------------------ queries

@dataclass
class Query:
    """An extracted (possibly noised) query graph.

    ``labels[i]`` is the label of query node ``i``; ``edges`` are query
    edges over local ids; ``origin[i]`` is the data-graph node the query
    node was extracted from (the F1 ground truth).
    """

    labels: Dict[int, str]
    edges: List[Tuple[int, int]]
    origin: Dict[int, int]
    scenario: str = "Exact"
    qid: int = 0

    def n_nodes(self) -> int:
        return len(self.labels)


def extract_query(nodes: pd.DataFrame, edges: pd.DataFrame, size: int,
                  seed: int = 0) -> Query:
    """Random connected subgraph of ``size`` nodes (undirected BFS walk)."""
    rng = np.random.default_rng(seed)
    und: Dict[int, set] = {}
    for s, d in zip(edges.src, edges.dst):
        und.setdefault(int(s), set()).add(int(d))
        und.setdefault(int(d), set()).add(int(s))
    label_of = dict(zip(nodes.id.astype(int), nodes.label))
    candidates = [u for u, nb in und.items() if len(nb) > 0]
    for _ in range(60):
        start = candidates[int(rng.integers(len(candidates)))]
        chosen = {start}
        frontier = list(und[start])
        while len(chosen) < size and frontier:
            pick = frontier.pop(int(rng.integers(len(frontier))))
            if pick in chosen:
                continue
            chosen.add(pick)
            frontier.extend(n for n in und[pick] if n not in chosen)
        if len(chosen) == size:
            break
    ids = sorted(chosen)
    local = {g: i for i, g in enumerate(ids)}
    edge_set = set(zip(edges.src.astype(int), edges.dst.astype(int)))
    q_edges = [(local[s], local[d]) for s in ids for d in ids
               if s != d and (s, d) in edge_set]
    return Query(
        labels={local[g]: label_of[g] for g in ids},
        edges=q_edges,
        origin={local[g]: g for g in ids},
    )


def noise_query(q: Query, scenario: str, all_labels: List[str],
                frac: float = 0.33, seed: int = 0) -> Query:
    """Apply the Table-6 scenario noise to a query (query-local ids)."""
    rng = np.random.default_rng(seed)
    labels = dict(q.labels)
    edges = list(q.edges)
    n = q.n_nodes()
    # "up to 33%" noise (paper wording): the per-query amount is drawn
    # uniformly from [0, floor(frac * size)], so small queries are often
    # lightly corrupted or untouched.
    if scenario in ("Noisy-E", "Combined"):
        k = int(rng.integers(0, int(len(edges) * frac) + 1))
        present = set(edges)
        added = 0
        for _ in range(60 * k + 1):
            if added >= k:
                break
            s, d = int(rng.integers(n)), int(rng.integers(n))
            if s != d and (s, d) not in present:
                present.add((s, d))
                edges.append((s, d))
                added += 1
    if scenario in ("Noisy-L", "Combined"):
        k = int(rng.integers(0, int(n * frac) + 1))
        idx = rng.choice(n, size=min(k, n), replace=False)
        for i in idx:
            alts = [l for l in all_labels if l != labels[int(i)]]
            if alts:
                labels[int(i)] = alts[int(rng.integers(len(alts)))]
    return Query(labels=labels, edges=edges, origin=dict(q.origin),
                 scenario=scenario, qid=q.qid)


def make_workload(nodes: pd.DataFrame, edges: pd.DataFrame, *, n_queries: int,
                  sizes: Tuple[int, int] = (3, 13), seed: int = 0) -> List[Query]:
    """The Table-6 exact-query workload (noise applied per scenario later)."""
    rng = np.random.default_rng(seed)
    out = []
    for i in range(n_queries):
        size = int(rng.integers(sizes[0], sizes[1] + 1))
        q = extract_query(nodes, edges, size, seed=seed + 1000 + i)
        q.qid = i
        out.append(q)
    return out
