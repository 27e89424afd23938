"""Approximate pattern-matching baselines for Table 6.

Faithful-in-spirit, simplified re-implementations of the paper's
closed-source comparators (DESIGN.md §3):

- ``tspan_like``: edit-distance category (TSpan [31]) — enumerate
  injective, label-exact assignments with at most ``x`` missing query
  edges via pruned backtracking; top-1 = fewest missing edges. Returns
  ``None`` when labels cannot match (mirrors TSpan having no results
  under label noise).
- ``naga_like``: similarity category (NAGA [35]) — chi-square statistic
  between neighbor-label count vectors as the node similarity, matches
  generated with the same seed-and-expand used for FSim.
- ``gfinder_like``: cost-based category (G-Finder [36]) — beam-search
  expansion minimizing missing-edge + label-mismatch cost.

All three run per query on a broadcast adjacency; the workload is the
parallel axis (``run_baseline_parallel``).
"""
from __future__ import annotations

from typing import Dict, List, Optional, Tuple

from pyspark.sql import SparkSession

from ..graphs.model import AdjGraph
from ..graphs.noise import Query
from .harness import f1_match, seed_expand

Pair = Tuple[int, int]


# ------------------------------------------------------------- TSpan-like

def tspan_like(q: Query, data: AdjGraph, max_missing: int,
               node_budget: int = 150_000) -> Optional[Dict[int, int]]:
    """Best label-exact assignment with <= ``max_missing`` missing edges.

    Iterative deepening on the missing-edge budget: exact matches are
    found with tight pruning before any budget is spent on sloppier
    thresholds (otherwise TSpan-3 exhausts its search budget on queries
    TSpan-1 solves instantly).
    """
    for x in range(max_missing + 1):
        r = _tspan_search(q, data, x, node_budget)
        if r is not None:
            return r
    return None


def _tspan_search(q: Query, data: AdjGraph, max_missing: int,
                  node_budget: int) -> Optional[Dict[int, int]]:
    """Branch-and-bound search at one missing-edge threshold."""
    by_label: Dict[str, List[int]] = {}
    for w, l in data.label.items():
        by_label.setdefault(l, []).append(w)
    if any(l not in by_label for l in q.labels.values()):
        return None  # a query label absent from the data: no results
    # query order: BFS from the max-degree node over undirected edges
    und: Dict[int, List[Tuple[int, str]]] = {i: [] for i in q.labels}
    for s, d in q.edges:
        und[s].append((d, "out"))
        und[d].append((s, "in"))
    start = max(q.labels, key=lambda i: len(und[i]))
    order: List[int] = [start]
    seen = {start}
    queue = [start]
    while queue:
        x = queue.pop(0)
        for y, _ in und[x]:
            if y not in seen:
                seen.add(y)
                order.append(y)
                queue.append(y)
    for i in q.labels:  # disconnected query nodes last
        if i not in seen:
            order.append(i)

    edge_set = set(q.edges)
    best: Dict[str, object] = {"miss": max_missing + 1, "assign": None}
    budget = {"n": node_budget}

    def missing_increase(qi: int, w: int, assign: Dict[int, int]) -> int:
        miss = 0
        for qj, wj in assign.items():
            if (qi, qj) in edge_set and wj not in data.out[w]:
                miss += 1
            if (qj, qi) in edge_set and wj not in data.inn[w]:
                miss += 1
        return miss

    def backtrack(pos: int, assign: Dict[int, int], used: set, miss: int) -> None:
        if budget["n"] <= 0 or miss >= best["miss"]:
            return
        if pos == len(order):
            best["miss"] = miss
            best["assign"] = dict(assign)
            return
        qi = order[pos]
        # candidates: right-direction neighbors of matched images first,
        # falling back to all same-label nodes (bounded) when allowed.
        cands: List[int] = []
        cset = set()
        for qj, wj in assign.items():
            pools = []
            if (qj, qi) in edge_set:
                pools.append(data.out[wj])
            if (qi, qj) in edge_set:
                pools.append(data.inn[wj])
            for pool in pools:
                for w in pool:
                    if w not in cset and w not in used \
                            and data.label[w] == q.labels[qi]:
                        cset.add(w)
                        cands.append(w)
        if not assign or miss + 1 <= max_missing:
            for w in by_label[q.labels[qi]][:200]:
                if w not in cset and w not in used:
                    cset.add(w)
                    cands.append(w)
        for w in cands:
            budget["n"] -= 1
            if budget["n"] <= 0:
                return
            inc = missing_increase(qi, w, assign)
            if miss + inc >= best["miss"]:
                continue
            assign[qi] = w
            used.add(w)
            backtrack(pos + 1, assign, used, miss + inc)
            del assign[qi]
            used.discard(w)

    backtrack(0, {}, set(), 0)
    return best["assign"]  # type: ignore[return-value]


# -------------------------------------------------------------- NAGA-like

def _neighbor_label_counts(w: int, data: AdjGraph) -> Dict[str, int]:
    c: Dict[str, int] = {}
    for n in data.out[w] + data.inn[w]:
        l = data.label[n]
        c[l] = c.get(l, 0) + 1
    return c


def naga_like(q: Query, data: AdjGraph) -> Dict[int, int]:
    """Chi-square neighbor-statistics similarity + seed-and-expand."""
    qadj: Dict[int, List[int]] = {i: [] for i in q.labels}
    for s, d in q.edges:
        qadj[s].append(d)
        qadj[d].append(s)
    qcounts = {
        i: _count_labels([q.labels[j] for j in qadj[i]]) for i in q.labels
    }
    score: Dict[Pair, float] = {}
    for i, ql in q.labels.items():
        for w, wl in data.label.items():
            if wl != ql:
                continue
            wc = _neighbor_label_counts(w, data)
            chi = 0.0
            for l in set(qcounts[i]) | set(wc):
                o = qcounts[i].get(l, 0)
                e = wc.get(l, 0)
                chi += (o - e) ** 2 / (e + 1.0)
            score[(i, w)] = 1.0 / (1.0 + chi)
    return seed_expand(q, score, data)


def _count_labels(labels: List[str]) -> Dict[str, int]:
    c: Dict[str, int] = {}
    for l in labels:
        c[l] = c.get(l, 0) + 1
    return c


# ----------------------------------------------------------- GFinder-like

def gfinder_like(q: Query, data: AdjGraph, beam: int = 8,
                 cand_cap: int = 60) -> Dict[int, int]:
    """Beam search minimizing missing-edge + label-mismatch cost."""
    und: Dict[int, List[int]] = {i: [] for i in q.labels}
    for s, d in q.edges:
        und[s].append(d)
        und[d].append(s)
    start = max(q.labels, key=lambda i: len(und[i]))
    order = [start]
    seen = {start}
    queue = [start]
    while queue:
        x = queue.pop(0)
        for y in und[x]:
            if y not in seen:
                seen.add(y)
                order.append(y)
                queue.append(y)
    for i in q.labels:
        if i not in seen:
            order.append(i)
    edge_set = set(q.edges)
    by_label: Dict[str, List[int]] = {}
    for w, l in data.label.items():
        by_label.setdefault(l, []).append(w)

    def step_cost(qi: int, w: int, assign: Dict[int, int]) -> float:
        c = 0.0 if data.label[w] == q.labels[qi] else 2.0
        for qj, wj in assign.items():
            if (qi, qj) in edge_set and wj not in data.out[w]:
                c += 1.0
            if (qj, qi) in edge_set and wj not in data.inn[w]:
                c += 1.0
        return c

    states: List[Tuple[float, Dict[int, int]]] = [(0.0, {})]
    for depth, qi in enumerate(order):
        # wide beam while the partial match is unconstrained (every
        # same-label candidate has cost 0 at depth 0), narrow later
        width = beam * 4 if depth < 2 else beam
        nxt: List[Tuple[float, Dict[int, int]]] = []
        for cost, assign in states:
            used = set(assign.values())
            cands: List[int] = []
            cset = set()
            for qj, wj in assign.items():
                if (qj, qi) in edge_set or (qi, qj) in edge_set:
                    for w in data.out[wj] + data.inn[wj]:
                        if w not in used and w not in cset:
                            cset.add(w)
                            cands.append(w)
            for w in by_label.get(q.labels[qi], [])[:cand_cap]:
                if w not in used and w not in cset:
                    cset.add(w)
                    cands.append(w)
            scored = sorted(
                ((cost + step_cost(qi, w, assign), w) for w in cands),
                key=lambda t: t[0],
            )[:width]
            for c, w in scored:
                a2 = dict(assign)
                a2[qi] = w
                nxt.append((c, a2))
        nxt.sort(key=lambda t: t[0])
        states = nxt[:width] or states
    return states[0][1] if states else {}


# ------------------------------------------------------- parallel runner

def run_baseline_parallel(
    spark: SparkSession, queries: List[Query], data: AdjGraph, which: str,
    **kw,
) -> Optional[float]:
    """Average F1 (percent) of a per-query baseline across the workload.

    Parallelizes over queries with a broadcast adjacency. Returns None
    when the baseline produces no result for every query (TSpan under
    label noise — reported as '-' like the paper).
    """
    from ..exact.pysim import strong_simulation_match  # local import: ships to executors
    from .harness import f1_match_nodeset

    bc = spark.sparkContext.broadcast(data)

    def eval_query(q: Query) -> Optional[float]:
        d = bc.value
        if which == "tspan":
            a = tspan_like(q, d, max_missing=kw.get("max_missing", 1))
            return None if a is None else f1_match(q, a)
        if which == "naga":
            return f1_match(q, naga_like(q, d))
        if which == "gfinder":
            return f1_match(q, gfinder_like(q, d))
        if which == "strong":
            phi = strong_simulation_match(q.labels, q.edges, d.label, d.out, d.inn)
            return f1_match_nodeset(q, phi)
        raise ValueError(which)

    results = (
        spark.sparkContext.parallelize(queries, min(len(queries), 16))
        .map(eval_query)
        .collect()
    )
    valid = [r for r in results if r is not None]
    if not valid:
        return None
    # queries with no result count as F1 = 0 (a miss), like the paper's
    # averaging — unless *every* query failed (reported as '-')
    total = sum(r if r is not None else 0.0 for r in results)
    return 100.0 * total / len(results)
