"""Reconstruction of the paper's Figure 1 toy graphs (for Table 2).

The exact figure is not in the text, but Examples 1 and 3 pin down the
structure needed for every verdict in Table 2:

- ``u`` (label ``A``) has three out-neighbors — two hexagons (``H``) and
  one pentagon (``P``) — and no in-neighbors (Example 1).
- ``v1`` (label ``A``) has no pentagon out-neighbor, so it fails to
  s-simulate ``u`` (Example 1). We give it a hexagon and a square.
- ``v2`` has exactly one hexagon and one pentagon: it s-simulates ``u``
  (both hexagons map to the single hexagon, Example 1), b-simulates it
  (each of v2's neighbors simulates a neighbor of u), but cannot
  dp-simulate it — two hexagons cannot inject into one (Example 3).
- ``v3`` has two hexagons, a pentagon and a square: dp holds (inject
  3 neighbors into the matching 3), but b fails because the square
  neighbor simulates no neighbor of u (Example 3).
- ``v4`` has exactly two hexagons and a pentagon — bijective, so every
  variant holds.

All leaf nodes have no further out-edges, so the verdict grid of
Table 2 is fully determined and is asserted in tests.
"""
from __future__ import annotations

from typing import Dict, List, Tuple

from pyspark.sql import SparkSession

from .model import Graph

# G1: node 0 = u; 1,2 = hexagons; 3 = pentagon.
G1_LABELS: Dict[int, str] = {0: "A", 1: "H", 2: "H", 3: "P"}
G1_EDGES: List[Tuple[int, int]] = [(0, 1), (0, 2), (0, 3)]

# G2: four candidate roots v1..v4 with their leaf neighborhoods.
G2_LABELS: Dict[int, str] = {
    10: "A", 11: "H", 12: "Q",                      # v1 -> {hex, square}
    20: "A", 21: "H", 22: "P",                      # v2 -> {hex, pent}
    30: "A", 31: "H", 32: "H", 33: "P", 34: "Q",    # v3 -> {hex, hex, pent, square}
    40: "A", 41: "H", 42: "H", 43: "P",             # v4 -> {hex, hex, pent}
}
G2_EDGES: List[Tuple[int, int]] = [
    (10, 11), (10, 12),
    (20, 21), (20, 22),
    (30, 31), (30, 32), (30, 33), (30, 34),
    (40, 41), (40, 42), (40, 43),
]

U = 0
V = {"v1": 10, "v2": 20, "v3": 30, "v4": 40}

# Paper Table 2: exact verdicts and fractional scores per variant.
PAPER_TABLE2 = {
    "s": {"v1": (False, 0.85), "v2": (True, 1.00), "v3": (True, 1.00), "v4": (True, 1.00)},
    "dp": {"v1": (False, 0.72), "v2": (False, 0.85), "v3": (True, 1.00), "v4": (True, 1.00)},
    "b": {"v1": (False, 0.78), "v2": (True, 1.00), "v3": (False, 0.93), "v4": (True, 1.00)},
    "bj": {"v1": (False, 0.72), "v2": (False, 0.81), "v3": (False, 0.94), "v4": (True, 1.00)},
}


def figure1_graphs(spark: SparkSession) -> Tuple[Graph, Graph]:
    """Return (G1, G2) Spark graphs for Figure 1."""
    return (
        Graph.from_edge_list(spark, G1_LABELS, G1_EDGES),
        Graph.from_edge_list(spark, G2_LABELS, G2_EDGES),
    )


def figure1_py() -> Tuple[Dict[int, str], List[Tuple[int, int]], Dict[int, str], List[Tuple[int, int]]]:
    """Driver-side (labels1, edges1, labels2, edges2) for the Python kernels."""
    return G1_LABELS, G1_EDGES, G2_LABELS, G2_EDGES
