"""Section-4.3 configurations: SimRank inside FSimX vs a naive numpy
SimRank; RoleSim axioms (range, symmetry, automorphic confirmation)."""
import numpy as np
import pytest

from repro.core.configs import rolesim, simrank, symmetrize
from repro.graphs.model import Graph


def naive_simrank(n, edges, decay, iters):
    """Textbook SimRank [18]: in-neighbor average with pinned diagonal."""
    inn = {i: [] for i in range(n)}
    for s, d in edges:
        inn[d].append(s)
    s = np.eye(n)
    for _ in range(iters):
        new = np.zeros((n, n))
        for u in range(n):
            for v in range(n):
                if u == v:
                    new[u][v] = 1.0
                    continue
                if not inn[u] or not inn[v]:
                    continue
                tot = sum(s[x][y] for x in inn[u] for y in inn[v])
                new[u][v] = decay * tot / (len(inn[u]) * len(inn[v]))
        s = new
    return s


EDGES = [(0, 1), (0, 2), (1, 2), (2, 3), (3, 1), (3, 4)]
N = 5


class TestSimRankConfig:
    @pytest.fixture(scope="class")
    def scores(self, spark):
        g = Graph.from_edge_list(spark, {i: "X" for i in range(N)}, EDGES)
        pdf = simrank(spark, g, decay=0.8, iters=6).toPandas()
        return pdf.set_index(["u", "v"]).score

    def test_matches_naive(self, scores):
        ref = naive_simrank(N, EDGES, 0.8, 6)
        for (u, v), s in scores.items():
            assert s == pytest.approx(ref[u][v], abs=1e-9), (u, v)

    def test_diagonal_pinned(self, scores):
        for i in range(N):
            assert scores[(i, i)] == 1.0

    def test_symmetric(self, scores):
        for u in range(N):
            for v in range(N):
                assert scores[(u, v)] == pytest.approx(scores[(v, u)], abs=1e-9)


class TestRoleSimConfig:
    @pytest.fixture(scope="class")
    def star_scores(self, spark):
        # star: center 0 with leaves 1..3 (structurally equivalent leaves)
        edges = [(0, 1), (0, 2), (0, 3)]
        g = Graph.from_edge_list(spark, {i: "X" for i in range(4)}, edges)
        pdf = rolesim(spark, g, beta=0.2, eps=1e-4).toPandas()
        return pdf.set_index(["u", "v"]).score

    def test_automorphic_confirmation(self, star_scores):
        # equivalent leaves must reach similarity 1 (RoleSim axiom)
        for a in (1, 2, 3):
            for b in (1, 2, 3):
                assert star_scores[(a, b)] == pytest.approx(1.0, abs=1e-3)

    def test_range_and_beta_floor(self, star_scores):
        for s in star_scores.values:
            assert 0.2 - 1e-9 <= s <= 1.0 + 1e-9  # >= beta by construction

    def test_symmetric(self, star_scores):
        for (u, v), s in star_scores.items():
            assert s == pytest.approx(star_scores[(v, u)], abs=1e-9)

    def test_center_vs_leaf_below_one(self, star_scores):
        assert star_scores[(0, 1)] < 1.0


class TestSymmetrize:
    def test_both_directions_present(self, spark):
        g = Graph.from_edge_list(spark, {0: "A", 1: "B"}, [(0, 1)])
        und = symmetrize(g)
        rows = {(r["src"], r["dst"]) for r in und.edges.collect()}
        assert rows == {(0, 1), (1, 0)}

    def test_idempotent(self, spark):
        g = Graph.from_edge_list(spark, {0: "A", 1: "B"}, [(0, 1), (1, 0)])
        und = symmetrize(g)
        assert und.edges.count() == 2
