"""Meta-path measures (PathSim/JoinSim/PCRW) vs DuckDB SQL oracle, and
nSimGram-like q-gram similarity vs hand computation."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graphs.generators import dbis_like_pd
from repro.graphs.model import Graph
from repro.oracle import assert_equivalent
from repro.similarity.metapath import (author_venue_counts, commuting_matrix,
                                       joinsim, pathsim, pcrw)
from repro.similarity.nsimgram import gram_counts, nsimgram


@pytest.fixture(scope="module")
def dbis(spark):
    nodes, edges, vmeta = dbis_like_pd(n_venues=31, n_papers=90, n_authors=70,
                                       seed=5)
    return Graph.from_pandas(spark, nodes, edges), nodes, edges, vmeta


class TestMetaPathOracle:
    def test_author_venue_counts_vs_duckdb(self, spark, dbis):
        g, nodes, edges, vmeta = dbis
        got = author_venue_counts(g)
        assert_equivalent(
            got,
            """
            WITH papers AS (SELECT id FROM nodes WHERE label = 'P'),
                 venues AS (SELECT id FROM nodes WHERE label = 'V'),
                 ap AS (SELECT e.src AS a, e.dst AS p FROM edges e
                        JOIN papers ON e.dst = papers.id),
                 pv AS (SELECT e.src AS p, e.dst AS v FROM edges e
                        JOIN venues ON e.dst = venues.id)
            SELECT ap.a AS a, pv.v AS v, CAST(count(*) AS DOUBLE) AS w
            FROM ap JOIN pv ON ap.p = pv.p
            GROUP BY ap.a, pv.v
            """,
            nodes=nodes, edges=edges,
        )

    def test_commuting_matrix_vs_duckdb(self, spark, dbis):
        g, nodes, edges, vmeta = dbis
        av = author_venue_counts(g)
        av_pd = av.toPandas()
        assert_equivalent(
            commuting_matrix(av),
            """
            SELECT l.v AS v1, r.v AS v2, sum(l.w * r.w) AS m
            FROM av l JOIN av r ON l.a = r.a
            GROUP BY l.v, r.v
            """,
            av=av_pd,
        )

    def test_pathsim_properties(self, spark, dbis):
        g = dbis[0]
        pdf = pathsim(g).toPandas()
        diag = pdf[pdf.v1 == pdf.v2]
        assert (diag.score - 1.0).abs().max() < 1e-9  # self-similarity = 1
        m = pdf.set_index(["v1", "v2"]).score
        for (a, b) in list(m.index)[:50]:
            assert m[(a, b)] == pytest.approx(m.get((b, a)), abs=1e-9)

    def test_joinsim_range(self, spark, dbis):
        pdf = joinsim(dbis[0]).toPandas()
        assert (pdf.score <= 1.0 + 1e-9).all()
        assert (pdf.score > 0).all()

    def test_pcrw_rows_sum_to_at_most_one(self, spark, dbis):
        pdf = pcrw(dbis[0]).toPandas()
        sums = pdf.groupby("v1").score.sum()
        assert (sums <= 1.0 + 1e-9).all()

    def test_pcrw_asymmetric(self, spark, dbis):
        pdf = pcrw(dbis[0]).toPandas().set_index(["v1", "v2"]).score
        assert any(
            abs(pdf[(a, b)] - pdf.get((b, a), 0.0)) > 1e-12
            for (a, b) in list(pdf.index)[:200] if a != b
        )


class TestNSimGram:
    def test_gram_counts_tiny_chain(self, spark):
        # author 2 -> paper 1 -> venue 0
        g = Graph.from_edge_list(spark, {0: "V", 1: "P", 2: "A7"},
                                 [(1, 0), (2, 1)])
        src = spark.createDataFrame(pd.DataFrame({"id": [0]}), "id long")
        got = {(r["gram"]): r["cnt"]
               for r in gram_counts(g, q=3, sources=src).collect()}
        assert got == {"V": 1.0, "V>P": 1.0, "V>P>A7": 1.0, "V>P>V": 1.0}

    def test_cosine_self_similarity(self, spark, dbis):
        g, nodes, edges, vmeta = dbis
        venues = spark.createDataFrame(vmeta[["id"]].astype({"id": "int64"}),
                                       "id long")
        pdf = nsimgram(g, q=2, sources=venues).toPandas()
        diag = pdf[pdf.v1 == pdf.v2]
        assert (diag.score - 1.0).abs().max() < 1e-9

    def test_cosine_symmetric(self, spark, dbis):
        g, nodes, edges, vmeta = dbis
        venues = spark.createDataFrame(vmeta[["id"]].astype({"id": "int64"}),
                                       "id long")
        pdf = nsimgram(g, q=2, sources=venues).toPandas()
        m = pdf.set_index(["v1", "v2"]).score
        for (a, b) in list(m.index)[:50]:
            assert m[(a, b)] == pytest.approx(m.get((b, a)), abs=1e-9)
