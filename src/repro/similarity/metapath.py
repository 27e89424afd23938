"""Meta-path similarity baselines for the DBIS case study (Tables 7-8).

PathSim [41], JoinSim [42] and PCRW [40] over the venue-author commuting
structure of the ``author -> paper -> venue`` graph (the V-P-A-P-V
meta-path): two venues are similar when they share publishing authors.

Everything is expressed as DataFrame joins/aggregations:

- ``AV(a, v, w)``: author-venue path counts (one join),
- commuting matrix ``M(v1, v2) = sum_a w(a,v1) * w(a,v2)`` (self-join),
- PathSim  = 2 M12 / (M11 + M22),
- JoinSim  =   M12 / sqrt(M11 * M22),
- PCRW     = random-walk probability along the meta-path with uniform
  per-step transition probabilities (asymmetric).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..graphs.model import Graph


def author_venue_counts(g: Graph) -> DataFrame:
    """``(a, v, w)``: number of papers by author ``a`` in venue ``v``.

    Assumes the DBIS layout: edges are author->paper and paper->venue,
    venue nodes labeled 'V', paper nodes 'P'.
    """
    lab = g.nodes.select("id", "label")
    papers = lab.filter(F.col("label") == "P").select(F.col("id").alias("p"))
    venues = lab.filter(F.col("label") == "V").select(F.col("id").alias("v"))
    ap = (g.edges.select(F.col("src").alias("a"), F.col("dst").alias("p"))
          .join(papers, "p"))
    pv = (g.edges.select(F.col("src").alias("p"), F.col("dst").alias("v"))
          .join(venues, "v"))
    return (ap.join(pv, "p")
            .groupBy("a", "v").agg(F.count("*").cast("double").alias("w")))


def commuting_matrix(av: DataFrame) -> DataFrame:
    """``M(v1, v2)`` of the V-P-A-P-V meta-path (includes the diagonal)."""
    left = av.select("a", F.col("v").alias("v1"), F.col("w").alias("w1"))
    right = av.select("a", F.col("v").alias("v2"), F.col("w").alias("w2"))
    return (left.join(right, "a")
            .groupBy("v1", "v2")
            .agg(F.sum(F.col("w1") * F.col("w2")).alias("m")))


def _with_diagonal(m: DataFrame) -> DataFrame:
    diag = (m.filter(F.col("v1") == F.col("v2"))
            .select(F.col("v1").alias("vd"), F.col("m").alias("mdiag")))
    return (
        m.join(diag.withColumnRenamed("vd", "v1").withColumnRenamed("mdiag", "m11"),
               "v1")
        .join(diag.withColumnRenamed("vd", "v2").withColumnRenamed("mdiag", "m22"),
              "v2")
    )


def pathsim(g: Graph) -> DataFrame:
    """PathSim venue-venue scores: ``(v1, v2, score)``."""
    m = _with_diagonal(commuting_matrix(author_venue_counts(g)))
    return m.select(
        "v1", "v2", (2.0 * F.col("m") / (F.col("m11") + F.col("m22"))).alias("score")
    )


def joinsim(g: Graph) -> DataFrame:
    """JoinSim venue-venue scores: ``(v1, v2, score)``."""
    m = _with_diagonal(commuting_matrix(author_venue_counts(g)))
    return m.select(
        "v1", "v2", (F.col("m") / F.sqrt(F.col("m11") * F.col("m22"))).alias("score")
    )


def pcrw(g: Graph) -> DataFrame:
    """Path-constrained random-walk probability from v1 to v2.

    Uniform steps: venue -> one of its papers -> one of its authors ->
    one of the author's papers -> that paper's venue.
    """
    av = author_venue_counts(g)
    # P(a | v): walk venue -> paper -> author. #paths(v -> a) = w(a, v);
    # normalize per start venue by total paths out of v (uniform-step
    # equivalent when papers have similar author counts; exact uniform
    # factors cancel in the ranking, which is what Tables 7-8 use).
    tot_v = av.groupBy("v").agg(F.sum("w").alias("tv"))
    p_va = (av.join(tot_v, "v")
            .select(F.col("v").alias("v1"), "a", (F.col("w") / F.col("tv")).alias("p1")))
    tot_a = av.groupBy("a").agg(F.sum("w").alias("ta"))
    p_av = (av.join(tot_a, "a")
            .select("a", F.col("v").alias("v2"), (F.col("w") / F.col("ta")).alias("p2")))
    return (p_va.join(p_av, "a")
            .groupBy("v1", "v2")
            .agg(F.sum(F.col("p1") * F.col("p2")).alias("score")))
