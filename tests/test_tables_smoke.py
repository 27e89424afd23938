"""Every table driver produces a well-formed paper-vs-measured frame at
micro scale, and Table 2's verdict grid matches the paper exactly."""
import pytest

from repro.tables import table2, table4, table5, table6, table7, table8, table9


class TestTable2:
    @pytest.fixture(scope="class")
    def df(self, spark):
        return table2.run(spark, eps=1e-2)

    def test_shape(self, df):
        assert len(df) == 16  # 4 variants x 4 pairs

    def test_verdicts_match_paper(self, df):
        assert (df.our_verdict == df.paper_verdict).all()

    def test_scores_one_iff_verdict(self, df):
        hit = df[df.our_verdict]
        miss = df[~df.our_verdict]
        assert (hit.our_score >= 0.999).all()
        assert (miss.our_score < 0.999).all()


class TestTable4:
    def test_two_datasets(self, spark):
        df = table4.run(spark, scale=0.002, names=["Yeast", "GP"])
        assert list(df.dataset) == ["Yeast", "GP"]
        assert (df.our_V > 0).all() and (df.our_E > 0).all()
        assert (df.our_labels <= df.paper_labels).all()
        # degree skew present: max in-degree well above the average
        assert (df.our_max_din > df.our_avg_deg).all()


class TestTable5:
    def test_micro(self, spark):
        df = table5.run(spark, scale=0.0006, eps=5e-2)
        assert len(df) == 12  # 3 pairs x 4 variants
        assert df.our_pearson.notna().all()
        # the paper's shape: strong correlation across initializations
        assert (df.our_pearson > 0.5).all()


class TestTable6:
    def test_micro(self, spark):
        df = table6.run(spark, scale=0.0005, n_queries=4, eps=5e-2)
        assert set(df.scenario) == {"Exact", "Noisy-E", "Noisy-L", "Combined"}
        assert set(df.algorithm) == {"NAGA", "G-Finder", "TSpan-1", "TSpan-3",
                                     "StrongSim", "FSim_s", "FSim_dp"}
        ours = df[df.algorithm == "FSim_s"].set_index("scenario").our_f1
        assert ours["Exact"] >= 50.0


class TestTables78:
    @pytest.fixture(scope="class")
    def frames(self, spark):
        kw = dict(n_venues=32, n_papers=110, n_authors=80)
        return (table7.run(spark, **kw, eps=5e-2),
                table8.run(spark, **kw, eps=5e-2))

    def test_table7_shape(self, frames):
        df7 = frames[0]
        assert list(df7["rank"]) == [1, 2, 3, 4, 5]
        assert (df7.our_FSim_bj.iloc[0]) == "WWW"  # self on top

    def test_table8_shape(self, frames):
        df8 = frames[1]
        assert len(df8) == 6
        assert df8.our_ndcg.between(0, 1).all()


class TestTable9:
    def test_micro(self, spark):
        df = table9.run(spark, n_nodes=120, n_edges=260, eps=5e-2)
        assert set(df.graphs) == {"G1-G2", "G1-G3"}
        assert df.our_f1.between(0, 100).all()
        piv = df.pivot(index="algorithm", columns="graphs", values="our_f1")
        # the headline shape: FSim dominates the bisimulation family
        assert piv.loc["FSim_b", "G1-G2"] > piv.loc["4-bisim", "G1-G2"]
