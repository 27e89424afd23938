"""Unit tests for the label similarity functions L(.) (core/labels)."""
import pytest

from repro.core.labels import (LABEL_FNS, edit_similarity, indicator, jaro,
                               jaro_winkler, label_sim_pd)

WORDS = ["abc", "abd", "xyz", "", "a", "concept:animal1", "concept:animal2",
         "item:city9", "MARTHA", "MARHTA", "DWAYNE", "DUANE"]


class TestIndicator:
    def test_equal(self):
        assert indicator("abc", "abc") == 1.0

    def test_different(self):
        assert indicator("abc", "abd") == 0.0

    def test_empty(self):
        assert indicator("", "") == 1.0


class TestEditSimilarity:
    def test_equal(self):
        assert edit_similarity("abc", "abc") == 1.0

    def test_single_substitution(self):
        assert edit_similarity("abc", "abd") == pytest.approx(2 / 3)

    def test_disjoint(self):
        assert edit_similarity("abc", "xyz") == 0.0

    def test_insertion(self):
        assert edit_similarity("abc", "abcd") == pytest.approx(3 / 4)

    def test_empty_vs_word(self):
        assert edit_similarity("", "abc") == 0.0

    @pytest.mark.parametrize("a", WORDS)
    @pytest.mark.parametrize("b", WORDS)
    def test_symmetric(self, a, b):
        assert edit_similarity(a, b) == pytest.approx(edit_similarity(b, a))

    @pytest.mark.parametrize("a,b", [(a, b) for a in WORDS for b in WORDS])
    def test_range_and_identity(self, a, b):
        s = edit_similarity(a, b)
        assert 0.0 <= s <= 1.0
        # well-definiteness: L = 1 iff labels equal
        assert (s == 1.0) == (a == b)


class TestJaroWinkler:
    def test_equal(self):
        assert jaro_winkler("abc", "abc") == 1.0

    def test_known_martha(self):
        # classic textbook value for MARTHA/MARHTA
        assert jaro("MARTHA", "MARHTA") == pytest.approx(0.944, abs=1e-3)

    def test_known_dwayne(self):
        assert jaro("DWAYNE", "DUANE") == pytest.approx(0.822, abs=1e-3)

    def test_prefix_boost(self):
        assert jaro_winkler("MARTHA", "MARHTA") > jaro("MARTHA", "MARHTA")

    def test_empty(self):
        assert jaro_winkler("", "abc") == 0.0

    @pytest.mark.parametrize("a,b", [(a, b) for a in WORDS for b in WORDS])
    def test_range_and_identity(self, a, b):
        s = jaro_winkler(a, b)
        assert 0.0 <= s <= 1.0
        # the cap keeps L < 1 for unequal labels (well-definiteness)
        assert (s == 1.0) == (a == b)

    @pytest.mark.parametrize("a", WORDS)
    @pytest.mark.parametrize("b", WORDS)
    def test_symmetric(self, a, b):
        assert jaro_winkler(a, b) == pytest.approx(jaro_winkler(b, a))


class TestLabelSimTable:
    def test_indicator_fast_path(self):
        pdf = label_sim_pd(["a", "b", "c"], ["b", "c", "d"], "indicator")
        assert set(zip(pdf.lab1, pdf.lab2)) == {("b", "b"), ("c", "c")}
        assert (pdf.lsim == 1.0).all()

    def test_min_sim_filters(self):
        pdf = label_sim_pd(["abc"], ["abd", "xyz"], "edit", min_sim=0.5)
        assert list(pdf.lab2) == ["abd"]

    def test_zero_pairs_omitted(self):
        pdf = label_sim_pd(["abc"], ["xyz"], "edit")
        assert len(pdf) == 0

    @pytest.mark.parametrize("fn", list(LABEL_FNS))
    def test_all_functions_produce_table(self, fn):
        pdf = label_sim_pd(["abc", "abd"], ["abc", "xyz"], fn)
        assert {"lab1", "lab2", "lsim"} == set(pdf.columns)
        diag = pdf[(pdf.lab1 == "abc") & (pdf.lab2 == "abc")]
        assert len(diag) == 1 and diag.lsim.iloc[0] == 1.0
