"""Synthetic-data generators: determinism, statistics shape, structure."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.generators import (DATASET_SPECS, NAMED_VENUES,
                                     SUBJECT_VENUES, dataset_pd, dbis_like_pd,
                                     evolving_graphs_pd, labeled_powerlaw_pd)


class TestLabeledPowerlaw:
    def test_shapes(self):
        nodes, edges = labeled_powerlaw_pd(100, 300, 5, seed=1)
        assert len(nodes) == 100
        assert len(edges) <= 300
        assert len(edges) >= 250  # oversampling covers most of the target
        assert set(nodes.columns) == {"id", "label"}
        assert set(edges.columns) == {"src", "dst"}

    def test_deterministic(self):
        a = labeled_powerlaw_pd(80, 200, 4, seed=9)
        b = labeled_powerlaw_pd(80, 200, 4, seed=9)
        pd.testing.assert_frame_equal(a[0], b[0])
        pd.testing.assert_frame_equal(a[1], b[1])

    def test_seed_changes_output(self):
        a = labeled_powerlaw_pd(80, 200, 4, seed=1)[1]
        b = labeled_powerlaw_pd(80, 200, 4, seed=2)[1]
        assert not a.equals(b)

    def test_no_self_loops_or_dups(self):
        _, edges = labeled_powerlaw_pd(60, 250, 3, seed=3)
        assert (edges.src != edges.dst).all()
        assert not edges.duplicated().any()

    def test_label_count(self):
        nodes, _ = labeled_powerlaw_pd(200, 400, 7, seed=4)
        assert nodes.label.nunique() <= 7

    def test_degree_skew(self):
        # in-degree skew exponent produces a hub
        _, edges = labeled_powerlaw_pd(300, 900, 5, a_in=0.95, seed=5)
        top = edges.dst.value_counts().iloc[0]
        assert top > 900 / 300 * 4  # hub way above average

    def test_word_labels(self):
        nodes, _ = labeled_powerlaw_pd(50, 100, 10, label_style="words", seed=6)
        assert nodes.label.str.contains(":").all()


class TestDatasetSpecs:
    @pytest.mark.parametrize("name", list(DATASET_SPECS))
    def test_scaled_sizes(self, name):
        nodes, edges = dataset_pd(name, scale=0.002)
        spec = DATASET_SPECS[name]
        assert len(nodes) == max(60, int(spec["V"] * 0.002))
        assert len(edges) <= max(len(nodes), int(spec["E"] * 0.002))

    @pytest.mark.parametrize("name", list(DATASET_SPECS))
    def test_deterministic(self, name):
        a = dataset_pd(name, scale=0.001)
        b = dataset_pd(name, scale=0.001)
        pd.testing.assert_frame_equal(a[1], b[1])

    def test_datasets_differ(self):
        a = dataset_pd("Yeast", scale=0.01)[1]
        b = dataset_pd("Cora", scale=0.01)[1]
        assert not a.equals(b)


class TestDbis:
    def test_layout(self):
        nodes, edges, vmeta = dbis_like_pd(n_venues=35, n_papers=120,
                                           n_authors=90, seed=2)
        assert len(vmeta) == 35
        labels = nodes.set_index("id").label
        # venues first, labeled V; then papers P; authors named
        assert (labels.loc[vmeta.id] == "V").all()
        assert labels.str.fullmatch(r"V|P|A\d+").all()

    def test_edges_follow_schema(self):
        nodes, edges, vmeta = dbis_like_pd(n_venues=35, n_papers=120,
                                           n_authors=90, seed=2)
        labels = dict(zip(nodes.id, nodes.label))
        for s, d in zip(edges.src, edges.dst):
            if labels[d] == "V":
                assert labels[s] == "P"  # paper -> venue
            else:
                assert labels[d] == "P"  # author -> paper
                assert labels[s].startswith("A")

    def test_every_paper_has_venue_and_author(self):
        nodes, edges, vmeta = dbis_like_pd(n_venues=35, n_papers=120,
                                           n_authors=90, seed=2)
        labels = dict(zip(nodes.id, nodes.label))
        papers = {i for i, l in labels.items() if l == "P"}
        with_venue = set(edges[edges.dst.isin(vmeta.id)].src)
        with_author = set(edges[edges.dst.isin(papers)].dst)
        assert papers == with_venue
        assert papers == with_author

    def test_www_family_is_balanced(self):
        nodes, edges, vmeta = dbis_like_pd(n_venues=35, n_papers=200,
                                           n_authors=120, seed=2)
        www = vmeta[vmeta.name.str.startswith("WWW")]
        sizes = [len(edges[edges.dst == vid]) for vid in www.id]
        assert max(sizes) - min(sizes) <= 1  # structural twins

    def test_named_venues_have_area_and_tier(self):
        _, _, vmeta = dbis_like_pd(n_venues=35, n_papers=120, n_authors=90)
        for name in SUBJECT_VENUES:
            row = vmeta[vmeta.name == name]
            assert len(row) == 1
            assert row.tier.iloc[0] in (1, 2, 3)

    def test_named_venue_constants_consistent(self):
        names = [n for n, _, _ in NAMED_VENUES]
        assert len(names) == len(set(names))
        assert set(SUBJECT_VENUES) <= set(names)


class TestEvolvingGraphs:
    def test_versions_grow_monotonically(self):
        versions = evolving_graphs_pd(n_nodes=150, n_edges=350, n_versions=3,
                                      seed=4)
        for (n1, e1), (n2, e2) in zip(versions, versions[1:]):
            assert len(n2) > len(n1)
            assert len(e2) > len(e1)

    def test_growth_preserves_prefix(self):
        versions = evolving_graphs_pd(n_nodes=150, n_edges=350, n_versions=3,
                                      seed=4)
        n1, e1 = versions[0]
        n2, e2 = versions[1]
        # old nodes keep their ids and labels (identity ground truth)
        merged = n1.merge(n2, on="id", suffixes=("_a", "_b"))
        assert (merged.label_a == merged.label_b).all()
        # old edges survive
        old = set(zip(e1.src, e1.dst))
        new = set(zip(e2.src, e2.dst))
        assert old <= new

    def test_deterministic(self):
        a = evolving_graphs_pd(n_nodes=100, n_edges=220, seed=8)
        b = evolving_graphs_pd(n_nodes=100, n_edges=220, seed=8)
        for (na, ea), (nb, eb) in zip(a, b):
            pd.testing.assert_frame_equal(ea.reset_index(drop=True),
                                          eb.reset_index(drop=True))

    def test_label_alphabet_fixed(self):
        versions = evolving_graphs_pd(n_nodes=120, n_edges=260, n_labels=8,
                                      seed=4)
        labs0 = set(versions[0][0].label)
        for n, _ in versions[1:]:
            assert set(n.label) <= labs0
