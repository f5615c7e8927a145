"""Tests for the graph substrate and Table 2 stand-in datasets."""
import numpy as np
import pandas as pd
import pytest

from repro.graph.datasets import (
    all_datasets,
    dataset_stats,
    friendster_lite,
    mico_lite,
    orkut_lite,
    patents_lite,
    patents_lite_labeled,
)
from repro.graph.gengraph import from_edge_list, powerlaw_graph, with_labels


class TestPowerlawGenerator:
    def test_deterministic(self):
        a = powerlaw_graph(200, 600, seed=1).edges_pdf
        b = powerlaw_graph(200, 600, seed=1).edges_pdf
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_graph(self):
        a = powerlaw_graph(200, 600, seed=1).edges_pdf
        b = powerlaw_graph(200, 600, seed=2).edges_pdf
        assert not a.equals(b)

    def test_symmetric_no_self_loops(self):
        g = powerlaw_graph(200, 600, seed=3)
        e = g.edges_pdf
        assert (e.src != e.dst).all()
        rev = set(zip(e.dst, e.src))
        assert set(zip(e.src, e.dst)) == rev

    def test_no_duplicate_edges(self):
        e = powerlaw_graph(200, 600, seed=4).edges_pdf
        assert not e.duplicated().any()

    def test_edge_count_near_target(self):
        g = powerlaw_graph(300, 900, seed=5)
        assert 0.7 * 900 <= g.n_edges <= 900

    def test_degree_ordering(self):
        """§5.2: vertex ids are assigned in ascending degree order, so
        the symmetry-breaking '<' predicates prune along degree."""
        g = powerlaw_graph(300, 900, seed=6)
        deg = g.degrees().sort_index()
        assert (np.diff(deg.to_numpy()) >= 0).all()

    def test_heavy_tail(self):
        g = powerlaw_graph(1000, 5000, seed=7)
        deg = g.degrees()
        assert deg.max() > 5 * deg.mean()


class TestLabels:
    def test_with_labels_covers_all_vertices(self):
        g = with_labels(powerlaw_graph(200, 600, seed=8), 5, seed=8)
        vs = set(g.edges_pdf.src) | set(g.edges_pdf.dst)
        assert set(g.labels_pdf.v) == vs
        assert g.n_labels <= 5

    def test_labels_deterministic(self):
        a = with_labels(powerlaw_graph(100, 300, seed=9), 4, seed=9).labels_pdf
        b = with_labels(powerlaw_graph(100, 300, seed=9), 4, seed=9).labels_pdf
        pd.testing.assert_frame_equal(a, b)


class TestFromEdgeList:
    def test_dedupes_and_symmetrizes(self):
        g = from_edge_list([(0, 1), (1, 0), (1, 2), (2, 2)])
        assert g.n_edges == 2
        assert len(g.edges_pdf) == 4

    def test_labels_kept(self):
        g = from_edge_list([(0, 1)], labels={0: 1, 1: 2})
        assert g.label_dict() == {0: 1, 1: 2}

    def test_degree_order_conflicts_with_labels(self):
        with pytest.raises(ValueError):
            from_edge_list([(0, 1)], labels={0: 1, 1: 2}, degree_order=True)


class TestDatasets:
    def test_all_present(self):
        ds = all_datasets()
        assert set(ds) == {"MI", "PA", "PA-labeled", "OK", "FR"}

    def test_relative_structure_matches_table2(self):
        """The lite graphs preserve Table 2's relative shape: FR largest,
        MI smallest and labeled, OK densest."""
        mi, pa, ok, fr = mico_lite(), patents_lite(), orkut_lite(), friendster_lite()
        assert fr.n_vertices > pa.n_vertices > mi.n_vertices
        assert mi.n_labels is not None and pa.n_labels is None
        avg = lambda g: 2 * g.n_edges / g.n_vertices
        assert avg(ok) > avg(mi) and avg(ok) > avg(fr)

    def test_labeled_patents_smaller(self):
        assert patents_lite_labeled().n_vertices < patents_lite().n_vertices
        assert patents_lite_labeled().n_labels == 10

    def test_stats_table_shape(self):
        stats = dataset_stats()
        assert list(stats.columns) == ["G", "V", "E", "L", "max_deg", "avg_deg"]
        assert len(stats) == 5

    def test_stats_consistency(self):
        stats = dataset_stats().set_index("G")
        mi = mico_lite()
        assert stats.loc["MI", "V"] == mi.n_vertices
        assert stats.loc["MI", "E"] == mi.n_edges
        deg = mi.degrees()
        assert stats.loc["MI", "max_deg"] == deg.max()

    def test_caching(self):
        assert mico_lite() is mico_lite()

    def test_spark_roundtrip(self, sparks):
        g = mico_lite()
        edges = g.to_spark(sparks)
        assert edges.count() == len(g.edges_pdf)
        labels = g.labels_to_spark(sparks)
        assert labels.count() == len(g.labels_pdf)
