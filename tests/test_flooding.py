"""Unit tests for similarity flooding and layout similarity."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.elements import Box
from repro.core.flooding import (
    edge_feature_arrays,
    flood,
    layout_similarity,
    sim_directed,
    similarity_bound,
)
from repro.core.grid import csv_to_type_grid
from repro.core.layout import Layout
from repro.core.mondrian import analyze_file


def make_layout(boxes, hists=None):
    if hists is None:
        rng = np.random.default_rng(42)
        hists = rng.random((len(boxes), 192)) * 10
    return Layout(boxes, hists)


BOXES = [Box(0, 0, 4, 4), Box(0, 7, 4, 12), Box(7, 0, 9, 4)]


class TestSimilarityBound:
    def test_equal_sizes(self):
        assert similarity_bound(5, 5) == 1.0

    def test_ratio(self):
        assert similarity_bound(2, 4) == 0.5
        assert similarity_bound(4, 2) == 0.5

    def test_empty_graphs(self):
        assert similarity_bound(0, 0) == 1.0
        assert similarity_bound(0, 3) == 0.0


class TestEdgeFeatures:
    def test_self_loops_coded_invalid(self):
        g = make_layout(BOXES)
        dirs, _, _ = edge_feature_arrays(g)
        assert (np.diag(dirs) == -1).all()

    def test_symmetric_features(self):
        g = make_layout(BOXES)
        dirs, mags, dists = edge_feature_arrays(g)
        assert (dirs == dirs.T).all()
        assert (mags == mags.T).all()
        assert (dists == dists.T).all()


class TestFlood:
    def test_identical_layouts_fixpoint_one(self):
        """The correct correspondence of two identical layouts floods to
        similarity 1 on the diagonal (DESIGN.md normalization note)."""
        rng = np.random.default_rng(0)
        hists = rng.random((3, 192)) * 5
        g = Layout(BOXES, hists)
        sigma = flood(g, g)
        assert np.diag(sigma) == pytest.approx(np.ones(3), abs=1e-6)

    def test_values_in_unit_interval(self):
        a = make_layout(BOXES)
        b = make_layout([Box(0, 0, 3, 3), Box(0, 6, 3, 9)])
        sigma = flood(a, b)
        assert (sigma >= 0).all() and (sigma <= 1 + 1e-9).all()

    def test_shape(self):
        a = make_layout(BOXES)
        b = make_layout([Box(0, 0, 3, 3), Box(0, 6, 3, 9)])
        assert flood(a, b).shape == (3, 2)

    def test_single_node_side_uses_sigma0_only(self):
        rng = np.random.default_rng(1)
        h = rng.random((1, 192))
        a = Layout([Box(0, 0, 2, 2)], h)
        b = make_layout(BOXES)
        sigma = flood(a, b)
        from repro.core.region_sim import correlation_matrix

        assert sigma == pytest.approx(correlation_matrix(a.hists, b.hists))

    def test_empty_side(self):
        a = Layout([], np.zeros((0, 192)))
        b = make_layout(BOXES)
        assert flood(a, b).shape == (0, 3)


class TestSimilarity:
    def test_identical_layouts_similarity_one(self):
        g = make_layout(BOXES)
        assert layout_similarity(g, g) == pytest.approx(1.0, abs=1e-6)

    def test_bounded_by_node_ratio(self):
        a = make_layout(BOXES)
        b = make_layout([Box(0, 0, 3, 3)], a.hists[:1])
        assert layout_similarity(a, b) <= similarity_bound(3, 1) + 1e-9

    def test_empty_vs_empty(self):
        e = Layout([], np.zeros((0, 192)))
        assert layout_similarity(e, e) == 1.0

    def test_empty_vs_nonempty(self):
        e = Layout([], np.zeros((0, 192)))
        assert layout_similarity(e, make_layout(BOXES)) == 0.0

    def test_symmetric_average(self):
        a = make_layout(BOXES)
        b = make_layout([Box(0, 0, 4, 4), Box(0, 8, 4, 13), Box(8, 0, 10, 4)])
        assert layout_similarity(a, b) == pytest.approx(layout_similarity(b, a))

    def test_same_template_files_near_one(self):
        """Two near-identical multiregion files score ~>= 0.99."""
        base = "Table 1. Sales Report,,,\n,,,\nYear,Total,Avg,Max\n{rows}\n,,,\n,,,\nnotes in lowercase,,,\n"
        rows_a = "\n".join(f"{2000+i},{i*10},{i*1.5},{i*3}" for i in range(8))
        rows_b = "\n".join(f"{2010+i},{i*11},{i*2.5},{i*4}" for i in range(8))
        fa = analyze_file("a", base.format(rows=rows_a))
        fb = analyze_file("b", base.format(rows=rows_b))
        assert layout_similarity(fa.layout, fb.layout) >= 0.99

    def test_different_layouts_below_threshold(self):
        csv_a = "Title Here,,\n,,\nA,B,C\n1,2,3\n4,5,6\n"
        csv_b = "9:00,10:00\n11:00,12:00\n13:00,14:00\n"
        fa = analyze_file("a", csv_a)
        fb = analyze_file("b", csv_b)
        assert layout_similarity(fa.layout, fb.layout) < 0.99

    def test_directed_scores_close_for_similar_graphs(self):
        a = make_layout(BOXES)
        assert sim_directed(a, a) == pytest.approx(1.0, abs=1e-6)
