"""Unit tests for layout graphs (Definition 9)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.elements import Box
from repro.core.layout import Layout


def L(boxes):
    return Layout(boxes, np.ones((len(boxes), 192)))


class TestLayout:
    def test_complete_graph_edge_count(self):
        g = L([Box(0, 0, 1, 1), Box(0, 4, 1, 5), Box(5, 0, 6, 1)])
        # Complete graph on 3 nodes: 3 undirected edges, stored both ways.
        assert len(g.edges) == 6

    def test_edge_labels(self):
        g = L([Box(0, 0, 2, 2), Box(0, 5, 2, 7)])
        e = g.edge(0, 1)
        assert e.direction == "H" and e.magnitude == 3 and e.distance == 2

    def test_overlapping_region_edge(self):
        g = L([Box(0, 0, 3, 2), Box(3, 2, 5, 4)])
        e = g.edge(0, 1)
        assert e.direction == "O" and e.magnitude == 1 and e.distance == 0

    def test_edge_symmetric(self):
        g = L([Box(0, 0, 1, 1), Box(4, 0, 6, 1)])
        assert g.edge(0, 1) is g.edge(1, 0)

    def test_self_edge_is_none(self):
        g = L([Box(0, 0, 1, 1), Box(4, 0, 6, 1)])
        assert g.edge(0, 0) is None

    def test_neighbors_complete(self):
        g = L([Box(0, 0, 1, 1), Box(0, 4, 1, 5), Box(5, 0, 6, 1)])
        assert g.neighbors(1) == [0, 2]

    def test_empty_layout(self):
        g = Layout([], np.zeros((0, 192)))
        assert len(g) == 0 and g.edges == {}

    def test_singleton_layout_has_no_edges(self):
        g = L([Box(0, 0, 3, 3)])
        assert len(g) == 1 and g.edges == {}

    def test_hist_shape_mismatch_raises(self):
        with pytest.raises(ValueError):
            Layout([Box(0, 0, 1, 1)], np.zeros((2, 192)))

    def test_from_regions(self):
        from repro.core.grid import csv_to_type_grid
        from repro.core.mondrian import detect_regions

        tg = csv_to_type_grid("1,1\n1,1\n\n\na b,c d\n")
        regions = detect_regions(tg, eps=1.5)
        g = Layout.from_regions(regions)
        assert len(g) == len(regions)
        assert g.hists.shape == (len(regions), 192)
