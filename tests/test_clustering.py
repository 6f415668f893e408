"""Unit tests for the element distance and the customized DBSCAN."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.clustering import (
    cluster_elements,
    dbscan,
    element_distance,
    pairwise_distances,
)
from repro.core.elements import Box


class TestElementDistance:
    def test_adjacent_aligned_fragments_are_close(self):
        # Two fragments of one table: same columns, adjacent rows.
        a, b = Box(0, 0, 5, 2), Box(0, 3, 5, 5)
        assert element_distance(a, b) < 1.0

    def test_one_gap_aligned_fragments_within_static_radius(self):
        # Separated by one empty row, identical column extents: the
        # Fig. 1 missing-value case must merge at eps = 1.5.
        a, b = Box(0, 0, 5, 2), Box(0, 4, 5, 6)
        assert element_distance(a, b) <= 1.5

    def test_two_gap_regions_outside_static_radius(self):
        # Two >= 2-empty-row-separated equal tables must NOT merge: the
        # alignment term is 0, so only the gap distance separates them --
        # it must exceed 1.5.
        a, b = Box(0, 0, 5, 4), Box(0, 7, 5, 11)
        assert element_distance(a, b) > 1.5

    def test_misaligned_neighbor_far(self):
        # Title cell vs table: adjacent rows but very different extents.
        title, table = Box(0, 0, 0, 0), Box(0, 2, 6, 10)
        assert element_distance(title, table) > 1.5

    def test_distance_symmetric(self):
        a, b = Box(0, 0, 2, 2), Box(4, 1, 9, 3)
        assert element_distance(a, b) == element_distance(b, a)

    def test_self_distance_zero(self):
        a = Box(1, 1, 4, 4)
        assert element_distance(a, a) == 0

    def test_alpha_weights_gap(self):
        a, b = Box(0, 0, 5, 2), Box(0, 5, 5, 7)  # 2-row gap, aligned
        d1 = element_distance(a, b, alpha=1.0, beta=0.0, gamma=0.0)
        d2 = element_distance(a, b, alpha=2.0, beta=0.0, gamma=0.0)
        assert d2 == pytest.approx(2 * d1) and d1 == pytest.approx(2.0)

    def test_beta_weights_size_difference(self):
        big, small = Box(0, 0, 9, 9), Box(11, 0, 11, 0)
        d = element_distance(big, small, alpha=0.0, beta=1.0, gamma=0.0)
        assert d == pytest.approx(1 - 1 / 100)

    def test_gamma_zero_when_aligned_either_axis(self):
        a, b = Box(0, 0, 5, 2), Box(0, 10, 5, 12)  # same columns
        assert element_distance(a, b, alpha=0.0, beta=0.0, gamma=1.0) == 0


class TestPairwiseVectorized:
    @settings(max_examples=40)
    @given(
        st.lists(
            st.builds(
                lambda x0, y0, w, h: Box(x0, y0, x0 + w, y0 + h),
                st.integers(0, 20),
                st.integers(0, 20),
                st.integers(0, 6),
                st.integers(0, 6),
            ),
            min_size=1,
            max_size=8,
        )
    )
    def test_matches_scalar_reference(self, boxes):
        D = pairwise_distances(boxes)
        for i, a in enumerate(boxes):
            for j, b in enumerate(boxes):
                if i == j:
                    assert D[i, j] == 0
                else:
                    assert D[i, j] == pytest.approx(element_distance(a, b))

    def test_empty_input(self):
        assert pairwise_distances([]).shape == (0, 0)


class TestDBSCAN:
    def _ring_distances(self, n):
        # Chain 0-1-2-...: consecutive at distance 1, others far.
        D = np.full((n, n), 100.0)
        np.fill_diagonal(D, 0)
        for i in range(n - 1):
            D[i, i + 1] = D[i + 1, i] = 1.0
        return D

    def test_chain_single_linkage(self):
        labels = dbscan(self._ring_distances(5), eps=1.0, min_pts=1)
        assert len(set(labels)) == 1

    def test_chain_breaks_below_eps(self):
        labels = dbscan(self._ring_distances(5), eps=0.5, min_pts=1)
        assert len(set(labels)) == 5

    def test_min_pts_one_has_no_noise(self):
        labels = dbscan(self._ring_distances(4), eps=0.5, min_pts=1)
        assert (labels >= 0).all()

    def test_min_pts_two_labels_noise(self):
        D = np.array([[0.0, 0.5, 9], [0.5, 0, 9], [9, 9, 0]])
        labels = dbscan(D, eps=1.0, min_pts=2)
        assert labels[0] == labels[1] == 0 and labels[2] == -1

    def test_two_clusters(self):
        D = np.full((4, 4), 50.0)
        np.fill_diagonal(D, 0)
        D[0, 1] = D[1, 0] = 0.5
        D[2, 3] = D[3, 2] = 0.5
        labels = dbscan(D, eps=1.0, min_pts=1)
        assert labels[0] == labels[1] and labels[2] == labels[3]
        assert labels[0] != labels[2]

    def test_empty(self):
        assert dbscan(np.zeros((0, 0)), eps=1.0).size == 0

    def test_labels_first_seen_order(self):
        D = np.full((3, 3), 50.0)
        np.fill_diagonal(D, 0)
        labels = dbscan(D, eps=1.0, min_pts=1)
        assert list(labels) == [0, 1, 2]

    @settings(max_examples=30)
    @given(st.integers(2, 8), st.floats(0.1, 5.0))
    def test_min_pts_one_equals_eps_graph_components(self, n, eps):
        rng = np.random.default_rng(n)
        pts = rng.random((n, 2)) * 4
        D = np.sqrt(((pts[:, None] - pts[None, :]) ** 2).sum(-1))
        labels = dbscan(D, eps=eps, min_pts=1)
        # Reference: union-find over the eps-neighborhood graph.
        parent = list(range(n))

        def find(i):
            while parent[i] != i:
                parent[i] = parent[parent[i]]
                i = parent[i]
            return i

        for i in range(n):
            for j in range(i + 1, n):
                if D[i, j] <= eps:
                    parent[find(i)] = find(j)
        groups = {}
        for i in range(n):
            groups.setdefault(find(i), set()).add(i)
        ours = {}
        for i, lbl in enumerate(labels):
            ours.setdefault(lbl, set()).add(i)
        assert set(map(frozenset, groups.values())) == set(map(frozenset, ours.values()))


class TestClusterElements:
    def test_table_fragments_merge_title_separate(self):
        title = Box(0, 0, 0, 0)
        frag1 = Box(0, 3, 5, 6)
        frag2 = Box(0, 8, 5, 10)  # one empty row inside the table
        labels = cluster_elements([title, frag1, frag2], eps=1.5)
        assert labels[1] == labels[2]
        assert labels[0] != labels[1]

    def test_small_radius_degenerates_to_components(self):
        """Sec. 5.3: radius <= 1 groups only adjacent elements."""
        frag1 = Box(0, 0, 5, 2)
        adj = Box(0, 3, 5, 3)  # directly adjacent to frag1
        frag2 = Box(0, 5, 5, 7)  # 1-row gap after adj
        labels = cluster_elements([frag1, adj, frag2], eps=0.4)
        assert labels[0] == labels[1]
        assert labels[2] != labels[0]
