"""Unit tests for connected components and rectilinear partitioning."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.core.elements import Box
from repro.core.segmentation import (
    connected_components,
    partition_elements,
    row_runs,
    segment,
)


def M(rows: list[str]) -> np.ndarray:
    """'#' = non-empty cell, '.' = empty."""
    return np.array([[c == "#" for c in r] for r in rows], dtype=bool)


class TestRowRuns:
    def test_simple(self):
        assert row_runs(M(["##.#"])) == [(0, 0, 1), (0, 3, 3)]

    def test_empty(self):
        assert row_runs(M(["...."])) == []

    def test_multi_row(self):
        assert row_runs(M(["#.", ".#"])) == [(0, 0, 0), (1, 1, 1)]


class TestConnectedComponents:
    def test_single_component(self):
        labels = connected_components(M(["##", "##"]))
        assert set(labels.ravel()) == {0}

    def test_two_components(self):
        labels = connected_components(M(["#.#"]))
        assert labels[0, 0] == 0 and labels[0, 2] == 1 and labels[0, 1] == -1

    def test_diagonal_not_connected(self):
        """4-connectivity: diagonal contact does not merge."""
        labels = connected_components(M(["#.", ".#"]))
        assert labels[0, 0] != labels[1, 1]

    def test_l_shape_one_component(self):
        labels = connected_components(M(["#.", "##"]))
        assert labels[0, 0] == labels[1, 0] == labels[1, 1] == 0

    def test_u_shape_merges_late(self):
        # The two arms connect through the bottom row.
        labels = connected_components(M(["#.#", "#.#", "###"]))
        assert len(set(labels[labels >= 0])) == 1

    def test_background_is_minus_one(self):
        labels = connected_components(M(["..", ".."]))
        assert (labels == -1).all()

    def test_labels_deterministic_topleft_order(self):
        labels = connected_components(M(["..#", "#.."]))
        assert labels[0, 2] == 0 and labels[1, 0] == 1


class TestPartition:
    def _boxes(self, rows):
        return [b for _, b in partition_elements(connected_components(M(rows)))]

    def test_rectangle_single_element(self):
        assert self._boxes(["###", "###"]) == [Box(0, 0, 2, 1)]

    def test_l_shape_two_elements(self):
        # Run-merge decomposition of an L: top cell and wide bottom strip.
        boxes = self._boxes(["#..", "###"])
        assert len(boxes) == 2
        assert Box(0, 0, 0, 0) in boxes
        assert Box(0, 1, 2, 1) in boxes

    def test_t_shape(self):
        boxes = self._boxes(["###", ".#."])
        assert len(boxes) == 2
        assert Box(0, 0, 2, 0) in boxes and Box(1, 1, 1, 1) in boxes

    def test_column_stack_merges_vertically(self):
        # Identical column extents across consecutive rows merge into one
        # element (the non-concave edge is not cut).
        boxes = self._boxes([".#.", ".#.", ".#."])
        assert boxes == [Box(1, 0, 1, 2)]

    def test_two_adjacent_tables_different_width(self):
        """Fig. 5: adjacent regions form one component but partition apart."""
        rows = ["####.##", "####.##", "#######"]
        boxes = self._boxes(rows)
        # The two table bodies become separate elements.
        assert Box(0, 0, 3, 1) in boxes
        assert Box(5, 0, 6, 1) in boxes

    def test_partition_covers_component_exactly(self):
        rows = ["##..", "####", ".###"]
        mask = M(rows)
        boxes = self._boxes(rows)
        covered = np.zeros_like(mask)
        for b in boxes:
            assert not covered[b.y0 : b.y1 + 1, b.x0 : b.x1 + 1].any(), "overlap"
            covered[b.y0 : b.y1 + 1, b.x0 : b.x1 + 1] = True
        assert (covered == mask).all()

    def test_piece_count_bound(self):
        """Bajuelos et al.: a polygon with v concave vertices splits into
        at least v+1 and at most O(v^2) pieces; a rectangle stays whole."""
        assert len(self._boxes(["#####"])) == 1
        assert len(self._boxes(["#.", "##"])) == 2


class TestSegment:
    def test_type_grid_entry_point(self):
        tg = np.array([[1, 1, 0], [0, 0, 0], [0, 2, 2]], dtype=np.int8)
        boxes = segment(tg)
        assert boxes == [Box(0, 0, 1, 0), Box(1, 2, 2, 2)]

    def test_empty_grid(self):
        assert segment(np.zeros((3, 3), dtype=np.int8)) == []
        assert segment(np.zeros((0, 0), dtype=np.int8)) == []


@settings(max_examples=60)
@given(arrays(bool, st.tuples(st.integers(1, 12), st.integers(1, 12))))
def test_partition_is_exact_disjoint_cover(mask):
    labels = connected_components(mask)
    covered = np.zeros_like(mask)
    for lbl, b in partition_elements(labels):
        sub = labels[b.y0 : b.y1 + 1, b.x0 : b.x1 + 1]
        assert (sub == lbl).all(), "element spans outside its component"
        assert not covered[b.y0 : b.y1 + 1, b.x0 : b.x1 + 1].any()
        covered[b.y0 : b.y1 + 1, b.x0 : b.x1 + 1] = True
    assert (covered == mask).all()


@settings(max_examples=60)
@given(arrays(bool, st.tuples(st.integers(1, 12), st.integers(1, 12))))
def test_components_match_bfs_reference(mask):
    """Union-find labeling agrees with a straightforward BFS flood fill."""
    labels = connected_components(mask)
    # BFS reference.
    ref = np.full(mask.shape, -1)
    nxt = 0
    for y in range(mask.shape[0]):
        for x in range(mask.shape[1]):
            if mask[y, x] and ref[y, x] == -1:
                stack = [(y, x)]
                ref[y, x] = nxt
                while stack:
                    cy, cx = stack.pop()
                    for dy, dx in ((1, 0), (-1, 0), (0, 1), (0, -1)):
                        ny, nx_ = cy + dy, cx + dx
                        if (
                            0 <= ny < mask.shape[0]
                            and 0 <= nx_ < mask.shape[1]
                            and mask[ny, nx_]
                            and ref[ny, nx_] == -1
                        ):
                            ref[ny, nx_] = nxt
                            stack.append((ny, nx_))
                nxt += 1
    # Same partition (labels may be permuted, but both use top-left order
    # so they should be identical).
    assert (labels == ref).all()
