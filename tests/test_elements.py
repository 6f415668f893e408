"""Unit tests for Definitions 3-5 and 8 (alignment, magnitude, distance)."""
from __future__ import annotations

import math

import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core.elements import Box, alignment, distance, magnitude, relation


def box(x0, y0, x1, y1):
    return Box(x0, y0, x1, y1)


class TestBox:
    def test_dimensions(self):
        b = box(1, 2, 3, 5)
        assert b.width == 3 and b.height == 4 and b.area == 12

    def test_single_cell(self):
        b = box(0, 0, 0, 0)
        assert b.width == b.height == b.area == 1

    def test_degenerate_raises(self):
        with pytest.raises(ValueError):
            box(2, 0, 1, 0)
        with pytest.raises(ValueError):
            box(0, 2, 0, 1)

    def test_intersects(self):
        assert box(0, 0, 2, 2).intersects(box(2, 2, 3, 3))
        assert not box(0, 0, 1, 1).intersects(box(2, 2, 3, 3))


class TestAlignment:
    def test_v_alignment_shared_rows(self):
        # Side-by-side boxes sharing rows are "V" aligned (Def. 3).
        assert alignment(box(0, 0, 1, 3), box(5, 2, 6, 8)) == "V"

    def test_h_alignment_shared_cols(self):
        assert alignment(box(0, 0, 3, 1), box(1, 5, 2, 8)) == "H"

    def test_not_aligned(self):
        assert alignment(box(0, 0, 1, 1), box(5, 5, 6, 6)) == "N"

    def test_boundary_inclusive(self):
        # Projections touching at a single row/col count as aligned.
        assert alignment(box(0, 0, 1, 2), box(5, 2, 6, 4)) == "V"
        assert alignment(box(0, 0, 2, 1), box(2, 5, 4, 6)) == "H"

    def test_overlap_requires_flag(self):
        a, b = box(0, 0, 2, 2), box(1, 1, 3, 3)
        with pytest.raises(ValueError):
            alignment(a, b)
        assert alignment(a, b, allow_overlap=True) == "O"

    def test_symmetry(self):
        a, b = box(0, 0, 1, 3), box(5, 2, 6, 8)
        assert alignment(a, b) == alignment(b, a)


class TestMagnitude:
    def test_v_magnitude_is_shared_rows(self):
        # Rows 2..3 shared -> magnitude 2.
        assert magnitude(box(0, 0, 1, 3), box(5, 2, 6, 8)) == 2

    def test_h_magnitude_is_shared_cols(self):
        assert magnitude(box(0, 0, 3, 1), box(1, 5, 2, 8)) == 2

    def test_not_aligned_zero(self):
        assert magnitude(box(0, 0, 1, 1), box(5, 5, 6, 6)) == 0

    def test_overlap_magnitude_is_area(self):
        # Def. 8: overlap area = product of shared extents.
        a, b = box(0, 0, 2, 2), box(2, 2, 4, 4)
        assert magnitude(a, b, allow_overlap=True) == 1
        c, d = box(0, 0, 3, 3), box(2, 1, 5, 2)
        assert magnitude(c, d, allow_overlap=True) == 2 * 2

    def test_full_containment_magnitude(self):
        a, b = box(0, 0, 9, 9), box(2, 2, 4, 4)
        assert magnitude(a, b, allow_overlap=True) == b.area


class TestDistance:
    def test_adjacent_v_zero(self):
        # Columns 0..2 then 3..5, sharing rows: adjacent -> 0.
        assert distance(box(0, 0, 2, 2), box(3, 0, 5, 2)) == 0

    def test_adjacent_h_zero(self):
        assert distance(box(0, 0, 2, 2), box(0, 3, 2, 5)) == 0

    def test_v_gap_counts_empty_columns(self):
        # Columns 0..2 and 5..7: two empty columns between.
        assert distance(box(0, 0, 2, 2), box(5, 0, 7, 2)) == 2

    def test_h_gap_counts_empty_rows(self):
        assert distance(box(0, 0, 2, 2), box(0, 5, 2, 7)) == 2

    def test_diagonal_combines_gaps(self):
        # One empty col and one empty row diagonal gap -> sqrt(2).
        a, b = box(0, 0, 0, 0), box(2, 2, 2, 2)
        assert distance(a, b) == pytest.approx(math.sqrt(2))

    def test_overlap_distance_zero(self):
        assert distance(box(0, 0, 2, 2), box(1, 1, 3, 3), allow_overlap=True) == 0

    def test_symmetry(self):
        a, b = box(0, 0, 2, 2), box(5, 1, 7, 2)
        assert distance(a, b) == distance(b, a)


class TestRelation:
    def test_full_vector(self):
        a, b = box(0, 0, 2, 2), box(4, 1, 6, 3)
        assert relation(a, b) == ("V", 2, 1)

    def test_paper_figure3_overlap_example(self):
        """Fig. 3: regions overlapping in one cell -> ('O', 1, 0)."""
        r1, r2 = box(0, 0, 3, 2), box(3, 2, 5, 4)
        assert relation(r1, r2, allow_overlap=True) == ("O", 1, 0)


_boxes = st.builds(
    lambda x0, y0, w, h: Box(x0, y0, x0 + w, y0 + h),
    st.integers(0, 30),
    st.integers(0, 30),
    st.integers(0, 10),
    st.integers(0, 10),
)


@given(_boxes, _boxes)
def test_relation_symmetric(a, b):
    assert relation(a, b, allow_overlap=True) == relation(b, a, allow_overlap=True)


@given(_boxes, _boxes)
def test_distance_nonnegative(a, b):
    assert distance(a, b, allow_overlap=True) >= 0


@given(_boxes, _boxes)
def test_magnitude_nonnegative_and_bounded(a, b):
    m = magnitude(a, b, allow_overlap=True)
    assert 0 <= m <= max(a.area, b.area)


@given(_boxes)
def test_self_relation_is_full_overlap(a):
    d, m, dist = relation(a, a, allow_overlap=True)
    assert d == "O" and m == a.area and dist == 0


@given(_boxes, _boxes)
def test_disjoint_elements_never_overlap_direction(a, b):
    if not a.intersects(b):
        assert alignment(a, b) in {"V", "H", "N"}
