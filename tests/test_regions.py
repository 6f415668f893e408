"""Unit tests for region boundaries and histogram fingerprints."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.cells import COLOR_LUT, CellType
from repro.core.elements import Box
from repro.core.grid import csv_to_type_grid
from repro.core.regions import (
    N_BINS,
    boundary,
    build_regions,
    color_histogram,
    type_histogram,
)
from repro.core.segmentation import segment


class TestBoundary:
    def test_single_element(self):
        assert boundary([Box(1, 2, 3, 4)]) == Box(1, 2, 3, 4)

    def test_definition7_min_max(self):
        els = [Box(2, 1, 4, 3), Box(0, 5, 1, 6), Box(3, 0, 8, 0)]
        assert boundary(els) == Box(0, 0, 8, 6)

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            boundary([])


class TestTypeHistogram:
    def test_counts_inside_box(self):
        tg = csv_to_type_grid("1,a b\n2,\n")
        h = type_histogram(tg, Box(0, 0, 1, 1))
        assert h[CellType.INTEGER] == 2
        assert h[CellType.LOWER] == 1
        assert h[CellType.EMPTY] == 1

    def test_total_equals_area(self):
        tg = csv_to_type_grid("1,2,3\n,x,\n")
        b = Box(0, 0, 2, 1)
        assert type_histogram(tg, b).sum() == b.area


class TestColorHistogram:
    def test_length_192(self):
        tg = csv_to_type_grid("1,2\n")
        assert color_histogram(tg, Box(0, 0, 1, 0)).shape == (3 * N_BINS,)

    def test_per_channel_mass_equals_area(self):
        tg = csv_to_type_grid("1,a,B C\n,,\n")
        b = Box(0, 0, 2, 1)
        h = color_histogram(tg, b)
        for ch in range(3):
            assert h[ch * N_BINS : (ch + 1) * N_BINS].sum() == b.area

    def test_single_type_hits_expected_bins(self):
        tg = csv_to_type_grid("7\n")
        h = color_histogram(tg, Box(0, 0, 0, 0))
        r, g, b = (int(c) // 4 for c in COLOR_LUT[int(CellType.INTEGER)])
        assert h[r] == 1 and h[N_BINS + g] == 1 and h[2 * N_BINS + b] == 1

    def test_empty_cells_included(self):
        """Fingerprints include empties: density matters (Sec. 4.2)."""
        dense = csv_to_type_grid("1,2\n3,4\n")
        sparse = csv_to_type_grid("1,\n,4\n")
        hd = color_histogram(dense, Box(0, 0, 1, 1))
        hs = color_histogram(sparse, Box(0, 0, 1, 1))
        assert not np.array_equal(hd, hs)


class TestBuildRegions:
    def test_groups_by_label(self):
        tg = csv_to_type_grid("1,1\n\n2,2\n")
        els = segment(tg)
        assert len(els) == 2
        regions = build_regions(tg, els, np.array([0, 1]))
        assert len(regions) == 2
        assert regions[0].box == Box(0, 0, 1, 0)
        assert regions[1].box == Box(0, 2, 1, 2)

    def test_merged_label_spans_elements(self):
        tg = csv_to_type_grid("1,1\n\n2,2\n")
        els = segment(tg)
        regions = build_regions(tg, els, np.array([0, 0]))
        assert len(regions) == 1
        assert regions[0].box == Box(0, 0, 1, 2)
        assert regions[0].n_elements == 2

    def test_histogram_covers_boundary_box(self):
        tg = csv_to_type_grid("1,1\n\n2,2\n")
        els = segment(tg)
        regions = build_regions(tg, els, np.array([0, 0]))
        # 6 cells in the boundary box (2 wide x 3 tall), empties included.
        for ch in range(3):
            assert regions[0].hist[ch * N_BINS : (ch + 1) * N_BINS].sum() == 6

    def test_deterministic_topleft_order(self):
        tg = csv_to_type_grid(",,5\n,,\n6,,\n")
        els = segment(tg)
        regions = build_regions(tg, els, np.arange(len(els)))
        assert regions[0].box.y0 <= regions[1].box.y0
