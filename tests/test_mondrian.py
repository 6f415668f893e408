"""Tests for the per-file Mondrian pipeline and dynamic radius selection."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.elements import Box
from repro.core.grid import csv_to_type_grid
from repro.core.mondrian import (
    RADIUS_GRID,
    analyze_file,
    best_dynamic_radius,
    detect_regions,
)
from repro.eval.detection import file_scores

MULTI = (
    "Table 3. Quarterly Report,,,\n"
    ",,,\n"
    "Year,Total,Avg,Max\n"
    "2001,10,1.5,3\n"
    "2002,20,2.5,6\n"
    ",,,\n"
    "2004,40,4.5,12\n"
    ",,,\n"
    ",,,\n"
    "notes in lowercase,,,\n"
    "source: unit tests,,,\n"
)


class TestRadiusGrid:
    def test_paper_sweep_bounds(self):
        """Sec. 5.2: [0.1,2] step .1; (2,10] step 1; (10,100] step 10."""
        assert RADIUS_GRID[0] == pytest.approx(0.1)
        assert RADIUS_GRID[-1] == 100
        assert 1.5 in RADIUS_GRID and 1.4 in RADIUS_GRID
        assert len(RADIUS_GRID) == 20 + 8 + 9

    def test_monotonic(self):
        assert list(RADIUS_GRID) == sorted(RADIUS_GRID)


class TestDetectRegions:
    def test_three_regions(self):
        tg = csv_to_type_grid(MULTI)
        regions = detect_regions(tg, eps=1.5)
        assert len(regions) == 3  # title, table (merged across gap), notes

    def test_table_merged_across_missing_row(self):
        tg = csv_to_type_grid(MULTI)
        regions = detect_regions(tg, eps=1.5)
        table = max(regions, key=lambda r: r.box.area)
        assert table.box == Box(0, 2, 3, 6)

    def test_empty_file(self):
        assert detect_regions(csv_to_type_grid(",,\n,,\n")) == []

    def test_huge_radius_single_region(self):
        tg = csv_to_type_grid(MULTI)
        regions = detect_regions(tg, eps=100.0)
        assert len(regions) == 1

    def test_tiny_radius_components(self):
        tg = csv_to_type_grid(MULTI)
        many = detect_regions(tg, eps=0.1)
        few = detect_regions(tg, eps=1.5)
        assert len(many) >= len(few)


class TestAnalyzeFile:
    def test_layout_nodes_match_regions(self):
        fl = analyze_file("f", MULTI)
        assert len(fl.layout) == len(fl.regions)
        assert fl.file_id == "f"

    def test_empty_content(self):
        fl = analyze_file("f", "")
        assert fl.regions == [] and len(fl.layout) == 0


class TestDynamicRadius:
    def test_picks_radius_with_best_iou(self):
        tg = csv_to_type_grid(MULTI)
        gold = [Box(0, 0, 0, 0), Box(0, 2, 3, 6), Box(0, 9, 0, 10)]
        eps = best_dynamic_radius(tg, gold)
        regions = detect_regions(tg, eps=eps)
        scores = [s for s, _ in file_scores(tg != 0, [r.box for r in regions], gold)]
        assert np.mean(scores) == pytest.approx(1.0)

    def test_dynamic_beats_or_matches_static(self):
        from repro.corpus import deco_config, generate_corpus

        files = [f for f in generate_corpus(deco_config(), sf=0.03) if not f.is_outlier]
        static_scores, dyn_scores = [], []
        for f in files:
            tg = csv_to_type_grid(f.content)
            gold = [g.box for g in f.gold]
            s = detect_regions(tg, eps=1.5)
            static_scores.extend(
                i for i, _ in file_scores(tg != 0, [r.box for r in s], gold)
            )
            eps = best_dynamic_radius(tg, gold)
            d = detect_regions(tg, eps=eps)
            dyn_scores.extend(
                i for i, _ in file_scores(tg != 0, [r.box for r in d], gold)
            )
        assert np.mean(dyn_scores) >= np.mean(static_scores)

    def test_defaults_on_empty(self):
        tg = csv_to_type_grid(",,\n")
        assert best_dynamic_radius(tg, []) == RADIUS_GRID[0]
