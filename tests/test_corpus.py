"""Tests for the synthetic corpus generator (the dataset substitute)."""
from __future__ import annotations

from collections import Counter

import numpy as np
import pytest

from repro.core.grid import csv_to_type_grid
from repro.corpus import deco_config, fuste_config, generate_corpus
from repro.corpus.generator import GeneratedFile
from repro.eval.tables import filter_outliers


@pytest.fixture(scope="module")
def deco_small():
    return generate_corpus(deco_config(), sf=0.05)


@pytest.fixture(scope="module")
def fuste_small():
    return generate_corpus(fuste_config(), sf=0.05)


@pytest.fixture(scope="module")
def deco_full():
    # Generation only (no analysis): cheap even at paper scale.
    return generate_corpus(deco_config(), sf=1.0)


@pytest.fixture(scope="module")
def fuste_full():
    return generate_corpus(fuste_config(), sf=1.0)


class TestTable2StatsAtFullScale:
    """The sf=1.0 corpora reproduce Table 2's marginals exactly."""

    def test_deco_counts(self, deco_full):
        assert len(deco_full) == 854
        single = sum(1 for f in deco_full if f.n_regions == 1)
        assert single == 233
        assert len(deco_full) - single == 621

    def test_deco_templates(self, deco_full):
        sizes = Counter(f.template_id for f in deco_full)
        assert len(sizes) == 750
        assert sum(1 for c in sizes.values() if c == 1) == 679
        assert sum(1 for c in sizes.values() if c > 1) == 71

    def test_fuste_counts(self, fuste_full):
        assert len(fuste_full) == 886
        single = sum(1 for f in fuste_full if f.n_regions == 1)
        assert single == 495
        assert len(fuste_full) - single == 391

    def test_fuste_templates(self, fuste_full):
        sizes = Counter(f.template_id for f in fuste_full)
        assert len(sizes) == 136
        assert sum(1 for c in sizes.values() if c == 1) == 105
        assert max(sizes.values()) == 381  # the dominant FUSE template

    def test_regions_per_file_means(self, deco_full, fuste_full):
        # Paper: 4.43 and 2.09 regions/file on average.
        deco_mean = np.mean([f.n_regions for f in deco_full])
        fuste_mean = np.mean([f.n_regions for f in fuste_full])
        assert 3.8 <= deco_mean <= 5.2
        assert 1.8 <= fuste_mean <= 2.6

    def test_table3_buckets(self, deco_full, fuste_full):
        deco = [f for f in deco_full if not f.is_outlier]
        b = Counter(
            "1" if f.n_regions == 1 else "[2,5]" if f.n_regions <= 5 else ">=6"
            for f in deco
        )
        assert b["1"] == 233 and b["[2,5]"] == 470 and b[">=6"] == 149
        fuste = [f for f in fuste_full if not f.is_outlier]
        b = Counter(
            "1" if f.n_regions == 1 else "[2,5]" if f.n_regions <= 5 else ">=6"
            for f in fuste
        )
        assert b["1"] == 495 and b["[2,5]"] == 372 and b[">=6"] == 18

    def test_outliers(self, deco_full, fuste_full):
        deco_out = [f for f in deco_full if f.is_outlier]
        assert [f.n_regions for f in deco_out] == [321, 100]
        assert [f.n_regions for f in fuste_full if f.is_outlier] == [97]


class TestGoldConsistency:
    def test_gold_boxes_cover_nonempty_cells(self, deco_small):
        """Every non-empty cell belongs to exactly one gold region."""
        for f in deco_small[:20]:
            tg = csv_to_type_grid(f.content)
            mask = tg != 0
            covered = np.zeros_like(mask)
            for g in f.gold:
                covered[g.box.y0 : g.box.y1 + 1, g.box.x0 : g.box.x1 + 1] = True
            # All non-empty cells are inside some gold box.
            assert (mask <= covered).all()

    def test_gold_boxes_tight(self, fuste_small):
        """Gold boundaries touch non-empty cells on all four sides."""
        for f in fuste_small[:15]:
            tg = csv_to_type_grid(f.content)
            mask = tg != 0
            for g in f.gold:
                sub = mask[g.box.y0 : g.box.y1 + 1, g.box.x0 : g.box.x1 + 1]
                assert sub[0].any() and sub[-1].any()
                assert sub[:, 0].any() and sub[:, -1].any()

    def test_gold_regions_nonempty(self, deco_small):
        for f in deco_small:
            assert f.n_regions >= 1

    def test_region_kinds_valid(self, deco_small):
        kinds = {g.kind for f in deco_small for g in f.gold}
        assert kinds <= {"title", "table", "notes", "footnote", "cell"}


class TestDeterminism:
    def test_same_seed_same_corpus(self):
        a = generate_corpus(deco_config(), sf=0.02)
        b = generate_corpus(deco_config(), sf=0.02)
        assert [(f.file_id, f.content) for f in a] == [
            (f.file_id, f.content) for f in b
        ]

    def test_datasets_differ(self, deco_small, fuste_small):
        assert {f.dataset for f in deco_small} == {"deco"}
        assert {f.dataset for f in fuste_small} == {"fuste"}


class TestTemplateJitter:
    def test_same_template_files_differ_in_content(self, fuste_small):
        by_t: dict[str, list[GeneratedFile]] = {}
        for f in fuste_small:
            by_t.setdefault(f.template_id, []).append(f)
        grp = next(v for v in by_t.values() if len(v) > 2)
        contents = {f.content for f in grp}
        assert len(contents) == len(grp)  # data jitter: no identical files

    def test_same_template_same_region_count(self, fuste_small):
        by_t: dict[str, set[int]] = {}
        for f in fuste_small:
            by_t.setdefault(f.template_id, set()).add(f.n_regions)
        for counts in by_t.values():
            assert len(counts) == 1  # a template fixes its layout

    def test_region_positions_shift_within_template(self, deco_small):
        by_t: dict[str, list[GeneratedFile]] = {}
        for f in deco_small:
            if not f.is_outlier:
                by_t.setdefault(f.template_id, []).append(f)
        shifted = False
        for grp in by_t.values():
            if len(grp) < 2 or grp[0].n_regions < 2:
                continue
            boxes_a = [g.box for g in grp[0].gold]
            boxes_b = [g.box for g in grp[1].gold]
            if boxes_a != boxes_b:
                shifted = True
        assert shifted  # the Sec. 2 phenomenon: footnotes move across files


class TestStyleChannel:
    def test_style_boxes_exist_for_tables(self, deco_small):
        f = next(x for x in deco_small if any(g.kind == "table" for g in x.gold))
        assert any(kind == "header" for kind, _ in f.style_boxes)

    def test_outliers_have_no_style(self, deco_full):
        for f in deco_full:
            if f.is_outlier:
                assert f.style_boxes == []


class TestOutlierFilter:
    def test_filter_removes_only_outliers(self, deco_full):
        kept = filter_outliers(deco_full)
        assert len(kept) == 852
        assert all(not f.is_outlier for f in kept)

    def test_filter_fuste(self, fuste_full):
        kept = filter_outliers(fuste_full)
        assert len(kept) == 885


class TestScaling:
    @pytest.mark.parametrize("sf", [0.02, 0.1, 0.3])
    def test_file_count_scales(self, sf):
        files = generate_corpus(deco_config(), sf=sf)
        assert len(files) == pytest.approx(854 * sf, rel=0.25)

    def test_sf_keeps_big_template_dominant(self):
        files = generate_corpus(fuste_config(), sf=0.1)
        sizes = Counter(f.template_id for f in files)
        assert max(sizes.values()) >= 20  # scaled-down 381-file template
