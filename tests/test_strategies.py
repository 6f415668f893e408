"""Tests for the strategy dispatch layer used by the Spark pipeline."""
from __future__ import annotations

import json

import numpy as np
import pytest

from repro.core.elements import Box
from repro.core.grid import csv_to_type_grid
from repro.corpus import fuste_config, generate_corpus
from repro.dist.strategies import (
    STRATEGIES,
    boxes_for_strategy,
    detect_regions_for_strategy,
)

CSV = "Year,Total\n2001,5\n2002,6\n,\n2004,8\n"
GOLD = [Box(0, 0, 1, 4)]
GOLD_JSON = json.dumps([[0, 0, 1, 4]])


class TestBoxesForStrategy:
    def test_gold_passthrough(self):
        tg = csv_to_type_grid(CSV)
        boxes, n_els = boxes_for_strategy("gold", tg, gold=GOLD, style=[])
        assert boxes == GOLD and n_els == [1]

    def test_static_merges_gap(self):
        tg = csv_to_type_grid(CSV)
        boxes, n_els = boxes_for_strategy("static", tg, gold=[], style=[], eps=1.5)
        assert boxes == [Box(0, 0, 1, 4)]
        assert n_els[0] >= 2  # merged across the missing-value row

    def test_dynamic_uses_gold(self):
        tg = csv_to_type_grid(CSV)
        boxes, _ = boxes_for_strategy("dynamic", tg, gold=GOLD, style=[])
        assert boxes == [Box(0, 0, 1, 4)]

    def test_cc_splits_gap(self):
        tg = csv_to_type_grid(CSV)
        boxes, _ = boxes_for_strategy("cc", tg, gold=[], style=[])
        assert len(boxes) == 2

    def test_unknown_strategy_raises(self):
        with pytest.raises(ValueError):
            boxes_for_strategy("nope", csv_to_type_grid(CSV), gold=[], style=[])

    @pytest.mark.parametrize("strategy", STRATEGIES)
    def test_all_strategies_run(self, strategy):
        f = generate_corpus(fuste_config(), sf=0.02)[0]
        tg = csv_to_type_grid(f.content)
        boxes, n_els = boxes_for_strategy(
            strategy,
            tg,
            gold=[g.box for g in f.gold],
            style=f.style_boxes,
            seed=1,
        )
        assert len(boxes) == len(n_els)
        for b in boxes:
            assert 0 <= b.x0 <= b.x1 < tg.shape[1]
            assert 0 <= b.y0 <= b.y1 < tg.shape[0]


class TestDetectRegionsForStrategy:
    def test_histograms_attached(self):
        regions = detect_regions_for_strategy(
            "static", content=CSV, gold_json=None, style_json=None, eps=1.5
        )
        assert len(regions) == 1
        box, hist, n_el = regions[0]
        assert hist.shape == (192,)
        assert hist[: 64].sum() == box.area

    def test_empty_content(self):
        assert detect_regions_for_strategy("static", content="") == []

    def test_seed_changes_stochastic_strategies(self):
        f = generate_corpus(fuste_config(), sf=0.02)[0]
        a = detect_regions_for_strategy(
            "tablesense", content=f.content, file_id=f.file_id, seed=0
        )
        b = detect_regions_for_strategy(
            "tablesense", content=f.content, file_id=f.file_id, seed=0
        )
        assert [x[0] for x in a] == [x[0] for x in b]  # same seed: same boxes
