"""Unit tests for IoU and EoB detection scores (Sec. 5.3)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.elements import Box
from repro.eval.detection import eob, file_scores, iou, match_scores


def mask(rows):
    return np.array([[c == "#" for c in r] for r in rows], dtype=bool)


FULL = mask(["####", "####", "####"])


class TestIoU:
    def test_perfect_overlap(self):
        assert iou(FULL, Box(0, 0, 3, 2), Box(0, 0, 3, 2)) == 1.0

    def test_disjoint(self):
        m = mask(["##..", "..##"])
        assert iou(m, Box(0, 0, 1, 0), Box(2, 1, 3, 1)) == 0.0

    def test_half_overlap(self):
        m = mask(["####"])
        # pred covers cols 0..1, true covers 1..3 -> inter 1, union 4.
        assert iou(m, Box(0, 0, 1, 0), Box(1, 0, 3, 0)) == pytest.approx(0.25)

    def test_only_nonempty_cells_count(self):
        """IoU is over non-empty cells, not raw box areas."""
        m = mask(["##..", "##.."])
        assert iou(m, Box(0, 0, 3, 1), Box(0, 0, 1, 1)) == 1.0

    def test_empty_boxes(self):
        m = mask(["...."])
        assert iou(m, Box(0, 0, 1, 0), Box(2, 0, 3, 0)) == 0.0


class TestEoB:
    def test_exact(self):
        assert eob(Box(1, 2, 3, 4), Box(1, 2, 3, 4)) == 0.0

    def test_max_corner_error(self):
        assert eob(Box(0, 0, 3, 3), Box(1, 0, 3, 6)) == 3.0

    def test_symmetric(self):
        a, b = Box(0, 0, 5, 5), Box(2, 1, 4, 7)
        assert eob(a, b) == eob(b, a)


class TestMatchScores:
    def test_best_prediction_chosen(self):
        m = mask(["####", "####"])
        preds = [Box(0, 0, 0, 0), Box(0, 0, 3, 1)]
        i, e = match_scores(m, preds, Box(0, 0, 3, 1))
        assert i == 1.0 and e == 0.0

    def test_no_predictions_penalty(self):
        """Missing detection: IoU 0 and EoB = max(H, W) (Sec. 5.3)."""
        m = mask(["#####", "#####", "#####"])
        i, e = match_scores(m, [], Box(0, 0, 4, 2))
        assert i == 0.0 and e == 5.0

    def test_iou_and_eob_independent_best(self):
        # Best-IoU and best-EoB may come from different predictions.
        m = mask(["######"])
        preds = [Box(0, 0, 2, 0), Box(1, 0, 4, 0)]
        i, e = match_scores(m, preds, Box(0, 0, 3, 0))
        assert i == pytest.approx(3 / 4)  # best IoU from the first pred
        assert e == 1.0


class TestFileScores:
    def test_one_score_per_true_region(self):
        m = mask(["##..##", "##..##"])
        gold = [Box(0, 0, 1, 1), Box(4, 0, 5, 1)]
        scores = file_scores(m, gold, gold)
        assert scores == [(1.0, 0.0), (1.0, 0.0)]

    def test_split_region_partial_iou(self):
        """A true region split into two predictions: the best fragment
        wins (the paper's max-assignment rule)."""
        m = mask(["######"])
        preds = [Box(0, 0, 2, 0), Box(3, 0, 5, 0)]
        scores = file_scores(m, preds, [Box(0, 0, 5, 0)])
        assert scores[0][0] == pytest.approx(0.5)
