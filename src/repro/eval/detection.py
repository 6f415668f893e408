"""Region-detection accuracy scores: IoU and EoB (Sec. 5.3).

IoU is computed over *non-empty cells* of the predicted and target
regions (the graphical Jaccard index); EoB is the maximum absolute
boundary-coordinate error. Per the paper, each true region is assigned the
best-scoring predicted region (max IoU / min EoB), and a file with no
predictions at all gets ``EoB = max(height, width)``.
"""
from __future__ import annotations

import numpy as np

from repro.core.elements import Box

__all__ = ["iou", "eob", "match_scores", "file_scores"]


def _cells(mask: np.ndarray, box: Box) -> set[tuple[int, int]]:
    ys, xs = np.nonzero(mask[box.y0 : box.y1 + 1, box.x0 : box.x1 + 1])
    return {(int(y + box.y0), int(x + box.x0)) for y, x in zip(ys, xs)}


def iou(mask: np.ndarray, pred: Box, true: Box) -> float:
    """Intersection-over-union of the non-empty cells of two region boxes."""
    p, t = _cells(mask, pred), _cells(mask, true)
    union = len(p | t)
    if union == 0:
        return 0.0
    return len(p & t) / union


def eob(pred: Box, true: Box) -> float:
    """Error-of-Boundary: max absolute corner-coordinate difference."""
    return float(
        max(
            abs(pred.x0 - true.x0),
            abs(pred.y0 - true.y0),
            abs(pred.x1 - true.x1),
            abs(pred.y1 - true.y1),
        )
    )


def match_scores(
    mask: np.ndarray, predicted: list[Box], true: Box
) -> tuple[float, float]:
    """Best (IoU, EoB) of one true region against all predictions.

    With no predictions: ``IoU = 0`` and ``EoB = max(H, W)`` of the file
    (simulated completely-out-of-boundary detection, Sec. 5.3).
    """
    if not predicted:
        return 0.0, float(max(mask.shape))
    best_iou = max(iou(mask, p, true) for p in predicted)
    best_eob = min(eob(p, true) for p in predicted)
    return best_iou, best_eob


def file_scores(
    mask: np.ndarray, predicted: list[Box], gold: list[Box]
) -> list[tuple[float, float]]:
    """Per-true-region (IoU, EoB) pairs for one file."""
    return [match_scores(mask, predicted, t) for t in gold]
