"""Connected-components region detection (Coletta et al. baseline).

Each 4-connected component of the non-empty cell mask is one region; its
boundary is the component's bounding box. No partitioning, no clustering
-- exactly the first stage Mondrian builds on (Sec. 5.2), so a table
split by a missing-data empty row becomes several regions, and adjacent
distinct tables become one.
"""
from __future__ import annotations

import numpy as np

from repro.core.elements import Box
from repro.core.segmentation import connected_components

__all__ = ["detect"]


def detect(tgrid: np.ndarray) -> list[Box]:
    """Bounding boxes of the 4-connected components of ``tgrid != EMPTY``."""
    labels = connected_components(tgrid != 0)
    boxes: list[Box] = []
    for lbl in range(labels.max() + 1):
        ys, xs = np.nonzero(labels == lbl)
        boxes.append(Box(int(xs.min()), int(ys.min()), int(xs.max()), int(ys.max())))
    boxes.sort(key=lambda b: (b.y0, b.x0, b.y1, b.x1))
    return boxes
