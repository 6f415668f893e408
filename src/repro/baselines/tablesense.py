"""TableSense surrogate: proposal-based spreadsheet region detector.

TableSense (Dong et al., AAAI 2019) is a Mask-R-CNN derivative: feature
maps -> region-of-interest proposals -> objectness classification ->
precise bounding-box regression. Neither code nor trained models are
public and no deep-learning stack ships in this container, so we rebuild
the same *detection mechanism* without the CNN (DESIGN.md,
"Substitutions"):

1. **Proposal generation** -- morphological dilation of the non-empty
   mask merges nearby cells into dense blobs (the RoI stage).
2. **Objectness scoring** -- each proposal is scored by its fill density
   and size; proposals under a threshold are dropped entirely. This is
   the paper's reported TableSense failure mode: whole regions are
   *completely missed* when they do not look like salient objects
   (48.8 % of DECO regions, 32.9 % of FUSTE regions on average), because
   Mask R-CNN may ignore input areas that are not RoIs.
3. **Boundary refinement** -- boxes are trimmed to non-empty content and
   perturbed by the model's localization noise (the PBR stage's residual
   error).

The detector is stochastic in ``seed`` (the paper averages 3 runs of the
ML systems and reports the std).
"""
from __future__ import annotations

import numpy as np

from repro.core.elements import Box

__all__ = ["dilate", "proposals", "detect"]


def dilate(mask: np.ndarray, iterations: int = 2) -> np.ndarray:
    """Binary 8-neighborhood dilation via shifted ORs (no scipy)."""
    out = mask.copy()
    for _ in range(iterations):
        grown = out.copy()
        grown[1:, :] |= out[:-1, :]
        grown[:-1, :] |= out[1:, :]
        grown[:, 1:] |= out[:, :-1]
        grown[:, :-1] |= out[:, 1:]
        out = grown
    return out


def proposals(mask: np.ndarray, iterations: int = 2) -> list[Box]:
    """Bounding boxes of dilated blobs, trimmed back to real content."""
    from repro.core.segmentation import connected_components

    labels = connected_components(dilate(mask, iterations))
    boxes: list[Box] = []
    for lbl in range(labels.max() + 1):
        blob = (labels == lbl) & mask
        if not blob.any():
            continue
        ys, xs = np.nonzero(blob)
        boxes.append(Box(int(xs.min()), int(ys.min()), int(xs.max()), int(ys.max())))
    return boxes


def detect(
    tgrid: np.ndarray,
    *,
    seed: int = 0,
    objectness_threshold: float = 0.78,
    noise: float = 0.18,
) -> list[Box]:
    """Detect regions; sparse/small proposals are stochastically missed.

    The objectness score combines fill density with a saturating size
    term, plus N(0, noise) model noise; sub-threshold proposals vanish
    (completely missed regions). Surviving boxes get the PBR stage's
    residual +-1 localization error on each side with prob 0.15.
    """
    mask = tgrid != 0
    if not mask.any():
        return []
    rng = np.random.default_rng(seed)
    out: list[Box] = []
    h, w = mask.shape
    for box in proposals(mask):
        sub = mask[box.y0 : box.y1 + 1, box.x0 : box.x1 + 1]
        density = sub.sum() / sub.size
        size_term = 1.0 - np.exp(-sub.sum() / 12.0)
        score = 0.55 * density + 0.45 * size_term + rng.normal(0.0, noise)
        if score < objectness_threshold:
            continue  # region completely missed
        x0, y0, x1, y1 = box.x0, box.y0, box.x1, box.y1
        if rng.random() < 0.15:
            x0 = min(max(0, x0 + int(rng.integers(-1, 2))), w - 1)
            y0 = min(max(0, y0 + int(rng.integers(-1, 2))), h - 1)
            x1 = min(w - 1, max(x0, x1 + int(rng.integers(-1, 2))))
            y1 = min(h - 1, max(y0, y1 + int(rng.integers(-1, 2))))
        out.append(Box(x0, y0, x1, y1))
    out.sort(key=lambda b: (b.y0, b.x0, b.y1, b.x1))
    return out
