"""End-to-end Mondrian per-file pipeline (Sec. 4.1-4.2).

``analyze_file`` runs parse -> segment -> partition -> cluster -> regions
-> layout for one CSV text. Two radius strategies from Sec. 5.2:

- **static**: one radius for all files (best reported: 1.5 DECO, 1.4 FUSTE);
- **dynamic**: per-file radius chosen from the paper's sweep grid as the
  one maximizing mean IoU against that file's gold regions (the paper's
  "optimal, dynamic choice of the clustering radius for each file").
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.clustering import cluster_elements
from repro.core.elements import Box
from repro.core.grid import csv_to_type_grid
from repro.core.layout import Layout
from repro.core.regions import Region, build_regions
from repro.core.segmentation import segment

__all__ = [
    "RADIUS_GRID",
    "FileLayout",
    "detect_regions",
    "analyze_file",
    "best_dynamic_radius",
]

#: Sec. 5.2 radius sweep: [0.1, 2] step 0.1; (2, 10] step 1; (10, 100] step 10.
RADIUS_GRID: tuple[float, ...] = tuple(
    [round(0.1 * i, 1) for i in range(1, 21)]
    + list(range(3, 11))
    + list(range(20, 101, 10))
)


@dataclass
class FileLayout:
    """Analysis result for one file."""

    file_id: str
    tgrid: np.ndarray
    regions: list[Region]
    layout: Layout


def detect_regions(
    tgrid: np.ndarray,
    *,
    eps: float = 1.5,
    alpha: float = 1.0,
    beta: float = 0.5,
    gamma: float = 1.0,
) -> list[Region]:
    """Segment a type grid into elements and cluster them into regions."""
    elements = segment(tgrid)
    if not elements:
        return []
    labels = cluster_elements(elements, eps=eps, alpha=alpha, beta=beta, gamma=gamma)
    return build_regions(tgrid, elements, labels)


def analyze_file(
    file_id: str,
    text: str,
    *,
    eps: float = 1.5,
    alpha: float = 1.0,
    beta: float = 0.5,
    gamma: float = 1.0,
) -> FileLayout:
    """Full per-file pipeline: CSV text -> regions -> layout graph."""
    tgrid = csv_to_type_grid(text)
    regions = detect_regions(tgrid, eps=eps, alpha=alpha, beta=beta, gamma=gamma)
    return FileLayout(file_id, tgrid, regions, Layout.from_regions(regions))


def best_dynamic_radius(
    tgrid: np.ndarray,
    gold: list[Box],
    *,
    alpha: float = 1.0,
    beta: float = 0.5,
    gamma: float = 1.0,
    grid: tuple[float, ...] = RADIUS_GRID,
) -> float:
    """Per-file optimal radius: maximizes mean IoU against gold regions.

    Ties break toward the smaller radius (finer regions). Import is local
    to keep :mod:`repro.eval` free of core-package import cycles.
    """
    from repro.eval.detection import file_scores

    mask = tgrid != 0
    elements = segment(tgrid)
    if not elements or not gold:
        return grid[0]
    best_eps, best_score = grid[0], -1.0
    from repro.core.clustering import pairwise_distances, dbscan

    dists = pairwise_distances(elements, alpha=alpha, beta=beta, gamma=gamma)
    for eps in grid:
        labels = dbscan(dists, eps=eps, min_pts=1)
        regions = build_regions(tgrid, elements, labels)
        score = float(
            np.mean([s for s, _ in file_scores(mask, [r.box for r in regions], gold)])
        )
        if score > best_score + 1e-12:
            best_eps, best_score = eps, score
    return best_eps
