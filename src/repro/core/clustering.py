"""Region detection: custom-distance DBSCAN over elements (Sec. 4.2).

The element distance is a weighted sum of three terms:

1. **Distance** (weight ``alpha``): Definition-5 distance of the two
   closest cells -- 0 for adjacent elements, independent of element size.
2. **Size difference** (weight ``beta``): ``1 - small_area/large_area`` --
   similarly-sized elements (two tables, two notes) are pushed apart,
   large+small pairs (table + stray fragment) pulled together.
3. **Alignment** (weight ``gamma``): misalignment of the element corner
   extents. The paper's formula sums the raw x- and y-extent offsets
   (``h + v``); we use ``min(h / (height_a + height_b),
   v / (width_a + width_b))`` -- the *relative* misalignment along the
   better-aligned axis, 0 when the elements share either their row or
   their column extents. See DESIGN.md ("Clustering alignment term") for
   why the literal unnormalized sum is inconsistent with the paper's
   reported radii (eps ~= 1.5).

DBSCAN runs with ``min_pts = 1`` and no noise label (every element belongs
to a region), which reduces to single-linkage connected components of the
epsilon-neighborhood graph; the general algorithm is implemented for
completeness and tested against that equivalence.
"""
from __future__ import annotations

import numpy as np

from repro.core.elements import Box

__all__ = [
    "element_distance",
    "pairwise_distances",
    "dbscan",
    "cluster_elements",
]


def element_distance(
    a: Box, b: Box, *, alpha: float = 1.0, beta: float = 0.5, gamma: float = 1.0
) -> float:
    """Scalar distance between two elements (weighted three-term sum)."""
    from repro.core.elements import distance as geo_distance

    d = geo_distance(a, b, allow_overlap=True)
    a0, a1 = sorted((a.area, b.area))
    size = 1.0 - a0 / a1
    h = (abs(a.y0 - b.y0) + abs(a.y1 - b.y1)) / (a.height + b.height)
    v = (abs(a.x0 - b.x0) + abs(a.x1 - b.x1)) / (a.width + b.width)
    return alpha * d + beta * size + gamma * min(h, v)


def pairwise_distances(
    boxes: list[Box], *, alpha: float = 1.0, beta: float = 0.5, gamma: float = 1.0
) -> np.ndarray:
    """Vectorized full pairwise element-distance matrix (E x E, float64).

    Mirrors :func:`element_distance` exactly; the loop version is kept as
    the tested reference.
    """
    n = len(boxes)
    if n == 0:
        return np.zeros((0, 0))
    x0 = np.array([b.x0 for b in boxes], dtype=np.float64)
    y0 = np.array([b.y0 for b in boxes], dtype=np.float64)
    x1 = np.array([b.x1 for b in boxes], dtype=np.float64)
    y1 = np.array([b.y1 for b in boxes], dtype=np.float64)

    # Definition-5 gap terms, pairwise.
    min_x1 = np.minimum.outer(x1, x1)
    max_x0 = np.maximum.outer(x0, x0)
    min_y1 = np.minimum.outer(y1, y1)
    max_y0 = np.maximum.outer(y0, y0)
    gap_v = np.abs(min_x1 - max_x0 + 1)
    gap_h = np.abs(min_y1 - max_y0 + 1)
    y_over = max_y0 <= min_y1
    x_over = max_x0 <= min_x1
    dist = np.sqrt(gap_v**2 + gap_h**2)  # N case
    dist = np.where(y_over & ~x_over, gap_v, dist)  # V
    dist = np.where(x_over & ~y_over, gap_h, dist)  # H
    dist = np.where(x_over & y_over, 0.0, dist)  # O (overlap -> 0)

    area = (x1 - x0 + 1) * (y1 - y0 + 1)
    small = np.minimum.outer(area, area)
    large = np.maximum.outer(area, area)
    size = 1.0 - small / large

    height = y1 - y0 + 1
    width = x1 - x0 + 1
    h = (np.abs(np.subtract.outer(y0, y0)) + np.abs(np.subtract.outer(y1, y1))) / np.add.outer(height, height)
    v = (np.abs(np.subtract.outer(x0, x0)) + np.abs(np.subtract.outer(x1, x1))) / np.add.outer(width, width)
    align = np.minimum(h, v)

    d = alpha * dist + beta * size + gamma * align
    np.fill_diagonal(d, 0.0)
    return d


def dbscan(dist: np.ndarray, *, eps: float, min_pts: int = 1) -> np.ndarray:
    """DBSCAN over a precomputed distance matrix.

    Returns int labels; ``-1`` marks noise (only possible when
    ``min_pts > 1``). Labels are renumbered in first-seen order so results
    are deterministic.
    """
    n = dist.shape[0]
    labels = np.full(n, -1, dtype=np.int32)
    if n == 0:
        return labels
    neighbors = [np.flatnonzero(dist[i] <= eps) for i in range(n)]  # incl. self
    core = np.array([len(nb) >= min_pts for nb in neighbors])
    cluster = 0
    for i in range(n):
        if labels[i] != -1 or not core[i]:
            continue
        labels[i] = cluster
        frontier = list(neighbors[i])
        while frontier:
            j = frontier.pop()
            if labels[j] == -1:
                labels[j] = cluster
                if core[j]:
                    frontier.extend(k for k in neighbors[j] if labels[k] == -1)
        cluster += 1
    return labels


def cluster_elements(
    boxes: list[Box],
    *,
    eps: float,
    alpha: float = 1.0,
    beta: float = 0.5,
    gamma: float = 1.0,
) -> np.ndarray:
    """Cluster elements into regions; returns one label per element (no noise)."""
    d = pairwise_distances(boxes, alpha=alpha, beta=beta, gamma=gamma)
    return dbscan(d, eps=eps, min_pts=1)
