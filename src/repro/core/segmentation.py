"""Image segmentation: connected components and rectilinear partitioning.

Mondrian's second stage (Sec. 4.1): on the binary non-empty mask of the
file image, find 4-connected components ("cell aggregates"), then cut each
component into rectangular *elements* along its non-concave edges. The cut
extends the vertical edges incident to concave vertices through the polygon
interior, which for a cell set is exactly the merge of maximal horizontal
runs with identical column extents across consecutive rows (within the
O(v+1)..O(v^2) piece bounds of Bajuelos et al.).

4-connectivity is used because components must be rectilinear polygons for
the partitioning step; diagonal-only contact yields degenerate polygons.
"""
from __future__ import annotations

import numpy as np

from repro.core.elements import Box

__all__ = ["row_runs", "connected_components", "partition_elements", "segment"]


def row_runs(mask: np.ndarray) -> list[tuple[int, int, int]]:
    """Maximal horizontal runs of True cells as ``(row, col_start, col_end)``.

    ``col_end`` is inclusive. Runs are emitted in row-major order.
    """
    runs: list[tuple[int, int, int]] = []
    for y in range(mask.shape[0]):
        row = mask[y]
        if not row.any():
            continue
        padded = np.concatenate(([False], row, [False]))
        diff = np.diff(padded.astype(np.int8))
        starts = np.flatnonzero(diff == 1)
        ends = np.flatnonzero(diff == -1) - 1
        runs.extend((y, int(s), int(e)) for s, e in zip(starts, ends))
    return runs


class _UnionFind:
    """Array-backed union-find with path compression (no scipy available)."""

    def __init__(self, n: int) -> None:
        self.parent = list(range(n))

    def find(self, i: int) -> int:
        root = i
        while self.parent[root] != root:
            root = self.parent[root]
        while self.parent[i] != root:
            self.parent[i], i = root, self.parent[i]
        return root

    def union(self, a: int, b: int) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra != rb:
            self.parent[max(ra, rb)] = min(ra, rb)


def connected_components(mask: np.ndarray) -> np.ndarray:
    """Label 4-connected components of a boolean mask.

    Returns an int32 array of the mask's shape: ``-1`` for background,
    consecutive labels ``0..k-1`` (ordered by top-left run) for components.
    """
    labels = np.full(mask.shape, -1, dtype=np.int32)
    runs = row_runs(mask)
    if not runs:
        return labels
    uf = _UnionFind(len(runs))
    # Group runs by row, then union overlapping runs of consecutive rows
    # (column ranges sharing at least one column = 4-adjacency).
    by_row: dict[int, list[int]] = {}
    for i, (y, _, _) in enumerate(runs):
        by_row.setdefault(y, []).append(i)
    for y, idxs in by_row.items():
        above = by_row.get(y - 1, [])
        for i in idxs:
            _, s, e = runs[i]
            for j in above:
                _, s2, e2 = runs[j]
                if max(s, s2) <= min(e, e2):
                    uf.union(i, j)
    root_to_label: dict[int, int] = {}
    for i, (y, s, e) in enumerate(runs):
        r = uf.find(i)
        if r not in root_to_label:
            root_to_label[r] = len(root_to_label)
        labels[y, s : e + 1] = root_to_label[r]
    return labels


def partition_elements(labels: np.ndarray) -> list[tuple[int, Box]]:
    """Partition each labeled component into rectangular elements.

    Merges vertically consecutive maximal runs with identical column extents
    -- the rectilinear cut obtained by extending vertical edges through
    concave vertices. Returns ``(component_label, element_box)`` pairs in
    deterministic (top-left) order.
    """
    out: list[tuple[int, Box]] = []
    # open rectangles per (label, col_start, col_end) -> (y_start, last_y)
    open_rects: dict[tuple[int, int, int], tuple[int, int]] = {}
    mask = labels >= 0
    for y in range(labels.shape[0]):
        current: dict[tuple[int, int, int], tuple[int, int]] = {}
        row = mask[y]
        if row.any():
            padded = np.concatenate(([False], row, [False]))
            diff = np.diff(padded.astype(np.int8))
            starts = np.flatnonzero(diff == 1)
            ends = np.flatnonzero(diff == -1) - 1
            for s, e in zip(starts, ends):
                key = (int(labels[y, s]), int(s), int(e))
                if key in open_rects and open_rects[key][1] == y - 1:
                    current[key] = (open_rects[key][0], y)
                else:
                    current[key] = (y, y)
        for key, (y0, y1) in open_rects.items():
            if key not in current:
                lbl, s, e = key
                out.append((lbl, Box(s, y0, e, y1)))
        open_rects = current
    for (lbl, s, e), (y0, y1) in open_rects.items():
        out.append((lbl, Box(s, y0, e, y1)))
    out.sort(key=lambda t: (t[1].y0, t[1].x0, t[1].y1, t[1].x1))
    return out


def segment(tgrid: np.ndarray) -> list[Box]:
    """Full segmentation: type grid -> list of rectangular elements.

    Non-empty cells (type != EMPTY = 0) form the foreground mask.
    """
    labels = connected_components(tgrid != 0)
    return [box for _, box in partition_elements(labels)]
