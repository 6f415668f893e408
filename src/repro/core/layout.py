"""Spreadsheet layout graphs (Definition 9).

A layout is a complete graph whose nodes are the file's regions and whose
edges carry the spatial-relationship vector (alignment direction,
magnitude, distance) of the two region boundaries -- including the
"overlapping" direction of Definition 8, since region bounding boxes may
overlap even though elements cannot.

The class is cheap to (re)construct from region boundary boxes plus
histogram fingerprints, which is how the Spark pipeline ships layouts
between stages (boxes and histograms travel as columnar data; edges are
recomputed on the executor).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.elements import Box, relation
from repro.core.regions import Region

__all__ = ["Edge", "Layout"]


@dataclass(frozen=True)
class Edge:
    """Labeled edge between regions ``i`` and ``j`` of one layout."""

    direction: str  # "V" | "H" | "N" | "O"
    magnitude: float
    distance: float


class Layout:
    """Complete labeled graph over a file's regions."""

    def __init__(self, boxes: list[Box], hists: np.ndarray) -> None:
        if len(boxes) != hists.shape[0]:
            raise ValueError("one histogram row per region required")
        self.boxes = list(boxes)
        self.hists = np.asarray(hists, dtype=np.float64)
        n = len(boxes)
        self.edges: dict[tuple[int, int], Edge] = {}
        for i in range(n):
            for j in range(i + 1, n):
                d, m, dist = relation(boxes[i], boxes[j], allow_overlap=True)
                e = Edge(d, m, dist)
                self.edges[(i, j)] = e
                self.edges[(j, i)] = e

    @classmethod
    def from_regions(cls, regions: list[Region]) -> "Layout":
        hists = (
            np.stack([r.hist for r in regions])
            if regions
            else np.zeros((0, 192))
        )
        return cls([r.box for r in regions], hists)

    def __len__(self) -> int:
        return len(self.boxes)

    def edge(self, i: int, j: int) -> Edge | None:
        """Edge label between two distinct nodes; ``None`` for ``i == j``."""
        return self.edges.get((i, j))

    def neighbors(self, i: int) -> list[int]:
        """All other nodes (the graph is complete)."""
        return [j for j in range(len(self)) if j != i]
