"""Regions: boundaries (Def. 7) and color-histogram fingerprints (Sec. 4.2).

A detected region is the cluster of elements produced by
:mod:`repro.core.clustering`; its boundary is the bounding box of its
elements. Its fingerprint is a 192-bin color histogram (64 bins per RGB
channel) over every cell inside the boundary -- empty (white) cells
included, so the fingerprint is sensitive to the amount *and* density of
cells of different types, as Sec. 4.2 describes.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.cells import COLOR_LUT, CellType
from repro.core.elements import Box

__all__ = ["N_BINS", "Region", "boundary", "type_histogram", "color_histogram", "build_regions"]

#: Bins per channel (paper: 64), channels (RGB), total bins 192.
N_BINS = 64
_BIN_WIDTH = 256 // N_BINS

#: Precomputed per-type histogram contribution: one cell of type t adds
#: one count in each channel's bin of its color. Shape (n_types, 192).
_TYPE_TO_HIST = np.zeros((len(CellType), 3 * N_BINS), dtype=np.float64)
for _t in CellType:
    _r, _g, _b = (int(c) // _BIN_WIDTH for c in COLOR_LUT[int(_t)])
    _TYPE_TO_HIST[int(_t), _r] += 1
    _TYPE_TO_HIST[int(_t), N_BINS + _g] += 1
    _TYPE_TO_HIST[int(_t), 2 * N_BINS + _b] += 1


@dataclass(frozen=True)
class Region:
    """A detected region: element boxes, boundary, and histogram fingerprint."""

    elements: tuple[Box, ...]
    box: Box
    hist: np.ndarray = field(repr=False, compare=False)

    @property
    def n_elements(self) -> int:
        return len(self.elements)


def boundary(elements: list[Box]) -> Box:
    """Bounding box of a non-empty element set (Definition 7)."""
    if not elements:
        raise ValueError("a region needs at least one element")
    return Box(
        min(e.x0 for e in elements),
        min(e.y0 for e in elements),
        max(e.x1 for e in elements),
        max(e.y1 for e in elements),
    )


def type_histogram(tgrid: np.ndarray, box: Box) -> np.ndarray:
    """Counts of each ``CellType`` inside ``box`` (length ``len(CellType)``)."""
    sub = tgrid[box.y0 : box.y1 + 1, box.x0 : box.x1 + 1]
    return np.bincount(sub.ravel(), minlength=len(CellType)).astype(np.float64)


def color_histogram(tgrid: np.ndarray, box: Box) -> np.ndarray:
    """192-bin color histogram of all cells inside ``box`` (empties included)."""
    return type_histogram(tgrid, box) @ _TYPE_TO_HIST


def build_regions(tgrid: np.ndarray, elements: list[Box], labels: np.ndarray) -> list[Region]:
    """Assemble clustered elements into :class:`Region` objects.

    Regions are ordered by their boundary's top-left corner so downstream
    graph node order is deterministic.
    """
    by_label: dict[int, list[Box]] = {}
    for el, lbl in zip(elements, labels):
        by_label.setdefault(int(lbl), []).append(el)
    regions = []
    for _, els in sorted(by_label.items()):
        box = boundary(els)
        regions.append(Region(tuple(els), box, color_histogram(tgrid, box)))
    regions.sort(key=lambda r: (r.box.y0, r.box.x0, r.box.y1, r.box.x1))
    return regions
