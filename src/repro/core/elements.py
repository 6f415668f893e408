"""Rectangular elements and their pairwise spatial relations.

Implements Definitions 3-5 and 8 of the paper. Coordinates follow the
paper's convention: ``(x, y)`` = (column index, row index), origin at the
top-left, and a rectangle is ``(x0, y0, x1, y1)`` with *inclusive* top-left
``(x0, y0)`` and bottom-right ``(x1, y1)`` cells.

Note the paper's naming: two boxes are **V**-aligned when their *y*-axis
(row) projections overlap, and **H**-aligned when their *x*-axis (column)
projections overlap. Region bounding boxes may overlap in both projections,
which Definition 8 labels **O**; disjoint elements never can.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

__all__ = ["Box", "alignment", "magnitude", "distance", "relation"]


@dataclass(frozen=True)
class Box:
    """Inclusive rectangle in spreadsheet space (cols ``x``, rows ``y``)."""

    x0: int
    y0: int
    x1: int
    y1: int

    def __post_init__(self) -> None:
        if self.x1 < self.x0 or self.y1 < self.y0:
            raise ValueError(f"degenerate box {self}")

    @property
    def width(self) -> int:
        return self.x1 - self.x0 + 1

    @property
    def height(self) -> int:
        return self.y1 - self.y0 + 1

    @property
    def area(self) -> int:
        return self.width * self.height

    def intersects(self, other: "Box") -> bool:
        return (
            max(self.x0, other.x0) <= min(self.x1, other.x1)
            and max(self.y0, other.y0) <= min(self.y1, other.y1)
        )


def _y_overlap(a: Box, b: Box) -> bool:
    return max(a.y0, b.y0) <= min(a.y1, b.y1)


def _x_overlap(a: Box, b: Box) -> bool:
    return max(a.x0, b.x0) <= min(a.x1, b.x1)


def alignment(a: Box, b: Box, *, allow_overlap: bool = False) -> str:
    """Alignment direction per Definition 3 (and 8 for overlapping regions).

    Returns ``"V"`` (shared rows), ``"H"`` (shared columns), ``"N"``
    (neither), or -- only when ``allow_overlap`` -- ``"O"`` (both).
    Disjoint elements can never overlap in both projections; passing two
    overlapping boxes without ``allow_overlap`` raises, as Definition 3 is
    undefined for that case.
    """
    y, x = _y_overlap(a, b), _x_overlap(a, b)
    if y and x:
        if allow_overlap:
            return "O"
        raise ValueError(f"boxes {a} and {b} overlap; elements cannot")
    if y:
        return "V"
    if x:
        return "H"
    return "N"


def _gap_v(a: Box, b: Box) -> float:
    """x-axis gap term ``|min(x1) - max(x0) + 1|`` (Definition 5, dv)."""
    return abs(min(a.x1, b.x1) - max(a.x0, b.x0) + 1)


def _gap_h(a: Box, b: Box) -> float:
    """y-axis gap term ``|min(y1) - max(y0) + 1|`` (Definition 5, dh)."""
    return abs(min(a.y1, b.y1) - max(a.y0, b.y0) + 1)


def magnitude(a: Box, b: Box, *, allow_overlap: bool = False) -> float:
    """Alignment magnitude per Definition 4 (shared projection length).

    For overlapping regions (Definition 8) it is the area of the overlap.
    """
    d = alignment(a, b, allow_overlap=allow_overlap)
    if d == "V":
        return min(a.y1, b.y1) - max(a.y0, b.y0) + 1
    if d == "H":
        return min(a.x1, b.x1) - max(a.x0, b.x0) + 1
    if d == "O":
        return (min(a.y1, b.y1) - max(a.y0, b.y0) + 1) * (
            min(a.x1, b.x1) - max(a.x0, b.x0) + 1
        )
    return 0.0


def distance(a: Box, b: Box, *, allow_overlap: bool = False) -> float:
    """Distance per Definition 5 (0 for overlapping regions, Definition 8).

    Adjacent aligned boxes have distance 0; non-aligned boxes combine both
    axis gaps Euclidean-style.
    """
    d = alignment(a, b, allow_overlap=allow_overlap)
    if d == "O":
        return 0.0
    if d == "V":
        return _gap_v(a, b)
    if d == "H":
        return _gap_h(a, b)
    return math.sqrt(_gap_v(a, b) ** 2 + _gap_h(a, b) ** 2)


def relation(a: Box, b: Box, *, allow_overlap: bool = False) -> tuple[str, float, float]:
    """Full spatial-relationship feature vector (direction, magnitude, distance)."""
    return (
        alignment(a, b, allow_overlap=allow_overlap),
        magnitude(a, b, allow_overlap=allow_overlap),
        distance(a, b, allow_overlap=allow_overlap),
    )
