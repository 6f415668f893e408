"""Syntactic cell typing and the Table-1 color encoding.

The paper (Sec. 4.1) identifies four fundamental syntactic types --
*number*, *datetime*, *string*, *empty* -- refined into sub-types:
integer/floating-point, time/date, uppercase/lowercase/titlecase/generic.
Each sub-type maps to a color such that sub-types of the same fundamental
type share a primary hue (Table 1): numbers are blue, datetimes green,
strings red, empty white. Histogram-based region similarity (Sec. 4.2)
relies on this property: same-fundamental-type cells are closer in color
space than cells of different fundamental types.
"""
from __future__ import annotations

import re
from enum import IntEnum

import numpy as np

__all__ = [
    "CellType",
    "COLORS",
    "COLOR_LUT",
    "FUNDAMENTAL",
    "cell_type",
    "type_grid",
]


class CellType(IntEnum):
    """Syntactic sub-types, one per Table-1 row (integer-coded for numpy grids)."""

    EMPTY = 0
    INTEGER = 1
    FLOAT = 2
    TIME = 3
    DATE = 4
    UPPER = 5
    LOWER = 6
    TITLE = 7
    GENERIC = 8


#: Sub-type -> fundamental type name (used by the entropy analysis and tests).
FUNDAMENTAL: dict[CellType, str] = {
    CellType.EMPTY: "empty",
    CellType.INTEGER: "number",
    CellType.FLOAT: "number",
    CellType.TIME: "datetime",
    CellType.DATE: "datetime",
    CellType.UPPER: "string",
    CellType.LOWER: "string",
    CellType.TITLE: "string",
    CellType.GENERIC: "string",
}

#: Table 1 of the paper: sub-type -> RGB color. One primary color per
#: fundamental type, shades per sub-type. The paper fixes lowercase
#: ("tomato red") at RGB(255, 75, 75) and titlecase ("scarlet red") at
#: RGB(255, 0, 0); remaining shades follow the named colors.
COLORS: dict[CellType, tuple[int, int, int]] = {
    CellType.EMPTY: (255, 255, 255),  # white
    CellType.INTEGER: (135, 206, 250),  # light blue
    CellType.FLOAT: (0, 0, 139),  # dark blue
    CellType.TIME: (144, 238, 144),  # light green
    CellType.DATE: (0, 100, 0),  # dark green
    CellType.UPPER: (128, 0, 0),  # maroon
    CellType.LOWER: (255, 75, 75),  # salmon/tomato red (paper RGB)
    CellType.TITLE: (255, 0, 0),  # scarlet red (paper RGB)
    CellType.GENERIC: (178, 34, 34),  # generic red (firebrick shade)
}

#: Lookup table: ``COLOR_LUT[cell_type]`` -> RGB row, for vectorized rendering.
COLOR_LUT: np.ndarray = np.array(
    [COLORS[CellType(i)] for i in range(len(CellType))], dtype=np.uint8
)

_INT_RE = re.compile(r"^[+-]?\d{1,3}(,\d{3})+$|^[+-]?\d+$")
_FLOAT_RE = re.compile(
    r"^[+-]?(\d{1,3}(,\d{3})*|\d*)\.\d+([eE][+-]?\d+)?$|^[+-]?\d+[eE][+-]?\d+$"
)
_TIME_RE = re.compile(r"^\d{1,2}:\d{2}(:\d{2})?$")
_DATE_RE = re.compile(
    r"^\d{1,2}[/.-]\d{1,2}[/.-]\d{2,4}$|^\d{4}[/.-]\d{1,2}[/.-]\d{1,2}$"
)


def cell_type(value: str | None) -> CellType:
    """Classify one literal cell value into its syntactic sub-type.

    Purely syntactic (no semantics, Sec. 4.1): ``"1990"`` is an INTEGER even
    if it denotes a year; parsing mistakes are assumed consistent across
    similar files. Whitespace-only values are EMPTY.
    """
    if value is None:
        return CellType.EMPTY
    v = value.strip()
    if not v:
        return CellType.EMPTY
    if _INT_RE.match(v):
        return CellType.INTEGER
    if _FLOAT_RE.match(v):
        return CellType.FLOAT
    if _TIME_RE.match(v):
        return CellType.TIME
    if _DATE_RE.match(v):
        return CellType.DATE
    if v.isupper():
        return CellType.UPPER
    if v.islower():
        return CellType.LOWER
    if v.istitle():
        return CellType.TITLE
    return CellType.GENERIC


def type_grid(cells: list[list[str]]) -> np.ndarray:
    """Map a rectangular grid of cell literals to a ``CellType`` int grid.

    ``cells`` is row-major (list of rows); the result is an ``int8`` array of
    shape ``(n_rows, n_cols)``.
    """
    return np.array(
        [[int(cell_type(c)) for c in row] for row in cells], dtype=np.int8
    )
