"""CSV text <-> padded cell grid <-> type grid <-> pixel image.

The paper's image parsing (Sec. 4.1): a csv file with M rows and N columns
becomes an M x N image with one pixel per cell, colored by syntactic type.
Rows are padded with empty cells up to the longest row, since csv rows need
not have the same number of delimiters.
"""
from __future__ import annotations

import csv
import io

import numpy as np

from repro.core.cells import COLOR_LUT, type_grid

__all__ = ["parse_csv", "pad_rows", "csv_to_type_grid", "render_image", "to_csv"]


def parse_csv(text: str, delimiter: str = ",") -> list[list[str]]:
    """Parse CSV text into a list of rows of string cells (no padding)."""
    return list(csv.reader(io.StringIO(text), delimiter=delimiter))


def pad_rows(rows: list[list[str]]) -> list[list[str]]:
    """Pad every row with empty strings to the length of the longest row."""
    if not rows:
        return []
    width = max(len(r) for r in rows)
    return [r + [""] * (width - len(r)) for r in rows]


def csv_to_type_grid(text: str, delimiter: str = ",") -> np.ndarray:
    """CSV text -> int8 grid of ``CellType`` codes, shape (M rows, N cols).

    An empty file yields a (0, 0) grid.
    """
    rows = pad_rows(parse_csv(text, delimiter))
    if not rows:
        return np.zeros((0, 0), dtype=np.int8)
    return type_grid(rows)


def render_image(tgrid: np.ndarray) -> np.ndarray:
    """Type grid -> RGB image (M, N, 3) uint8 per the Table-1 palette."""
    return COLOR_LUT[tgrid]


def to_csv(rows: list[list[str]]) -> str:
    """Serialize rows back to CSV text (used by the corpus generator)."""
    buf = io.StringIO()
    w = csv.writer(buf, lineterminator="\n")
    w.writerows(rows)
    return buf.getvalue()
