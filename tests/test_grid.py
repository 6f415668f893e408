"""Unit tests for CSV parsing, padding, and image rendering."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.cells import COLORS, CellType
from repro.core.grid import (
    csv_to_type_grid,
    pad_rows,
    parse_csv,
    render_image,
    to_csv,
)


def test_parse_simple_csv():
    assert parse_csv("a,b\nc,d\n") == [["a", "b"], ["c", "d"]]


def test_parse_quoted_commas():
    assert parse_csv('"a,b",c\n') == [["a,b", "c"]]


def test_parse_alternate_delimiter():
    assert parse_csv("a;b\n", delimiter=";") == [["a", "b"]]


def test_pad_rows_to_longest():
    rows = pad_rows([["a"], ["b", "c", "d"], []])
    assert rows == [["a", "", ""], ["b", "c", "d"], ["", "", ""]]


def test_pad_rows_empty():
    assert pad_rows([]) == []


def test_csv_to_type_grid_ragged_rows():
    """Ragged csv rows are padded with EMPTY cells (Sec. 4.1)."""
    g = csv_to_type_grid("1,2,3\nx\n")
    assert g.shape == (2, 3)
    assert g[1, 1] == CellType.EMPTY
    assert g[1, 2] == CellType.EMPTY


def test_csv_to_type_grid_empty_text():
    assert csv_to_type_grid("").shape == (0, 0)


def test_one_pixel_per_cell():
    """An M x N csv becomes an M x N image (Sec. 4.1)."""
    g = csv_to_type_grid("1,2\n3,4\n5,6\n")
    img = render_image(g)
    assert img.shape == (3, 2, 3)
    assert img.dtype == np.uint8


def test_render_image_colors():
    g = csv_to_type_grid("14,,Firm Sales\n")
    img = render_image(g)
    assert tuple(img[0, 0]) == COLORS[CellType.INTEGER]
    assert tuple(img[0, 1]) == COLORS[CellType.EMPTY]
    assert tuple(img[0, 2]) == COLORS[CellType.TITLE]


def test_to_csv_roundtrip():
    rows = [["a", "b", ""], ["1", "", "2"]]
    assert parse_csv(to_csv(rows)) == rows


def test_to_csv_quotes_embedded_commas():
    rows = [["a,b", "c"]]
    assert parse_csv(to_csv(rows)) == rows


@pytest.mark.parametrize("text", ["\n", ",\n", ",,\n,,\n"])
def test_all_empty_grids(text):
    g = csv_to_type_grid(text)
    assert (g == CellType.EMPTY).all()
