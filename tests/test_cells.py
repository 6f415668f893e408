"""Unit tests for syntactic cell typing and the Table-1 color encoding."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core.cells import (
    COLOR_LUT,
    COLORS,
    FUNDAMENTAL,
    CellType,
    cell_type,
    type_grid,
)


@pytest.mark.parametrize(
    "value,expected",
    [
        ("", CellType.EMPTY),
        ("   ", CellType.EMPTY),
        ("\t", CellType.EMPTY),
        (None, CellType.EMPTY),
        ("14", CellType.INTEGER),
        ("0", CellType.INTEGER),
        ("-7", CellType.INTEGER),
        ("+42", CellType.INTEGER),
        ("1,234,567", CellType.INTEGER),
        ("47.74", CellType.FLOAT),
        ("-0.5", CellType.FLOAT),
        (".5", CellType.FLOAT),
        ("1e5", CellType.FLOAT),
        ("2.5E-3", CellType.FLOAT),
        ("1,234.56", CellType.FLOAT),
        ("17:00", CellType.TIME),
        ("9:05", CellType.TIME),
        ("23:59:59", CellType.TIME),
        ("17/9/20", CellType.DATE),
        ("01/02/2020", CellType.DATE),
        ("2020-01-02", CellType.DATE),
        ("1.2.1999", CellType.DATE),
        ("MWH", CellType.UPPER),
        ("TOTAL REVENUE", CellType.UPPER),
        ("real/time", CellType.LOWER),
        ("lowercase words", CellType.LOWER),
        ("Firm Sales", CellType.TITLE),
        ("Projected Infant Mortality", CellType.TITLE),
        ("System avg. =", CellType.GENERIC),
        ("mixedCase Word", CellType.GENERIC),
        ("N/A?", CellType.UPPER),  # str.isupper(): all cased chars upper
        ("iPhone Sales", CellType.GENERIC),
    ],
)
def test_cell_type_cases(value, expected):
    assert cell_type(value) == expected


def test_year_is_integer_not_date():
    # Sec. 4.1's canonical ambiguity: "1990" is classified syntactically.
    assert cell_type("1990") == CellType.INTEGER


def test_leading_trailing_whitespace_stripped():
    assert cell_type("  14  ") == CellType.INTEGER
    assert cell_type("  Firm Sales ") == CellType.TITLE


@pytest.mark.parametrize("t", list(CellType))
def test_every_type_has_a_color(t):
    assert t in COLORS
    assert len(COLORS[t]) == 3
    assert all(0 <= c <= 255 for c in COLORS[t])


def test_color_lut_matches_colors():
    for t in CellType:
        assert tuple(COLOR_LUT[int(t)]) == COLORS[t]


def test_paper_fixed_rgb_values():
    # The paper pins two RGB values explicitly (Sec. 4.2).
    assert COLORS[CellType.LOWER] == (255, 75, 75)
    assert COLORS[CellType.TITLE] == (255, 0, 0)
    assert COLORS[CellType.EMPTY] == (255, 255, 255)


def _dominant_channel(rgb):
    r, g, b = rgb
    if r == g == b:
        return "white"
    return "rgb"[int(np.argmax(rgb))]


def test_fundamental_types_share_primary_color():
    """Table-1 invariant: one primary color per fundamental type."""
    for t in CellType:
        fam = FUNDAMENTAL[t]
        dom = _dominant_channel(COLORS[t])
        if fam == "string":
            assert dom == "r"
        elif fam == "number":
            assert dom == "b"
        elif fam == "datetime":
            assert dom == "g"
        else:
            assert dom == "white"


def test_same_family_closer_than_cross_family():
    """Sub-types of one fundamental type are closer in color space."""
    d = lambda a, b: np.linalg.norm(np.array(COLORS[a]) - np.array(COLORS[b]))
    assert d(CellType.LOWER, CellType.TITLE) < d(CellType.LOWER, CellType.INTEGER)
    assert d(CellType.INTEGER, CellType.FLOAT) < d(CellType.INTEGER, CellType.DATE)
    assert d(CellType.TIME, CellType.DATE) < d(CellType.TIME, CellType.UPPER)


def test_all_colors_distinct():
    assert len(set(COLORS.values())) == len(COLORS)


def test_type_grid_shape_and_values():
    g = type_grid([["14", "", "Firm Sales"], ["x y", "17:00", "1.5"]])
    assert g.shape == (2, 3)
    assert g[0, 0] == CellType.INTEGER
    assert g[0, 1] == CellType.EMPTY
    assert g[0, 2] == CellType.TITLE
    assert g[1, 0] == CellType.LOWER
    assert g[1, 1] == CellType.TIME
    assert g[1, 2] == CellType.FLOAT


def test_type_grid_dtype():
    assert type_grid([["1"]]).dtype == np.int8


@given(st.text(max_size=30))
def test_cell_type_total_function(s):
    """Any string classifies to exactly one valid type (no exceptions)."""
    assert cell_type(s) in set(CellType)


@given(st.integers(min_value=-10**12, max_value=10**12))
def test_integers_always_integer(n):
    assert cell_type(str(n)) == CellType.INTEGER


@given(st.floats(allow_nan=False, allow_infinity=False, width=32))
def test_floats_are_numeric(x):
    t = cell_type(f"{x:.4f}")
    assert FUNDAMENTAL[t] == "number"


@given(st.text(alphabet=st.characters(whitelist_categories=("Zs",)), max_size=8))
def test_whitespace_always_empty(s):
    assert cell_type(s) == CellType.EMPTY
