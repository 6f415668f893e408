"""Unit tests for histogram-correlation region similarity."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.core.elements import Box
from repro.core.grid import csv_to_type_grid
from repro.core.region_sim import TAU_R, correlation_matrix, histogram_correlation
from repro.core.regions import color_histogram


def hist(csv: str) -> np.ndarray:
    tg = csv_to_type_grid(csv)
    return color_histogram(tg, Box(0, 0, tg.shape[1] - 1, tg.shape[0] - 1))


class TestScalarCorrelation:
    def test_self_similarity_is_one(self):
        h = hist("1,2\na,b\n")
        assert histogram_correlation(h, h) == pytest.approx(1.0)

    def test_scale_invariance(self):
        """Same type mix at k-times the area -> correlation 1 (region
        equivalence must tolerate different table sizes)."""
        h1 = hist("1,a\n2,b\n")
        h2 = hist("1,a\n2,b\n3,c\n4,d\n")
        assert histogram_correlation(h1, h2) == pytest.approx(1.0)

    def test_different_type_mix_below_one(self):
        h1 = hist("1,2,3\n4,5,6\n")  # all integers
        h2 = hist("a,b,c\nd,e,f\n")  # all lowercase
        assert histogram_correlation(h1, h2) < 0.6

    def test_clamped_nonnegative(self):
        h1 = hist("1,1\n")
        h2 = hist("x y z,w v\n")
        assert 0.0 <= histogram_correlation(h1, h2) <= 1.0

    def test_symmetry(self):
        h1, h2 = hist("1,a\n"), hist("2,3\n")
        assert histogram_correlation(h1, h2) == pytest.approx(
            histogram_correlation(h2, h1)
        )

    def test_zero_histograms(self):
        z = np.zeros(192)
        assert histogram_correlation(z, z) == 1.0
        assert histogram_correlation(z, hist("1\n")) == 0.0

    def test_shared_mix_correlates_higher_than_disjoint(self):
        """A region correlates higher with a same-mix region than with a
        fully different one (at 64 bins/channel the fingerprint acts on
        exact sub-type bins; the shading property is a color-space claim
        tested in test_cells)."""
        mixed = hist("Year,Total\n1,2.5\n2,3.5\n")
        similar = hist("Year,Sum\n3,9.5\n4,1.5\n5,2.5\n")
        disjoint = hist("17:00,18:00\n19:00,20:00\n")
        assert histogram_correlation(mixed, similar) > histogram_correlation(
            mixed, disjoint
        )

    def test_tau_r_value(self):
        assert TAU_R == 0.75


class TestCorrelationMatrix:
    @settings(max_examples=30)
    @given(
        arrays(
            np.float64,
            st.tuples(st.integers(1, 5), st.just(16)),
            elements=st.floats(0, 50),
        ),
        arrays(
            np.float64,
            st.tuples(st.integers(1, 5), st.just(16)),
            elements=st.floats(0, 50),
        ),
    )
    def test_matches_scalar(self, H1, H2):
        M = correlation_matrix(H1, H2)
        assert M.shape == (H1.shape[0], H2.shape[0])
        for i in range(H1.shape[0]):
            for j in range(H2.shape[0]):
                a, b = H1[i] - H1[i].mean(), H2[j] - H2[j].mean()
                if np.linalg.norm(a) > 0 and np.linalg.norm(b) > 0:
                    assert M[i, j] == pytest.approx(
                        histogram_correlation(H1[i], H2[j]), abs=1e-9
                    )

    def test_values_in_unit_interval(self):
        H = np.vstack([hist("1,2\n"), hist("a,b\n"), hist("1.5,x\n")])
        M = correlation_matrix(H, H)
        assert (M >= 0).all() and (M <= 1).all()
        assert np.allclose(np.diag(M), 1.0)
