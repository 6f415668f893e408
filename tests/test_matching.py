"""Unit tests for the Hungarian maximum-weight matching (no scipy)."""
from __future__ import annotations

import itertools

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.core.matching import max_weight_matching, min_cost_assignment


def brute_force_max(w: np.ndarray) -> float:
    """Exhaustive best matching value for small matrices."""
    m, n = w.shape
    best = 0.0
    rows = list(range(m))
    for k in range(0, min(m, n) + 1):
        for rsub in itertools.combinations(rows, k):
            for csub in itertools.permutations(range(n), k):
                best = max(best, sum(w[r, c] for r, c in zip(rsub, csub)))
    return best


class TestMinCostAssignment:
    def test_identity_is_optimal(self):
        cost = np.array([[0.0, 9, 9], [9, 0, 9], [9, 9, 0]])
        assert min_cost_assignment(cost) == [0, 1, 2]

    def test_permutation(self):
        cost = np.array([[9.0, 0, 9], [9, 9, 0], [0, 9, 9]])
        assert min_cost_assignment(cost) == [1, 2, 0]

    def test_empty(self):
        assert min_cost_assignment(np.zeros((0, 0))) == []

    def test_single(self):
        assert min_cost_assignment(np.array([[5.0]])) == [0]

    def test_rejects_rectangular(self):
        with pytest.raises(ValueError):
            min_cost_assignment(np.zeros((2, 3)))


class TestMaxWeightMatching:
    def test_square_diagonal(self):
        w = np.eye(3)
        matched = max_weight_matching(w)
        assert sorted((i, j) for i, j, _ in matched) == [(0, 0), (1, 1), (2, 2)]
        assert sum(x for _, _, x in matched) == pytest.approx(3.0)

    def test_rectangular_more_rows(self):
        w = np.array([[1.0, 0], [0, 1], [0.5, 0.5]])
        matched = max_weight_matching(w)
        assert sum(x for _, _, x in matched) == pytest.approx(2.0)

    def test_rectangular_more_cols(self):
        w = np.array([[0.2, 0.9, 0.1]])
        assert max_weight_matching(w) == [(0, 1, pytest.approx(0.9))]

    def test_negative_rejected(self):
        with pytest.raises(ValueError):
            max_weight_matching(np.array([[-1.0]]))

    def test_empty(self):
        assert max_weight_matching(np.zeros((0, 0))) == []

    def test_greedy_trap(self):
        # Greedy takes (0,0)=0.9 then is stuck with 0.0; optimal crosses.
        w = np.array([[0.9, 0.8], [0.7, 0.0]])
        matched = max_weight_matching(w)
        assert sum(x for _, _, x in matched) == pytest.approx(1.5)

    def test_matching_is_one_to_one(self):
        w = np.random.default_rng(0).random((5, 4))
        matched = max_weight_matching(w)
        rows = [i for i, _, _ in matched]
        cols = [j for _, j, _ in matched]
        assert len(rows) == len(set(rows)) and len(cols) == len(set(cols))

    @settings(max_examples=60, deadline=None)
    @given(
        arrays(
            np.float64,
            st.tuples(st.integers(1, 4), st.integers(1, 4)),
            elements=st.floats(0, 1, allow_nan=False),
        )
    )
    def test_optimal_vs_brute_force(self, w):
        matched = max_weight_matching(w)
        ours = sum(x for _, _, x in matched)
        assert ours == pytest.approx(brute_force_max(w), abs=1e-9)
