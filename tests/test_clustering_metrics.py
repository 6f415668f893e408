"""Unit tests for homogeneity / completeness / V-measure."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.eval.clustering_metrics import homogeneity_completeness_v, v_measure


class TestPerfect:
    def test_identical_labelings(self):
        h, c, v = homogeneity_completeness_v([1, 1, 2, 2], ["a", "a", "b", "b"])
        assert (h, c, v) == (1.0, 1.0, 1.0)

    def test_relabeled_partition_is_perfect(self):
        h, c, v = homogeneity_completeness_v([1, 1, 2], [9, 9, 3])
        assert (h, c, v) == (1.0, 1.0, 1.0)


class TestDegenerate:
    def test_all_singleton_prediction(self):
        """Each file its own cluster: perfectly homogeneous, incomplete
        (the paper's tau_f = 1 distortion, Sec. 5.4.3)."""
        h, c, v = homogeneity_completeness_v([1, 1, 2, 2], [0, 1, 2, 3])
        assert h == 1.0 and c < 1.0

    def test_single_cluster_prediction(self):
        h, c, v = homogeneity_completeness_v([1, 1, 2, 2], [0, 0, 0, 0])
        assert c == 1.0 and h < 1.0

    def test_empty_input(self):
        assert homogeneity_completeness_v([], []) == (1.0, 1.0, 1.0)

    def test_single_true_class(self):
        h, c, v = homogeneity_completeness_v([1, 1, 1], [0, 1, 2])
        assert h == 1.0  # zero class entropy -> 1 by convention

    def test_length_mismatch_raises(self):
        with pytest.raises(ValueError):
            homogeneity_completeness_v([1], [1, 2])


class TestKnownValues:
    def test_sklearn_doc_example(self):
        # sklearn's classic example: h=c=v for this symmetric split.
        true = [0, 0, 1, 1]
        pred = [0, 1, 0, 1]
        h, c, v = homogeneity_completeness_v(true, pred)
        assert h == pytest.approx(0.0, abs=1e-12)
        assert c == pytest.approx(0.0, abs=1e-12)

    def test_half_merged(self):
        true = [0, 0, 1, 1, 2, 2]
        pred = [0, 0, 0, 0, 1, 1]  # classes 0 and 1 merged
        h, c, v = homogeneity_completeness_v(true, pred)
        assert c == 1.0
        # H(C|K): cluster 0 has two classes evenly -> (4/6)*ln2 over H(C)=ln3
        expected_h = 1 - (4 / 6) * np.log(2) / np.log(3)
        assert h == pytest.approx(expected_h)

    def test_v_is_harmonic_mean(self):
        true = [0, 0, 1, 1, 2, 2]
        pred = [0, 0, 0, 0, 1, 1]
        h, c, v = homogeneity_completeness_v(true, pred)
        assert v == pytest.approx(2 * h * c / (h + c))
        assert v_measure(true, pred) == pytest.approx(v)


@settings(max_examples=50)
@given(
    st.lists(st.integers(0, 4), min_size=1, max_size=30),
    st.lists(st.integers(0, 4), min_size=1, max_size=30),
)
def test_scores_in_unit_interval(a, b):
    n = min(len(a), len(b))
    h, c, v = homogeneity_completeness_v(a[:n], b[:n])
    for s in (h, c, v):
        assert -1e-9 <= s <= 1 + 1e-9


@settings(max_examples=50)
@given(st.lists(st.integers(0, 4), min_size=1, max_size=30))
def test_symmetry_of_h_and_c(labels):
    """Homogeneity(a,b) == completeness(b,a)."""
    rng = np.random.default_rng(0)
    other = rng.integers(0, 3, len(labels)).tolist()
    h1, c1, _ = homogeneity_completeness_v(labels, other)
    h2, c2, _ = homogeneity_completeness_v(other, labels)
    assert h1 == pytest.approx(c2) and c1 == pytest.approx(h2)
