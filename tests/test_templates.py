"""Unit tests for Algorithm-1 template inference (driver-side)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.elements import Box
from repro.core.layout import Layout
from repro.core.mondrian import analyze_file
from repro.core.templates import (
    candidate_pairs,
    group_templates,
    infer_templates,
    pair_similarities,
)


def _file(fid: str, csv: str):
    return fid, analyze_file(fid, csv).layout


TABLE_A = "Year,Total\n2001,10\n2002,20\n2003,30\n"
TABLE_A2 = "Year,Total\n2011,55\n2012,66\n2013,77\n"
TABLE_B = "alpha beta,gamma delta\nepsilon zeta,eta theta\niota kappa,lambda mu\n"


class TestCandidatePairs:
    def test_similar_regions_make_candidates(self):
        layouts = dict([_file("a", TABLE_A), _file("b", TABLE_A2)])
        assert candidate_pairs(layouts) == [("a", "b")]

    def test_dissimilar_regions_pruned(self):
        layouts = dict([_file("a", TABLE_A), _file("b", TABLE_B)])
        assert candidate_pairs(layouts) == []

    def test_pairs_sorted_and_unique(self):
        layouts = dict(
            [_file("a", TABLE_A), _file("b", TABLE_A2), _file("c", TABLE_A)]
        )
        assert candidate_pairs(layouts) == [("a", "b"), ("a", "c"), ("b", "c")]

    def test_no_self_pairs(self):
        layouts = dict([_file("a", TABLE_A)])
        assert candidate_pairs(layouts) == []

    def test_empty_corpus(self):
        assert candidate_pairs({}) == []

    def test_blocking_invariant(self):
        layouts = dict(
            [_file(f"f{i}", TABLE_A if i % 2 else TABLE_A2) for i in range(6)]
        )
        assert candidate_pairs(layouts, block=2) == candidate_pairs(layouts, block=512)


class TestPairSimilarities:
    def test_bound_pruning_skips_flooding(self):
        rng = np.random.default_rng(0)
        big = Layout([Box(0, 0, 1, 1), Box(0, 4, 1, 5), Box(4, 0, 5, 1)], rng.random((3, 192)))
        small = Layout([Box(0, 0, 1, 1)], rng.random((1, 192)))
        sims = pair_similarities({"a": big, "b": small}, [("a", "b")], prune_below=0.7)
        assert sims[("a", "b")] == pytest.approx(1 / 3)

    def test_identical_pair_scores_one(self):
        fid, layout = _file("a", TABLE_A)
        sims = pair_similarities({"a": layout, "b": layout}, [("a", "b")])
        assert sims[("a", "b")] == pytest.approx(1.0, abs=1e-6)


class TestGroupTemplates:
    def test_transitive_closure(self):
        sims = {("a", "b"): 1.0, ("b", "c"): 1.0}
        labels = group_templates(["a", "b", "c", "d"], sims, tau_f=0.99)
        assert labels["a"] == labels["b"] == labels["c"]
        assert labels["d"] != labels["a"]

    def test_threshold_filters_edges(self):
        sims = {("a", "b"): 0.95}
        labels = group_templates(["a", "b"], sims, tau_f=0.99)
        assert labels["a"] != labels["b"]

    def test_labels_dense_and_deterministic(self):
        labels = group_templates(["c", "a", "b"], {}, tau_f=0.5)
        assert labels == {"a": 0, "b": 1, "c": 2}


class TestInferTemplates:
    def test_end_to_end_grouping(self):
        layouts = dict(
            [_file("a", TABLE_A), _file("b", TABLE_A2), _file("c", TABLE_B)]
        )
        res = infer_templates(layouts, tau_f=0.99)
        assert res.labels["a"] == res.labels["b"]
        assert res.labels["c"] != res.labels["a"]

    def test_order_independence(self):
        """Sec. 4.4: results do not depend on file processing order."""
        items = [_file("a", TABLE_A), _file("b", TABLE_A2), _file("c", TABLE_B)]
        r1 = infer_templates(dict(items), tau_f=0.99)
        r2 = infer_templates(dict(reversed(items)), tau_f=0.99)
        part1 = {frozenset(k for k, v in r1.labels.items() if v == lbl) for lbl in set(r1.labels.values())}
        part2 = {frozenset(k for k, v in r2.labels.items() if v == lbl) for lbl in set(r2.labels.values())}
        assert part1 == part2

    def test_all_singletons_without_candidates(self):
        layouts = dict([_file("a", TABLE_A), _file("b", TABLE_B)])
        res = infer_templates(layouts)
        assert len(set(res.labels.values())) == 2
        assert res.candidates == []
        assert res.similarities == {}

    def test_similarities_only_for_candidates(self):
        layouts = dict(
            [_file("a", TABLE_A), _file("b", TABLE_A2), _file("c", TABLE_B)]
        )
        res = infer_templates(layouts)
        assert set(res.similarities) == set(res.candidates)
