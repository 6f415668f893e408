"""Tests for connected components (union-find and Spark label propagation)."""
from __future__ import annotations

import pandas as pd
import pytest
from hypothesis import HealthCheck, given, settings
from hypothesis import strategies as st

from repro.dist.ccomp import components_spark, components_unionfind


class TestUnionFind:
    def test_no_edges_all_singletons(self):
        comp = components_unionfind(["a", "b", "c"], [])
        assert len(set(comp.values())) == 3

    def test_chain(self):
        comp = components_unionfind(["a", "b", "c", "d"], [("a", "b"), ("b", "c")])
        assert comp["a"] == comp["b"] == comp["c"] != comp["d"]

    def test_merge_two_groups(self):
        comp = components_unionfind(
            ["a", "b", "c", "d"], [("a", "b"), ("c", "d"), ("b", "c")]
        )
        assert len(set(comp.values())) == 1

    def test_labels_dense(self):
        comp = components_unionfind(["x", "y", "z"], [("x", "z")])
        assert set(comp.values()) == {0, 1}

    def test_duplicate_edges_ok(self):
        comp = components_unionfind(["a", "b"], [("a", "b"), ("b", "a"), ("a", "b")])
        assert comp["a"] == comp["b"]


@pytest.mark.usefixtures("spark")
class TestSparkComponents:
    def _run(self, spark, nodes, edges):
        ndf = spark.createDataFrame(pd.DataFrame({"node": nodes}))
        edf = spark.createDataFrame(edges, schema="src string, dst string")
        out = components_spark(spark, ndf, edf)
        return {r.node: r.component for r in out.collect()}

    def test_matches_unionfind_small(self, spark):
        nodes = [f"n{i}" for i in range(6)]
        edges = [("n0", "n1"), ("n1", "n2"), ("n4", "n5")]
        got = self._run(spark, nodes, edges)
        ref = components_unionfind(nodes, edges)
        part_got = {frozenset(k for k in got if got[k] == c) for c in set(got.values())}
        part_ref = {frozenset(k for k in ref if ref[k] == c) for c in set(ref.values())}
        assert part_got == part_ref

    def test_no_edges(self, spark):
        got = self._run(spark, ["a", "b"], [])
        assert got["a"] != got["b"]

    def test_component_id_is_min_node(self, spark):
        got = self._run(spark, ["b", "a", "c"], [("b", "c")])
        assert got["b"] == got["c"] == "b"
        assert got["a"] == "a"

    @settings(max_examples=5, deadline=None, suppress_health_check=list(HealthCheck))
    @given(
        st.lists(
            st.tuples(st.integers(0, 7), st.integers(0, 7)), min_size=0, max_size=10
        )
    )
    def test_random_graphs_match_unionfind(self, spark, pairs):
        nodes = [f"n{i}" for i in range(8)]
        edges = [(f"n{a}", f"n{b}") for a, b in pairs if a != b]
        got = self._run(spark, nodes, edges)
        ref = components_unionfind(nodes, edges)
        part_got = {frozenset(k for k in got if got[k] == c) for c in set(got.values())}
        part_ref = {frozenset(k for k in ref if ref[k] == c) for c in set(ref.values())}
        assert part_got == part_ref
