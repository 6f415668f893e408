"""Tests for the table harnesses (Tables 1-4) on small corpora."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.corpus import deco_config, fuste_config, generate_corpus
from repro.eval.tables import (
    DATASET_OVERVIEW_SQL,
    STATIC_EPS,
    TABLE4_STRATEGIES,
    table1_rows,
    table2_overview,
    table3_rows,
    table4_rows,
)
from repro.oracle import assert_equivalent


class TestTable1:
    def test_all_samples_classify_correctly(self):
        rows = table1_rows()
        assert len(rows) == 9
        assert all(r["matches"] for r in rows)

    def test_covers_every_subtype(self):
        assert {r["sub_type"] for r in table1_rows()} == {
            "EMPTY", "INTEGER", "FLOAT", "TIME", "DATE",
            "UPPER", "LOWER", "TITLE", "GENERIC",
        }


class TestTable2:
    @pytest.fixture(scope="class")
    def files(self):
        return [
            f
            for cfg in (deco_config(), fuste_config())
            for f in generate_corpus(cfg, sf=0.05)
        ]

    def test_overview_columns(self, spark, files):
        df = table2_overview(spark, files)
        assert set(df.columns) == {
            "dataset", "total_files", "single_region_files", "multi_region_files",
            "templates", "singleton_templates", "multi_templates",
        }
        assert df.count() == 2

    def test_overview_matches_duckdb_oracle(self, spark, files):
        """The Spark SQL aggregation is verified row-for-row by DuckDB."""
        df = table2_overview(spark, files)
        meta = pd.DataFrame(
            {
                "dataset": [f.dataset for f in files],
                "template_id": [f.template_id for f in files],
                "n_gold_regions": [f.n_regions for f in files],
            }
        )
        assert_equivalent(df, DATASET_OVERVIEW_SQL, corpus=meta)

    def test_single_plus_multi_equals_total(self, spark, files):
        for r in table2_overview(spark, files).collect():
            assert r.single_region_files + r.multi_region_files == r.total_files
            assert r.singleton_templates + r.multi_templates == r.templates


class TestTable3:
    def test_buckets_and_scores(self, spark):
        files = generate_corpus(fuste_config(), sf=0.04)
        rows, timings = table3_rows(spark, files, dataset="fuste", tau_f=0.99)
        assert {r.bucket for r in rows} <= {"1", "[2,5]", ">=6"}
        for r in rows:
            assert 0 <= r.homogeneity <= 1
            assert 0 <= r.completeness <= 1
            assert 0 <= r.v_measure <= 1
            assert r.n_files > 0
        assert timings["inference"] > 0

    def test_static_eps_defaults(self):
        assert STATIC_EPS == {"deco": 1.5, "fuste": 1.4}


class TestTable4:
    def test_rows_per_strategy(self, spark):
        files = generate_corpus(fuste_config(), sf=0.03)
        rows = table4_rows(
            spark,
            files,
            dataset="fuste",
            strategies=("gold", "static", "cc"),
            n_runs=1,
        )
        assert [r.strategy for r in rows] == ["gold", "static", "cc"]
        for r in rows:
            assert r.mean_seconds > 0
            assert r.n_regions > 0
            assert 0 <= r.v_measure <= 1

    def test_strategy_order_matches_paper(self):
        assert TABLE4_STRATEGIES == (
            "gold", "dynamic", "static", "cc",
            "genetic_xls", "genetic_csv", "tablesense",
        )
