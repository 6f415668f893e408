"""Smoke tests: every job entrypoint runs at a tiny scale factor."""
from __future__ import annotations

import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parents[1] / "jobs"
sys.path.insert(0, str(JOBS))


def test_table1_job():
    import table1_colors

    rows = table1_colors.run()
    assert all(r["matches"] for r in rows)


def test_table2_job(spark):
    import table2_datasets

    rows = table2_datasets.run(spark, 0.03)
    assert {r["dataset"] for r in rows} == {"deco", "fuste"}


def test_table3_job(spark):
    import table3_regions

    rows = table3_regions.run(spark, 0.04)
    assert any(r.dataset == "deco" for r in rows)
    assert any(r.dataset == "fuste" for r in rows)


def test_table4_job(spark):
    import table4_timing

    rows = table4_timing.run(spark, 0.02, strategies=("gold", "cc"), n_runs=1)
    assert len(rows) == 4  # 2 datasets x 2 strategies


def test_region_detection_job(spark):
    import region_detection

    rows = region_detection.run(spark, 0.02, strategies=("static", "cc"))
    assert {r["strategy"] for r in rows} == {"static", "cc"}
    for r in rows:
        assert 0 <= r["mean_iou"] <= 1


def test_paper_reference_tables_complete():
    import table3_regions
    import table4_timing

    assert set(table3_regions.PAPER) == {"deco", "fuste"}
    assert len(table4_timing.PAPER) == 14
