"""Benchmark for Table 2: corpus generation + Spark dataset overview."""
from __future__ import annotations

import pytest

from repro.corpus import deco_config, fuste_config, generate_corpus
from repro.eval.tables import table2_overview


@pytest.fixture(scope="module")
def files():
    return [
        f
        for cfg in (deco_config(), fuste_config())
        for f in generate_corpus(cfg, sf=0.1)
    ]


def test_bench_corpus_generation(benchmark):
    files = benchmark.pedantic(
        lambda: generate_corpus(deco_config(), sf=0.1), rounds=3, iterations=1
    )
    assert len(files) > 50


def test_bench_table2_overview(benchmark, spark, files):
    def overview():
        return table2_overview(spark, files).collect()

    rows = benchmark.pedantic(overview, rounds=3, iterations=1)
    assert len(rows) == 2
