"""Benchmark for Table 4: template-inference time per detection strategy.

One benchmark per (dataset, strategy) at SF=0.05 -- the full-scale
numbers are produced by ``jobs/table4_timing.py`` and recorded in
EXPERIMENTS.md; this bench tracks regressions in the same code path.
"""
from __future__ import annotations

import pytest

from repro.corpus import deco_config, fuste_config, generate_corpus
from repro.dist.pipeline import run_pipeline
from repro.eval.tables import STATIC_EPS, filter_outliers

_STRATEGIES = ("gold", "static", "cc", "genetic_csv", "tablesense")


@pytest.fixture(scope="module", params=["deco", "fuste"])
def corpus(request):
    cfg = deco_config() if request.param == "deco" else fuste_config()
    return request.param, filter_outliers(generate_corpus(cfg, sf=0.05))


@pytest.mark.parametrize("strategy", _STRATEGIES)
def test_bench_strategy(benchmark, spark, corpus, strategy):
    name, files = corpus
    params = {"eps": STATIC_EPS[name]} if strategy == "static" else {}

    def infer():
        return run_pipeline(spark, files, strategy=strategy, tau_f=0.99, **params)

    res = benchmark.pedantic(infer, rounds=1, iterations=1)
    assert len(res.labels) == len(files)
