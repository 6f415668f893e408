"""Benchmark for Table 3: full template-inference pipeline (static radius).

Runs the distributed pipeline at SF=0.1 on both corpora -- the workload
whose per-bucket quality scores constitute Table 3.
"""
from __future__ import annotations

import pytest

from repro.corpus import deco_config, fuste_config, generate_corpus
from repro.dist.pipeline import run_pipeline
from repro.eval.tables import STATIC_EPS, filter_outliers


@pytest.fixture(scope="module", params=["deco", "fuste"])
def corpus(request):
    cfg = deco_config() if request.param == "deco" else fuste_config()
    return request.param, filter_outliers(generate_corpus(cfg, sf=0.1))


def test_bench_template_inference(benchmark, spark, corpus):
    name, files = corpus

    def infer():
        return run_pipeline(
            spark, files, strategy="static", eps=STATIC_EPS[name], tau_f=0.99
        )

    res = benchmark.pedantic(infer, rounds=1, iterations=1)
    assert len(res.labels) == len(files)
