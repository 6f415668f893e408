"""Integration tests for the distributed Mondrian pipeline (Spark)."""
from __future__ import annotations

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.mondrian import analyze_file
from repro.core.templates import infer_templates
from repro.corpus import deco_config, fuste_config, generate_corpus
from repro.dist.pipeline import (
    candidate_pairs_df,
    corpus_df,
    detect_regions_df,
    gold_df,
    layout_similarity_df,
    run_pipeline,
    template_labels_df,
)
from repro.eval.clustering_metrics import homogeneity_completeness_v
from repro.eval.tables import filter_outliers
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def fuste_files():
    return filter_outliers(generate_corpus(fuste_config(), sf=0.04))


@pytest.fixture(scope="module")
def deco_files():
    return filter_outliers(generate_corpus(deco_config(), sf=0.04))


@pytest.fixture(scope="module")
def fuste_corpus(spark, fuste_files):
    df = corpus_df(spark, fuste_files).cache()
    df.count()
    return df


@pytest.fixture(scope="module")
def fuste_regions(fuste_corpus):
    df = detect_regions_df(fuste_corpus, "static", eps=1.4).cache()
    df.count()
    return df


class TestCorpusDF:
    def test_row_per_file(self, spark, fuste_files, fuste_corpus):
        assert fuste_corpus.count() == len(fuste_files)

    def test_gold_df_row_per_region(self, spark, fuste_files):
        gdf = gold_df(spark, fuste_files)
        assert gdf.count() == sum(f.n_regions for f in fuste_files)

    def test_gold_region_counts_match_oracle(self, spark, fuste_files):
        """Spark aggregation over gold regions == DuckDB over the same rows."""
        gdf = gold_df(spark, fuste_files)
        agg = gdf.groupBy("kind").agg(F.count("*").alias("n")).orderBy("kind")
        pdf = pd.DataFrame(
            [
                {"file_id": f.file_id, "kind": g.kind}
                for f in fuste_files
                for g in f.gold
            ]
        )
        assert_equivalent(
            agg,
            "SELECT kind, count(*) AS n FROM gold GROUP BY kind ORDER BY kind",
            gold=pdf,
        )


class TestDetectRegionsDF:
    def test_matches_driver_side_detection(self, fuste_files, fuste_regions):
        got = {
            (r.file_id, r.x0, r.y0, r.x1, r.y1)
            for r in fuste_regions.collect()
        }
        want = set()
        for f in fuste_files:
            fl = analyze_file(f.file_id, f.content, eps=1.4)
            for r in fl.regions:
                want.add((f.file_id, r.box.x0, r.box.y0, r.box.x1, r.box.y1))
        assert got == want

    def test_histogram_length(self, fuste_regions):
        row = fuste_regions.first()
        assert len(row.hist) == 192

    def test_region_ids_dense_per_file(self, fuste_regions):
        agg = (
            fuste_regions.groupBy("file_id")
            .agg(F.count("*").alias("n"), F.max("region_id").alias("mx"))
            .collect()
        )
        for r in agg:
            assert r.mx == r.n - 1


class TestCandidatePairs:
    def test_matches_driver_candidates(self, spark, fuste_files, fuste_regions):
        pairs = {
            (r.file_a, r.file_b)
            for r in candidate_pairs_df(spark, fuste_regions).collect()
        }
        layouts = {
            f.file_id: analyze_file(f.file_id, f.content, eps=1.4).layout
            for f in fuste_files
        }
        from repro.core.templates import candidate_pairs

        assert pairs == set(candidate_pairs(layouts))

    def test_pairs_ordered(self, spark, fuste_regions):
        for r in candidate_pairs_df(spark, fuste_regions).collect():
            assert r.file_a < r.file_b


class TestLayoutSimilarity:
    def test_matches_driver_similarities(self, spark, fuste_files, fuste_regions):
        pairs = candidate_pairs_df(spark, fuste_regions)
        sims = {
            (r.file_a, r.file_b): r.similarity
            for r in layout_similarity_df(spark, fuste_regions, pairs).collect()
        }
        layouts = {
            f.file_id: analyze_file(f.file_id, f.content, eps=1.4).layout
            for f in fuste_files
        }
        ref = infer_templates(layouts, tau_f=0.99)
        assert set(sims) == set(ref.similarities)
        for k, v in ref.similarities.items():
            assert sims[k] == pytest.approx(v, abs=1e-9)


class TestEndToEnd:
    def test_spark_equals_driver_templates(self, spark, fuste_files):
        res = run_pipeline(spark, fuste_files, strategy="static", eps=1.4, tau_f=0.99)
        layouts = {
            f.file_id: analyze_file(f.file_id, f.content, eps=1.4).layout
            for f in fuste_files
        }
        ref = infer_templates(layouts, tau_f=0.99)
        # Same partition of files into templates.
        def part(labels):
            inv = {}
            for k, v in labels.items():
                inv.setdefault(v, set()).add(k)
            return {frozenset(v) for v in inv.values()}

        assert part(res.labels) == part(ref.labels)

    def test_distributed_components_agree(self, spark, fuste_files):
        a = run_pipeline(
            spark, fuste_files, strategy="static", eps=1.4, distributed_components=False
        )
        b = run_pipeline(
            spark, fuste_files, strategy="static", eps=1.4, distributed_components=True
        )
        def part(labels):
            inv = {}
            for k, v in labels.items():
                inv.setdefault(v, set()).add(k)
            return {frozenset(v) for v in inv.values()}

        assert part(a.labels) == part(b.labels)

    def test_gold_strategy_near_perfect_v(self, spark, deco_files):
        res = run_pipeline(spark, deco_files, strategy="gold", tau_f=0.99)
        true = [f.template_id for f in deco_files]
        pred = [res.labels[f.file_id] for f in deco_files]
        _, _, v = homogeneity_completeness_v(true, pred)
        assert v >= 0.9

    def test_timings_present(self, spark, fuste_files):
        res = run_pipeline(spark, fuste_files[:10], strategy="static", eps=1.4)
        assert set(res.timings) >= {"detection", "matching", "flooding", "grouping", "inference"}
        assert all(t >= 0 for t in res.timings.values())

    def test_template_labels_df_edges_thresholded(self, spark, fuste_corpus):
        sims = spark.createDataFrame(
            pd.DataFrame(
                {
                    "file_a": ["fuste_0000", "fuste_0000"],
                    "file_b": ["fuste_0001", "fuste_0002"],
                    "similarity": [1.0, 0.5],
                }
            )
        )
        labels = {
            r.file_id: r.template_label
            for r in template_labels_df(
                spark, fuste_corpus, sims, tau_f=0.99, distributed=False
            ).collect()
        }
        assert labels["fuste_0000"] == labels["fuste_0001"]
        assert labels["fuste_0002"] != labels["fuste_0000"]
