"""Tests for the §III statistics module."""
import pytest
from pyspark.sql import functions as sf

from repro.core import stats
from repro.core.matching import usda_description_tokens


class TestMatchRate:
    def test_range(self, spark, pipeline_ner):
        rate = stats.unique_ingredient_match_rate(
            pipeline_ner.tagged, pipeline_ner.matches
        )
        # paper: 94.49 % — synthetic corpus sits in the same region
        assert 85.0 < rate < 100.0

    def test_gold_extraction_rate(self, spark, pipeline_gold):
        rate = stats.unique_ingredient_match_rate(
            pipeline_gold.tagged, pipeline_gold.matches
        )
        # with gold names, exactly the unmappable vocab stays unmatched
        assert 90.0 < rate < 100.0


class TestAuditAccuracy:
    def test_counts(self, spark, pipeline_gold):
        n_correct, n_audited, pct = stats.audit_accuracy(
            pipeline_gold.tagged, pipeline_gold.matches, top_n=500
        )
        assert 0 < n_correct <= n_audited <= 500
        assert 0.0 < pct <= 100.0

    def test_majority_correct(self, spark, pipeline_gold):
        _, _, pct = stats.audit_accuracy(
            pipeline_gold.tagged, pipeline_gold.matches
        )
        # paper: 71.6 % — most matches correct, a real minority wrong
        assert 55.0 < pct < 100.0


class TestMetricDisagreement:
    def test_sample_counts(self, spark, pipeline_ner):
        ut = usda_description_tokens(spark)
        differing, n = stats.metric_disagreement(
            pipeline_ner.tagged, ut, n_sample=300
        )
        assert n == 300
        assert 0 <= differing <= n

    def test_metrics_do_disagree(self, spark, pipeline_ner):
        ut = usda_description_tokens(spark)
        differing, n = stats.metric_disagreement(
            pipeline_ner.tagged, ut, n_sample=500
        )
        # paper: 227/1000 = 22.7 % — a substantial minority must differ
        assert 0.05 < differing / n < 0.60


class TestMappingHistogram:
    def test_two_series_sum_to_100(self, spark, pipeline_ner):
        hist = stats.mapping_histogram(pipeline_ner.profiles).collect()
        for series in ("name_mapped", "fully_mapped"):
            total = sum(r["pct_recipes"] for r in hist if r["series"] == series)
            assert total == pytest.approx(100.0, abs=1e-6)

    def test_buckets_valid(self, spark, pipeline_ner):
        hist = stats.mapping_histogram(pipeline_ner.profiles).collect()
        assert all(0 <= r["bucket"] <= 100 for r in hist)

    def test_mass_in_top_buckets(self, spark, pipeline_ner):
        hist = stats.mapping_histogram(pipeline_ner.profiles).collect()
        top = sum(
            r["pct_recipes"]
            for r in hist
            if r["series"] == "name_mapped" and r["bucket"] >= 80
        )
        # Figure 2's shape: most recipes map most ingredients
        assert top > 50.0


class TestCalorieError:
    def test_fields(self, spark, pipeline_ner):
        r = stats.calorie_error(pipeline_ner.profiles)
        assert r.n_recipes > 0
        assert r.mean_abs_error > 0
        assert r.median_abs_error <= r.mean_abs_error * 3
        assert r.mean_label_kcal > 0

    def test_error_in_paper_regime(self, spark, pipeline_ner):
        """Shape check: tens of kcal per serving, small relative to the
        mean label (paper: 36.42 kcal against ~meal-sized servings)."""
        r = stats.calorie_error(pipeline_ner.profiles)
        assert r.mean_abs_error < 120.0
        assert r.mean_abs_error / r.mean_label_kcal < 0.25

    def test_selection_respects_protocol(self, spark, pipeline_ner):
        eligible = pipeline_ner.profiles.where(
            sf.col("label_kcal_per_serving").isNotNull()
            & sf.col("servings_clean")
            & (sf.col("pct_fully_mapped") >= 100.0)
        ).count()
        assert stats.calorie_error(pipeline_ner.profiles).n_recipes == eligible
