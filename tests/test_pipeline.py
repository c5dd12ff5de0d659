"""End-to-end pipeline tests (gold-extraction ablation + NER mode)."""
import pytest
from pyspark.sql import functions as sf

from repro.core.pipeline import run_pipeline


class TestGoldExtraction:
    """With gold entities the only error sources are matching variants and
    size-equivalence — mapping should be near-total and calories close."""

    def test_profiles_cover_all_recipes(self, spark, corpus, pipeline_gold):
        recipes, _ = corpus
        assert pipeline_gold.profiles.count() == recipes.count()

    def test_name_mapping_high(self, spark, pipeline_gold):
        row = pipeline_gold.profiles.agg(
            sf.avg("pct_name_mapped").alias("avg")
        ).collect()[0]
        # ~4 % of vocab is unmappable, occurring in a minority of recipes
        assert row["avg"] > 85.0

    def test_full_mapping_close_behind_name_mapping(self, spark, pipeline_gold):
        row = pipeline_gold.profiles.agg(
            sf.avg("pct_name_mapped").alias("name"),
            sf.avg("pct_fully_mapped").alias("full"),
        ).collect()[0]
        assert row["full"] <= row["name"]
        assert row["name"] - row["full"] < 15.0

    def test_estimates_close_to_gold(self, spark, pipeline_gold):
        """Per-recipe estimated kcal tracks generator truth on fully
        mapped recipes (variant/size error only)."""
        sel = pipeline_gold.profiles.where(sf.col("pct_fully_mapped") >= 100.0)
        row = sel.select(
            (
                sf.abs(sf.col("est_kcal_total") - sf.col("gold_kcal_total"))
                / sf.col("gold_kcal_total")
            ).alias("rel_err")
        ).agg(sf.avg("rel_err").alias("avg"), sf.expr("percentile(rel_err, 0.5)").alias("med")).collect()[0]
        assert row["med"] < 0.15
        assert row["avg"] < 0.30

    def test_matched_scores_positive(self, spark, pipeline_gold):
        assert (
            pipeline_gold.matches.where(sf.col("score") <= 0).count() == 0
        )


class TestNerExtraction:
    def test_all_frames_present(self, pipeline_ner):
        for frame in (
            pipeline_ner.tagged, pipeline_ner.matches,
            pipeline_ner.resolved, pipeline_ner.profiles,
        ):
            assert frame is not None

    def test_tagged_has_ner_columns(self, pipeline_ner):
        for col in ("ner_name", "ner_state", "ner_qty", "ner_unit",
                    "ner_size", "ner_temp", "ner_df", "pred_tags"):
            assert col in pipeline_ner.tagged.columns

    def test_row_count_preserved(self, spark, corpus, pipeline_ner):
        _, ingredients = corpus
        assert pipeline_ner.resolved.count() == ingredients.count()

    def test_most_names_extracted(self, spark, pipeline_ner):
        frac = (
            pipeline_ner.tagged.where(sf.col("ner_name").isNotNull()).count()
            / pipeline_ner.tagged.count()
        )
        assert frac > 0.95

    def test_profile_columns(self, pipeline_ner):
        for col in ("pct_name_mapped", "pct_fully_mapped",
                    "est_kcal_per_serving", "est_kcal_total"):
            assert col in pipeline_ner.profiles.columns

    def test_ner_slightly_worse_than_gold(self, spark, pipeline_gold, pipeline_ner):
        gold = pipeline_gold.profiles.agg(
            sf.avg("pct_fully_mapped")
        ).collect()[0][0]
        ner = pipeline_ner.profiles.agg(
            sf.avg("pct_fully_mapped")
        ).collect()[0][0]
        # NER errors can only lose coverage, within a few points
        assert ner <= gold + 1.0
        assert ner > gold - 20.0

    def test_requires_tagger_or_gold(self, spark, corpus):
        recipes, ingredients = corpus
        with pytest.raises(ValueError):
            run_pipeline(spark, recipes, ingredients)
