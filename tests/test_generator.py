"""Tests for the synthetic RecipeDB corpus generator."""
import pytest
from pyspark.sql import functions as sf

from repro.oracle import assert_equivalent
from repro.recipes.generator import (
    N_RECIPES_PER_SF,
    REGIONS,
    ingredients_pdf,
    recipe_corpus,
    tagged_corpus,
)


class TestScale:
    def test_recipe_count_scales(self, spark):
        recipes, _ = recipe_corpus(spark, sf=0.001, seed=3)
        assert recipes.count() == round(N_RECIPES_PER_SF * 0.001)

    def test_paper_scale_constant(self):
        assert N_RECIPES_PER_SF == 118_071

    def test_regions_26(self):
        assert len(REGIONS) == 26


class TestDeterminism:
    def test_same_seed_same_corpus(self, spark):
        a = ingredients_pdf(0.0005, 5)
        b = ingredients_pdf(0.0005, 5)
        assert a.equals(b)

    def test_different_seed_differs(self, spark):
        a = ingredients_pdf(0.0005, 5)
        b = ingredients_pdf(0.0005, 6)
        assert not a["phrase"].equals(b["phrase"])


class TestCorpusShape:
    @pytest.fixture(scope="class")
    def small(self, spark):
        r, i = recipe_corpus(spark, sf=0.002, seed=1)
        return r.cache(), i.cache()

    def test_every_recipe_has_ingredients(self, spark, small):
        recipes, ingredients = small
        missing = recipes.join(ingredients, "recipe_id", "left_anti")
        assert missing.count() == 0

    def test_ingredient_counts_in_range(self, spark, small):
        _, ingredients = small
        counts = ingredients.groupBy("recipe_id").count()
        row = counts.agg(
            sf.min("count").alias("lo"), sf.max("count").alias("hi")
        ).collect()[0]
        assert row["lo"] >= 4 and row["hi"] <= 14

    def test_servings_range(self, spark, small):
        recipes, _ = small
        row = recipes.agg(
            sf.min("servings").alias("lo"), sf.max("servings").alias("hi")
        ).collect()[0]
        assert 2 <= row["lo"] and row["hi"] <= 12

    def test_labels_only_for_allrecipes(self, spark, small):
        recipes, _ = small
        bad = recipes.where(
            (sf.col("source") == "food.com")
            & sf.col("label_kcal_per_serving").isNotNull()
        )
        assert bad.count() == 0
        has = recipes.where(
            (sf.col("source") == "allrecipes")
            & sf.col("label_kcal_per_serving").isNotNull()
        )
        assert has.count() > 0

    def test_gold_total_matches_ingredient_sum(self, spark, small):
        """recipes.gold_kcal_total ≡ Σ ingredients.gold_kcal — checked
        through the DuckDB oracle over the same aggregation."""
        recipes, ingredients = small
        got = recipes.select("recipe_id", sf.round("gold_kcal_total", 4).alias("total"))
        assert_equivalent(
            got,
            """
            SELECT recipe_id, round(sum(gold_kcal), 4) AS total
            FROM ingredients GROUP BY recipe_id
            """,
            ingredients=ingredients,
        )

    def test_label_noise_centered_on_gold(self, spark, small):
        recipes, _ = small
        row = (
            recipes.where(sf.col("label_kcal_per_serving").isNotNull())
            .select(
                (
                    sf.col("label_kcal_per_serving")
                    - sf.col("gold_kcal_total") / sf.col("servings")
                ).alias("noise")
            )
            .agg(sf.avg("noise").alias("mu"), sf.stddev("noise").alias("sd"))
            .collect()[0]
        )
        assert abs(row["mu"]) < 15.0
        assert 10.0 < row["sd"] < 45.0


class TestTaggedCorpus:
    def test_size(self):
        assert len(tagged_corpus(100, seed=1)) == 100

    def test_deterministic(self):
        assert tagged_corpus(50, seed=2) == tagged_corpus(50, seed=2)

    def test_noise_free_mode(self):
        c = tagged_corpus(50, seed=3, tag_noise=0.0)
        assert all(len(toks) == len(tags) for toks, tags in c)

    def test_noise_changes_tags(self):
        clean = tagged_corpus(200, seed=4, tag_noise=0.0)
        noisy = tagged_corpus(200, seed=4, tag_noise=0.5)
        flips = sum(
            t1 != t2
            for (_, a), (_, b) in zip(clean, noisy)
            for t1, t2 in zip(a, b)
        )
        assert flips > 0
