"""Tests for unit resolution and nutrient aggregation (§II-C)."""
import pytest
from pyspark.sql import functions as sf
from pyspark.sql import types as T

from repro.core.nutrition import (
    ingredient_nutrients,
    recipe_profiles,
    resolve_units,
)
from repro.core.units import build_unit_lookup
from repro.oracle import assert_equivalent
from repro.usda.db import usda_nutrients_df, usda_weights_df
from repro.usda.foods import food_by_description

_ROW_SCHEMA = T.StructType(
    [
        T.StructField("recipe_id", T.LongType(), False),
        T.StructField("ing_idx", T.IntegerType(), False),
        T.StructField("phrase", T.StringType(), False),
        T.StructField("ner_name", T.StringType(), True),
        T.StructField("ner_qty", T.StringType(), True),
        T.StructField("ner_unit", T.StringType(), True),
        T.StructField("ner_size", T.StringType(), True),
        T.StructField("food_id", T.IntegerType(), True),
    ]
)


@pytest.fixture(scope="module")
def unit_lookup(spark):
    return build_unit_lookup(spark, usda_weights_df(spark)).cache()


@pytest.fixture(scope="module")
def ids():
    by_desc = food_by_description()
    return {
        "butter": by_desc["Butter, salted"].food_id,
        "egg": by_desc["Egg, whole, raw, fresh"].food_id,
        "flour": by_desc["Wheat flour, white, all-purpose, enriched, bleached"].food_id,
        "beef": by_desc["Beef, ground, 85% lean meat / 15% fat, raw"].food_id,
    }


def _resolve(spark, unit_lookup, rows):
    df = spark.createDataFrame(rows, _ROW_SCHEMA)
    return {
        (r["recipe_id"], r["ing_idx"]): r
        for r in resolve_units(df, unit_lookup).collect()
    }


class TestUnitLookup:
    def test_exact_butter_cup(self, spark, unit_lookup, ids):
        row = unit_lookup.where(
            (sf.col("food_id") == ids["butter"]) & (sf.col("unit_key") == "cup")
        ).collect()
        assert row[0]["gram_per_unit"] == pytest.approx(227.0)
        assert row[0]["derivation"] == "exact"

    def test_derived_teaspoon_for_butter(self, spark, unit_lookup, ids):
        row = unit_lookup.where(
            (sf.col("food_id") == ids["butter"]) & (sf.col("unit_key") == "teaspoon")
        ).collect()
        assert row[0]["derivation"] == "volume"
        assert row[0]["gram_per_unit"] == pytest.approx(4.73, abs=0.05)

    def test_mass_units_everywhere(self, spark, unit_lookup):
        n_foods = unit_lookup.select("food_id").distinct().count()
        pounds = unit_lookup.where(sf.col("unit_key") == "pound").count()
        assert pounds == n_foods

    def test_no_duplicate_keys(self, spark, unit_lookup):
        dup = (
            unit_lookup.groupBy("food_id", "unit_key")
            .count()
            .where(sf.col("count") > 1)
        )
        assert dup.count() == 0

    def test_size_class_for_egg(self, spark, unit_lookup, ids):
        row = unit_lookup.where(
            (sf.col("food_id") == ids["egg"]) & (sf.col("unit_key") == "::size")
        ).collect()
        # first size row by seq = large = 50 g
        assert row[0]["gram_per_unit"] == pytest.approx(50.0)


class TestResolveUnits:
    def test_exact_unit(self, spark, unit_lookup, ids):
        out = _resolve(
            spark, unit_lookup,
            [(1, 0, "1 cup butter", "butter", "1", "cup", None, ids["butter"])],
        )
        assert out[(1, 0)]["grams"] == pytest.approx(227.0)

    def test_alias_unit(self, spark, unit_lookup, ids):
        out = _resolve(
            spark, unit_lookup,
            [(1, 0, "2 tbsp butter", "butter", "2", "tbsp", None, ids["butter"])],
        )
        assert out[(1, 0)]["grams"] == pytest.approx(28.4)

    def test_derived_teaspoon(self, spark, unit_lookup, ids):
        out = _resolve(
            spark, unit_lookup,
            [(1, 0, "1 teaspoon butter", "butter", "1", "teaspoon", None, ids["butter"])],
        )
        assert out[(1, 0)]["grams"] == pytest.approx(4.73, abs=0.05)

    def test_count_egg(self, spark, unit_lookup, ids):
        out = _resolve(
            spark, unit_lookup,
            [(1, 0, "2 eggs", "egg", "2", None, None, ids["egg"])],
        )
        assert out[(1, 0)]["grams"] == pytest.approx(100.0)

    def test_mass_direct(self, spark, unit_lookup, ids):
        out = _resolve(
            spark, unit_lookup,
            [(1, 0, "1/2 lb beef", "beef", "1/2", "lb", None, ids["beef"])],
        )
        assert out[(1, 0)]["grams"] == pytest.approx(226.8, abs=0.1)

    def test_quantity_parsing_applied(self, spark, unit_lookup, ids):
        out = _resolve(
            spark, unit_lookup,
            [(1, 0, "2 1/2 cups flour", "flour", "2 1/2", "cups", None, ids["flour"])],
        )
        assert out[(1, 0)]["grams"] == pytest.approx(2.5 * 125.0)

    def test_unit_recovered_from_phrase(self, spark, unit_lookup, ids):
        # NER missed the unit; §II-C says search the phrase
        out = _resolve(
            spark, unit_lookup,
            [(1, 0, "2 cups flour , sifted", "flour", "2", None, None, ids["flour"])],
        )
        assert out[(1, 0)]["grams"] == pytest.approx(250.0)

    def test_threshold_repair_500_cups(self, spark, unit_lookup, ids):
        # the paper's "500 g or 1 cup" mis-read as 500 cups → repaired
        out = _resolve(
            spark, unit_lookup,
            [(1, 0, "500 g or 1 cup flour", "flour", "500", "cup", None, ids["flour"])],
        )
        assert out[(1, 0)]["grams"] == pytest.approx(500.0)

    def test_most_frequent_unit_fallback(self, spark, unit_lookup, ids):
        # many 'cup' rows for flour; one row with an unusable unit string
        rows = [
            (1, i, "1 cup flour", "flour", "1", "cup", None, ids["flour"])
            for i in range(5)
        ] + [(2, 0, "1 flour", "flour", "1", "mystery", None, ids["flour"])]
        out = _resolve(spark, unit_lookup, rows)
        # unusable unit → mode unit (cup) → 125 g
        assert out[(2, 0)]["grams"] == pytest.approx(125.0)

    def test_unmatched_food_passes_through(self, spark, unit_lookup):
        out = _resolve(
            spark, unit_lookup,
            [(1, 0, "1 tsp garam masala", "garam masala", "1", "tsp", None, None)],
        )
        assert out[(1, 0)]["grams"] is None


class TestNutrientsAndProfiles:
    def test_scaling(self, spark, unit_lookup, ids):
        df = spark.createDataFrame(
            [(1, 0, "1 cup butter", "butter", "1", "cup", None, ids["butter"])],
            _ROW_SCHEMA,
        )
        resolved = resolve_units(df, unit_lookup)
        out = ingredient_nutrients(resolved, usda_nutrients_df(spark)).collect()[0]
        assert out["est_kcal"] == pytest.approx(227.0 * 717 / 100, rel=1e-3)

    def test_profiles_against_oracle(self, spark, unit_lookup, ids):
        rows = [
            (1, 0, "1 cup butter", "butter", "1", "cup", None, ids["butter"]),
            (1, 1, "2 eggs", "egg", "2", None, None, ids["egg"]),
            (2, 0, "1 tsp garam masala", "garam masala", "1", "tsp", None, None),
        ]
        df = spark.createDataFrame(rows, _ROW_SCHEMA)
        nutried = ingredient_nutrients(
            resolve_units(df, unit_lookup), usda_nutrients_df(spark)
        )
        recipes = spark.createDataFrame(
            [(1, 4, True), (2, 2, True)], ["recipe_id", "servings", "servings_clean"]
        )
        profiles = recipe_profiles(nutried, recipes).select(
            "recipe_id", "n_ingredients", "n_fully_mapped",
            sf.round("est_kcal_total", 4).alias("est_kcal_total"),
        )
        flat = nutried.select("recipe_id", "food_id", "grams", "est_kcal")
        assert_equivalent(
            profiles,
            """
            SELECT recipe_id,
                   count(*) AS n_ingredients,
                   sum(CASE WHEN food_id IS NOT NULL AND grams IS NOT NULL
                        THEN 1 ELSE 0 END) AS n_fully_mapped,
                   round(sum(est_kcal), 4) AS est_kcal_total
            FROM flat GROUP BY recipe_id
            """,
            flat=flat,
        )

    def test_per_serving(self, spark, unit_lookup, ids):
        df = spark.createDataFrame(
            [(1, 0, "1 cup butter", "butter", "1", "cup", None, ids["butter"])],
            _ROW_SCHEMA,
        )
        nutried = ingredient_nutrients(
            resolve_units(df, unit_lookup), usda_nutrients_df(spark)
        )
        recipes = spark.createDataFrame(
            [(1, 4, True)], ["recipe_id", "servings", "servings_clean"]
        )
        row = recipe_profiles(nutried, recipes).collect()[0]
        assert row["est_kcal_per_serving"] == pytest.approx(
            row["est_kcal_total"] / 4
        )
