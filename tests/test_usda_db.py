"""Tests for the synthetic USDA-SR database substrate."""
import pytest

from repro.usda import foods as F
from repro.usda.db import usda_foods_df, usda_nutrients_df, usda_weights_df
from repro.usda.foods import SEED_FOODS, all_foods, food_by_description

#: Table II of the paper, verbatim and in the paper's order.
TABLE2 = [
    "Butter, salted",
    "Butter, whipped, with salt",
    "Butter, without salt",
    "Cheese, blue",
    "Cheese, cottage, creamed, large or small curd",
    "Cheese, mozzarella, whole milk",
    "Milk, reduced fat, fluid, 2% milkfat, with added vitamin A and vitamin D",
    "Milk, reduced fat, fluid, 2% milkfat, with added nonfat milk solids and vitamin A and vitamin D",
    "Milk, reduced fat, fluid, 2% milkfat, protein fortified, with added vitamin A and vitamin D",
    "Milk, indian buffalo, fluid",
    "Milk shakes, thick chocolate",
    "Milk shakes, thick vanilla",
    "Yogurt, plain, whole milk, 8 grams protein per 8 ounce",
    "Yogurt, vanilla, low fat, 11 grams protein per 8 ounce",
    "Egg, whole, raw, fresh",
    "Egg, white, raw, fresh",
    "Egg, yolk, raw, fresh",
    "Apples, raw, with skin",
    "Apples, raw, without skin",
]


class TestFoodList:
    def test_table2_prefix(self):
        descs = [f.description for f in all_foods()[:19]]
        assert descs == TABLE2

    def test_ids_contiguous_from_one(self):
        foods = all_foods()
        assert [f.food_id for f in foods] == list(range(1, len(foods) + 1))

    def test_descriptions_unique(self):
        descs = [f.description for f in all_foods()]
        assert len(descs) == len(set(descs))

    def test_scale(self):
        # a few hundred descriptions: enough for USDA-like ambiguity
        assert 250 <= len(all_foods()) <= 1000

    def test_seed_foods_come_before_variants(self):
        foods = all_foods()
        assert [f.description for f in foods[: len(SEED_FOODS)]] == [
            d for d, *_ in SEED_FOODS
        ]

    def test_variants_exist(self):
        by_desc = food_by_description()
        assert "Onions, frozen, unprepared" in by_desc
        assert "Apples, cooked, boiled, drained, without salt" in by_desc

    def test_distractor_families_exist(self):
        by_desc = food_by_description()
        assert "Babyfood, apples, dices, toddler" in by_desc
        assert "Milk shakes, thick chocolate" in by_desc
        assert "Fast foods, quesadilla, with chicken" in by_desc

    def test_nutrients_plausible(self):
        for f in all_foods():
            assert 0 <= f.kcal <= 950, f.description
            assert 0 <= f.protein <= 100
            assert 0 <= f.fat <= 105
            assert 0 <= f.carb <= 105

    def test_variant_nutrients_differ_from_base(self):
        by_desc = food_by_description()
        base = by_desc["Onions, raw"]
        var = by_desc["Onions, frozen, unprepared"]
        assert var.kcal != pytest.approx(base.kcal)

    def test_categories_known(self):
        valid = {
            F.FAT_SOLID, F.OIL, F.LIQUID, F.POWDER, F.SPICE, F.HERB,
            F.PRODUCE, F.LEGUME, F.MEAT, F.FISH, F.EGG, F.DAIRY_SOLID,
            F.DAIRY_CREAM, F.GRAIN, F.BREAD, F.CANNED, F.CONDIMENT,
            F.GARLIC, F.DISTRACTOR,
        }
        assert {f.category for f in all_foods()} <= valid


class TestSparkFrames:
    def test_foods_df(self, spark):
        df = usda_foods_df(spark)
        assert df.columns == ["food_id", "description", "category"]
        assert df.count() == len(all_foods())

    def test_nutrients_df_covers_all_foods(self, spark):
        assert usda_nutrients_df(spark).count() == len(all_foods())

    def test_weights_df_covers_all_foods(self, spark):
        w = usda_weights_df(spark)
        assert w.select("food_id").distinct().count() == len(all_foods())
