"""Tests for the distributed matcher (heuristics (a)–(i))."""
import pytest
from pyspark.sql import functions as sf
from pyspark.sql import types as T

from repro.core.matching import (
    best_matches,
    ingredient_tokens,
    score_candidates,
    usda_description_tokens,
)
from repro.core.preprocess import phrase_word_set
from repro.usda.foods import all_foods

_SCHEMA = T.StructType(
    [T.StructField(c, T.StringType(), True) for c in ("name", "state", "temp", "df")]
)


def _keys(spark, rows):
    return spark.createDataFrame(rows, _SCHEMA)


@pytest.fixture(scope="module")
def usda_tokens(spark):
    return usda_description_tokens(spark).cache()


@pytest.fixture(scope="module")
def foods_by_id():
    return {f.food_id: f.description for f in all_foods()}


def _match_of(spark, usda_tokens, foods_by_id, name, state=None, metric="modified"):
    m = best_matches(
        _keys(spark, [(name, state, None, None)]), usda_tokens, metric=metric
    ).collect()
    if not m:
        return None
    return foods_by_id[m[0]["food_id"]]


class TestIngredientTokens:
    def test_matches_pure_function(self, spark):
        df = ingredient_tokens(_keys(spark, [("unsalted butter", None, None, None)]))
        rows = df.collect()
        words = {r["word"] for r in rows}
        expected, _ = phrase_word_set("unsalted butter")
        assert words == set(expected)
        assert all(r["a_size"] == len(expected) for r in rows)

    def test_state_flag(self, spark):
        df = ingredient_tokens(_keys(spark, [("onion", "chopped", None, None)]))
        assert all(r["has_state"] for r in df.collect())

    def test_null_name_skipped(self, spark):
        df = ingredient_tokens(_keys(spark, [(None, None, None, None)]))
        assert df.count() == 0

    def test_distinct_keys_deduped(self, spark):
        df = ingredient_tokens(
            _keys(spark, [("salt", None, None, None)] * 3)
        )
        assert df.count() == 1  # {"salt"} exploded once


class TestUsdaTokens:
    def test_priorities_start_at_one(self, usda_tokens):
        assert usda_tokens.agg(sf.min("priority")).collect()[0][0] == 1

    def test_covers_all_foods(self, usda_tokens):
        assert usda_tokens.select("food_id").distinct().count() == len(all_foods())

    def test_has_raw_flag(self, spark, usda_tokens, foods_by_id):
        apple_id = next(
            fid for fid, d in foods_by_id.items() if d == "Apples, raw, with skin"
        )
        rows = usda_tokens.where(sf.col("food_id") == apple_id).collect()
        assert all(r["has_raw"] for r in rows)


class TestKnownMatches:
    """Gold matches the paper names explicitly."""

    @pytest.mark.parametrize(
        "name,state,expected",
        [
            ("butter", None, "Butter, salted"),
            ("unsalted butter", None, "Butter, without salt"),
            ("egg", None, "Egg, whole, raw, fresh"),
            ("egg white", None, "Egg, white, raw, fresh"),
            ("egg yolk", None, "Egg, yolk, raw, fresh"),
            ("apple", None, "Apples, raw, with skin"),
            ("red lentils", None, "Lentils, pink or red, raw"),
            ("skim milk", None,
             "Milk, nonfat, fluid, with added vitamin A and vitamin D (fat free or skim)"),
            ("whole milk", None, "Milk, whole, 3.25% milkfat, with added vitamin D"),
            ("fava beans", None, "Broadbeans (fava beans), mature seeds, raw"),
            ("sesame seeds", None, "Seeds, sesame seeds, whole, dried"),
            ("cayenne pepper", "ground", "Spices, pepper, red or cayenne"),
            ("tomato paste", None, "Tomato products, canned, paste, without salt added"),
            ("vegetable broth", None, "Soup, vegetable broth, ready to serve"),
        ],
    )
    def test_modified_match(
        self, spark, usda_tokens, foods_by_id, name, state, expected
    ):
        assert _match_of(spark, usda_tokens, foods_by_id, name, state) == expected

    @pytest.mark.parametrize(
        "name", ["garam masala", "paneer", "ghee", "asafoetida", "jaggery", "kokum"]
    )
    def test_unmappable_get_no_match(self, spark, usda_tokens, foods_by_id, name):
        assert _match_of(spark, usda_tokens, foods_by_id, name) is None


class TestHeuristics:
    def test_h_priority_beats_babyfood(self, spark, usda_tokens, foods_by_id):
        # "apple" must hit "Apples, raw, with skin" (term 1), never
        # "Babyfood, apples, dices, toddler" (term 2) — heuristic (h)
        assert (
            _match_of(spark, usda_tokens, foods_by_id, "apple")
            == "Apples, raw, with skin"
        )

    def test_i_first_index_on_tie(self, spark, usda_tokens, foods_by_id):
        # "egg" ties whole/white/yolk on score+priority → lowest food_id
        assert (
            _match_of(spark, usda_tokens, foods_by_id, "egg")
            == "Egg, whole, raw, fresh"
        )

    def test_g_raw_bonus_requires_no_state(self, spark, usda_tokens):
        cands = score_candidates(
            _keys(
                spark,
                [("tomato", None, None, None), ("tomato", "chopped", None, None)],
            ),
            usda_tokens,
        )
        rows = cands.where(sf.col("raw_bonus") == 1).select("state").distinct().collect()
        assert all(r["state"] is None for r in rows)

    def test_e_metrics_disagree_on_fava(self, spark, usda_tokens, foods_by_id):
        mod = _match_of(spark, usda_tokens, foods_by_id, "fava beans", metric="modified")
        van = _match_of(spark, usda_tokens, foods_by_id, "fava beans", metric="vanilla")
        assert mod == "Broadbeans (fava beans), mature seeds, raw"
        assert van == "Beans, fava, in pod, raw"  # shorter description

    def test_f_negation_end_to_end(self, spark, usda_tokens, foods_by_id):
        assert (
            _match_of(spark, usda_tokens, foods_by_id, "unsalted butter")
            == "Butter, without salt"
        )


class TestBestMatchesShape:
    def test_one_row_per_key(self, spark, usda_tokens):
        keys = _keys(
            spark,
            [("butter", None, None, None), ("butter", "softened", None, None),
             ("egg", None, None, None)],
        )
        m = best_matches(keys, usda_tokens)
        assert m.count() == 3
        assert m.select("name", "state").distinct().count() == 3

    def test_scores_positive(self, spark, usda_tokens):
        m = best_matches(_keys(spark, [("butter", None, None, None)]), usda_tokens)
        assert m.collect()[0]["score"] > 0
