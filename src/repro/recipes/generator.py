"""Synthetic RecipeDB corpus generation.

``recipe_corpus(spark, sf, seed)`` returns ``(recipes_df, ingredients_df)``
at scale factor ``sf`` (SF=1.0 ≈ the paper's 118,071 recipes).

``recipes_df``:  recipe_id, source (allrecipes/food.com), region,
servings, servings_clean, gold_kcal_total, label_kcal_per_serving —
the AllRecipes third-party calorie label the paper treats as gold:
generator truth plus N(0, 25 kcal) "physical variation" noise, present
only for AllRecipes-sourced recipes.

``ingredients_df``: recipe_id, ing_idx, phrase, tokens, tags, and the
gold_* ground-truth columns (the manual annotations the paper's authors
produced by hand).

``tagged_corpus(n, seed)`` emits standalone ``(tokens, tags)`` phrase
pairs for NER training/evaluation.
"""
from __future__ import annotations

import random

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from repro.recipes.phrases import RenderedIngredient, render_ingredient
from repro.recipes.vocabulary import Ingredient, vocabulary

#: paper corpus size at SF=1.0.
N_RECIPES_PER_SF = 118_071

#: RecipeDB spans 26 regional cuisines (paper §III).
REGIONS = [
    "US", "Canadian", "Mexican", "Caribbean", "South American", "French",
    "Italian", "Spanish", "Portuguese", "German", "UK", "Irish",
    "Scandinavian", "Eastern European", "Greek", "Middle Eastern",
    "African", "Indian", "Pakistani", "Bangladeshi", "Chinese", "Japanese",
    "Korean", "Thai", "Vietnamese", "Australian",
]

#: region-centric (unmappable) ingredients concentrate in some cuisines.
_REGIONAL_BOOST = {"Indian", "Pakistani", "Bangladeshi"}


def _ingredient_weights(vocab: list[Ingredient]) -> list[float]:
    """Zipf-flavoured sampling weights with staple boosts — a few units
    dominate each ingredient's distribution, which the most-frequent-unit
    fallback (§II-C) depends on."""
    boosts = {
        "salt": 10.0, "butter": 8.0, "sugar": 6.0, "egg": 6.0,
        "all-purpose flour": 6.0, "onion": 6.0, "garlic": 6.0,
        "olive oil": 5.0, "black pepper": 5.0, "water": 4.0, "milk": 4.0,
    }
    return [
        boosts.get(v.name, 1.0 / (1.0 + 0.02 * i)) for i, v in enumerate(vocab)
    ]


_ING_SCHEMA = T.StructType(
    [
        T.StructField("recipe_id", T.LongType(), False),
        T.StructField("ing_idx", T.IntegerType(), False),
        T.StructField("phrase", T.StringType(), False),
        T.StructField("tokens", T.ArrayType(T.StringType()), False),
        T.StructField("tags", T.ArrayType(T.StringType()), False),
        T.StructField("gold_name", T.StringType(), False),
        T.StructField("gold_state", T.StringType(), True),
        T.StructField("gold_qty", T.DoubleType(), True),
        T.StructField("gold_unit", T.StringType(), True),
        T.StructField("gold_size", T.StringType(), True),
        T.StructField("gold_temp", T.StringType(), True),
        T.StructField("gold_df", T.StringType(), True),
        T.StructField("gold_food_id", T.IntegerType(), True),
        T.StructField("gold_grams", T.DoubleType(), True),
        T.StructField("gold_kcal", T.DoubleType(), False),
    ]
)

_RECIPE_SCHEMA = T.StructType(
    [
        T.StructField("recipe_id", T.LongType(), False),
        T.StructField("source", T.StringType(), False),
        T.StructField("region", T.StringType(), False),
        T.StructField("servings", T.IntegerType(), False),
        T.StructField("servings_clean", T.BooleanType(), False),
        T.StructField("gold_kcal_total", T.DoubleType(), False),
        T.StructField("label_kcal_per_serving", T.DoubleType(), True),
    ]
)


def _gen_rows(sf: float, seed: int):
    """Driver-side deterministic generation of recipe + ingredient rows."""
    rng = random.Random(seed)
    vocab = vocabulary()
    weights = _ingredient_weights(vocab)
    unmappable = [v for v in vocab if v.gold_food_id is None]
    n_recipes = max(1, round(N_RECIPES_PER_SF * sf))

    recipe_rows = []
    ing_rows = []
    for rid in range(1, n_recipes + 1):
        region = rng.choice(REGIONS)
        source = "allrecipes" if rng.random() < 0.55 else "food.com"
        servings = rng.choice([2, 3, 4, 4, 4, 6, 6, 8, 10, 12])
        servings_clean = rng.random() < 0.9
        n_ing = rng.randint(4, 14)

        chosen: list[Ingredient] = []
        seen: set[str] = set()
        while len(chosen) < n_ing:
            if region in _REGIONAL_BOOST and rng.random() < 0.25 and unmappable:
                cand = rng.choice(unmappable)
            else:
                cand = rng.choices(vocab, weights=weights)[0]
            if cand.name not in seen:
                seen.add(cand.name)
                chosen.append(cand)

        total_kcal = 0.0
        for idx, ing in enumerate(chosen):
            r: RenderedIngredient = render_ingredient(ing, rng, vocab)
            total_kcal += r.gold_kcal
            ing_rows.append(
                (
                    rid, idx, r.phrase, r.tokens, r.tags, r.name, r.state,
                    r.qty, r.unit, r.size, r.temp, r.df, r.gold_food_id,
                    r.gold_grams, r.gold_kcal,
                )
            )

        label = None
        if source == "allrecipes":
            label = max(0.0, total_kcal / servings + rng.gauss(0.0, 25.0))
        recipe_rows.append(
            (rid, source, region, servings, servings_clean, total_kcal, label)
        )
    return recipe_rows, ing_rows


def recipe_corpus(
    spark: SparkSession, *, sf: float = 0.01, seed: int = 0
) -> tuple[DataFrame, DataFrame]:
    """Generate the corpus as (recipes_df, ingredients_df)."""
    recipe_rows, ing_rows = _gen_rows(sf, seed)
    recipes_df = spark.createDataFrame(recipe_rows, schema=_RECIPE_SCHEMA)
    ingredients_df = spark.createDataFrame(ing_rows, schema=_ING_SCHEMA)
    return recipes_df, ingredients_df


def tagged_corpus(
    n_phrases: int, *, seed: int = 7, tag_noise: float = 0.04
) -> list[tuple[list[str], list[str]]]:
    """Standalone tagged phrases for NER training — the synthetic analogue
    of the paper's 6,612-phrase hand-tagged corpus.

    ``tag_noise`` flips that fraction of gold tags to a random other tag,
    modelling annotator inconsistency; a manually tagged corpus is never
    perfectly consistent, and the paper's 0.95 F1 ceiling includes that
    noise floor.
    """
    from repro.recipes.phrases import ALL_TAGS

    rng = random.Random(seed)
    vocab = vocabulary()
    weights = _ingredient_weights(vocab)
    out = []
    for _ in range(n_phrases):
        ing = rng.choices(vocab, weights=weights)[0]
        r = render_ingredient(ing, rng, vocab)
        tags = [
            rng.choice([t for t in ALL_TAGS if t != tag])
            if rng.random() < tag_noise
            else tag
            for tag in r.tags
        ]
        out.append((r.tokens, tags))
    return out


def ingredients_pdf(sf: float, seed: int) -> pd.DataFrame:
    """Pandas form of the ingredient table (for the DuckDB oracle side)."""
    _, ing_rows = _gen_rows(sf, seed)
    return pd.DataFrame(ing_rows, columns=[f.name for f in _ING_SCHEMA.fields])
