"""End-to-end nutritional-profile estimation (Figure 1 of the paper).

phrases → NER extraction → modified-Jaccard USDA matching → unit
resolution → nutrient aggregation → per-recipe, per-serving profiles.

``run_pipeline`` returns every intermediate DataFrame so the evaluation
jobs (§III statistics, Figure 2, calorie error) can probe each stage.
``use_gold_extraction=True`` bypasses the NER and feeds the generator's
gold entities into matching — the ablation that isolates matching/unit
error from extraction error.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as sf

from repro.core.matching import KEY_COLS, best_matches, usda_description_tokens
from repro.core.nutrition import (
    ingredient_nutrients,
    recipe_profiles,
    resolve_units,
)
from repro.core.units import build_unit_lookup
from repro.ner.tagger import NerTagger, tag_ingredients
from repro.usda.db import usda_nutrients_df, usda_weights_df


@dataclass
class PipelineResult:
    """Intermediate and final DataFrames of one pipeline run."""

    tagged: DataFrame         # + pred_tags, ner_* columns
    matches: DataFrame        # one row per distinct ingredient key
    resolved: DataFrame       # ingredient rows + food_id, grams, est_kcal…
    profiles: DataFrame       # per-recipe nutrition + mapping coverage


def _with_ner_columns(
    ingredients: DataFrame, tagger: NerTagger | None, use_gold: bool
) -> DataFrame:
    if use_gold:
        out = ingredients
        for ner, gold in (
            ("ner_name", "gold_name"), ("ner_state", "gold_state"),
            ("ner_unit", "gold_unit"), ("ner_size", "gold_size"),
            ("ner_temp", "gold_temp"), ("ner_df", "gold_df"),
        ):
            out = out.withColumn(ner, sf.col(gold))
        return out.withColumn("ner_qty", sf.col("gold_qty").cast("string"))
    if tagger is None:
        raise ValueError("tagger is required unless use_gold_extraction=True")
    return tag_ingredients(tagger, ingredients)


def run_pipeline(
    spark: SparkSession,
    recipes: DataFrame,
    ingredients: DataFrame,
    *,
    tagger: NerTagger | None = None,
    use_gold_extraction: bool = False,
    metric: str = "modified",
) -> PipelineResult:
    """Run the full estimation pipeline over a recipe corpus."""
    tagged = _with_ner_columns(ingredients, tagger, use_gold_extraction)

    keys = tagged.select(
        sf.col("ner_name").alias("name"),
        sf.col("ner_state").alias("state"),
        sf.col("ner_temp").alias("temp"),
        sf.col("ner_df").alias("df"),
    )
    usda_tokens = usda_description_tokens(spark)
    matches = best_matches(keys, usda_tokens, metric=metric)

    m = matches.select(
        sf.col("name").alias("m_name"),
        sf.col("state").alias("m_state"),
        sf.col("temp").alias("m_temp"),
        sf.col("df").alias("m_df"),
        "food_id",
        sf.col("score").alias("match_score"),
    )
    cond = (
        sf.col("ner_name").eqNullSafe(sf.col("m_name"))
        & sf.col("ner_state").eqNullSafe(sf.col("m_state"))
        & sf.col("ner_temp").eqNullSafe(sf.col("m_temp"))
        & sf.col("ner_df").eqNullSafe(sf.col("m_df"))
    )
    with_food = tagged.join(m, cond, "left").drop(
        "m_name", "m_state", "m_temp", "m_df"
    )

    unit_lookup = build_unit_lookup(spark, usda_weights_df(spark))
    resolved = resolve_units(with_food, unit_lookup)
    with_nutrients = ingredient_nutrients(resolved, usda_nutrients_df(spark))
    profiles = recipe_profiles(with_nutrients, recipes)
    return PipelineResult(
        tagged=tagged, matches=matches, resolved=with_nutrients, profiles=profiles
    )
