"""Gram resolution and nutrient aggregation (paper §II-C end-to-end).

Stages, all DataFrame ops:

1. quantity parse ("2 1/2" → 2.5);
2. unit-key derivation: detected unit → cleaned/alias-collapsed; missing
   unit with a count/size phrase → the size equivalence class; in-phrase
   unit recovery for NER misses;
3. join against the per-food unit lookup (exact + derived volume + mass);
4. threshold repair: implausibly heavy rows (the "500 cups" failure) are
   re-derived from an in-phrase mass pattern;
5. most-frequent-unit fallback per ingredient name (window mode);
6. nutrients = grams/100 × per-100 g profile; recipe profile = sum,
   per-serving = /servings.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as sf
from pyspark.sql.window import Window

from repro.core.quantity import parse_quantity_col
from repro.core.units import SIZE_KEY, clean_unit_key_col

#: a single ingredient heavier than this is assumed to be a mis-parse
#: (the paper's semi-automated "threshold on the quantity per unit").
GRAMS_THRESHOLD = 10_000.0

#: regex that recovers an explicit mass statement from the raw phrase.
_MASS_PATTERN = r"(\d+)\s*(kg|g|grams?)\b"

#: regex that recovers a known unit word from the raw phrase when the NER
#: missed the UNIT entity entirely.
_UNIT_PATTERN = (
    r"\b(cups?|tablespoons?|tbsp|teaspoons?|tsp|pounds?|lbs?|lb|ounces?|oz"
    r"|grams?|kg|ml|cans?|cloves?|slices?|sticks?|sprigs?|bunch(?:es)?"
    r"|pinch(?:es)?|dash(?:es)?)\b"
)


def resolve_units(ingredients: DataFrame, unit_lookup: DataFrame) -> DataFrame:
    """Attach ``qty``, ``unit_key``, ``gram_per_unit``, ``grams`` to rows
    that carry ``ner_qty``/``ner_unit``/``ner_size`` + ``food_id``.

    Rows without a matched ``food_id`` pass through with null grams.
    """
    df = ingredients.withColumn("qty", parse_quantity_col(sf.col("ner_qty")))

    # unit recovery from the phrase when NER found none (paper §II-C:
    # "we searched the ingredient phrase for known units").
    recovered = sf.regexp_extract(sf.col("phrase"), _UNIT_PATTERN, 1)
    df = df.withColumn(
        "unit_raw",
        sf.coalesce(
            sf.col("ner_unit"),
            sf.when(recovered != "", recovered),
        ),
    )
    df = df.withColumn("unit_key_detected", clean_unit_key_col(sf.col("unit_raw")))
    # a count phrase ("2 eggs", "1 small onion") resolves via the size
    # equivalence class; sizes are all equivalent (paper §II-C).
    df = df.withColumn(
        "unit_key",
        sf.coalesce(
            sf.col("unit_key_detected"),
            sf.when(
                sf.col("qty").isNotNull() | sf.col("ner_size").isNotNull(),
                sf.lit(SIZE_KEY),
            ),
        ),
    )

    lk = unit_lookup.select(
        sf.col("food_id").alias("lk_food_id"),
        sf.col("unit_key").alias("lk_unit_key"),
        "gram_per_unit",
    )
    df = df.join(
        lk,
        (df.food_id == lk.lk_food_id) & (df.unit_key == lk.lk_unit_key),
        "left",
    ).drop("lk_food_id", "lk_unit_key")

    # most-frequent unit per ingredient name over rows where detection
    # succeeded AND resolved — the paper's dominant-unit fallback.
    freq = Window.partitionBy("ner_name", "unit_key_detected")
    pick = Window.partitionBy("ner_name").orderBy(
        sf.col("unit_freq").desc(), sf.col("unit_key_detected").asc()
    )
    mode_per_name = (
        df.where(
            sf.col("unit_key_detected").isNotNull()
            & sf.col("gram_per_unit").isNotNull()
        )
        .withColumn("unit_freq", sf.count("*").over(freq))
        .withColumn("rn", sf.row_number().over(pick))
        .where(sf.col("rn") == 1)
        .select(
            sf.col("ner_name").alias("mode_name"),
            sf.col("unit_key_detected").alias("mode_unit_key"),
        )
    )
    df = df.join(mode_per_name, df.ner_name == mode_per_name.mode_name, "left").drop(
        "mode_name"
    )
    lk2 = unit_lookup.select(
        sf.col("food_id").alias("lk2_food_id"),
        sf.col("unit_key").alias("lk2_unit_key"),
        sf.col("gram_per_unit").alias("gram_per_unit_fallback"),
    )
    df = df.join(
        lk2,
        (df.food_id == lk2.lk2_food_id)
        & (df.mode_unit_key == lk2.lk2_unit_key)
        & df.gram_per_unit.isNull(),
        "left",
    ).drop("lk2_food_id", "lk2_unit_key")

    df = df.withColumn(
        "gram_per_unit_final",
        sf.coalesce(sf.col("gram_per_unit"), sf.col("gram_per_unit_fallback")),
    )
    df = df.withColumn(
        "grams_unchecked", sf.col("qty") * sf.col("gram_per_unit_final")
    )

    # threshold repair (the "500 g or 1 cup" → "500 cups" failure):
    # implausibly heavy rows fall back to an explicit in-phrase mass.
    mass_num = sf.regexp_extract(sf.col("phrase"), _MASS_PATTERN, 1)
    mass_unit = sf.regexp_extract(sf.col("phrase"), _MASS_PATTERN, 2)
    mass_grams = sf.when(mass_num != "", mass_num.cast("double")) * sf.when(
        mass_unit == "kg", sf.lit(1000.0)
    ).otherwise(sf.lit(1.0))
    return df.withColumn(
        "grams",
        sf.when(
            (sf.col("grams_unchecked") > GRAMS_THRESHOLD) & mass_grams.isNotNull(),
            mass_grams,
        ).otherwise(sf.col("grams_unchecked")),
    )


def ingredient_nutrients(resolved: DataFrame, nutrients: DataFrame) -> DataFrame:
    """Scale per-100 g nutrients by resolved grams (nulls propagate)."""
    n = nutrients.select(
        sf.col("food_id").alias("nut_food_id"),
        sf.col("kcal").alias("kcal_100"),
        sf.col("protein").alias("protein_100"),
        sf.col("fat").alias("fat_100"),
        sf.col("carb").alias("carb_100"),
    )
    df = resolved.join(n, resolved.food_id == n.nut_food_id, "left").drop(
        "nut_food_id"
    )
    for col in ("kcal", "protein", "fat", "carb"):
        df = df.withColumn(
            f"est_{col}", sf.col("grams") / 100.0 * sf.col(f"{col}_100")
        )
    return df


def recipe_profiles(with_nutrients: DataFrame, recipes: DataFrame) -> DataFrame:
    """Per-recipe sums, mapping coverage, and per-serving values.

    ``pct_name_mapped`` / ``pct_fully_mapped`` are the two series of the
    paper's Figure 2 (name matched vs name+unit resolved).
    """
    per_recipe = with_nutrients.groupBy("recipe_id").agg(
        sf.count("*").alias("n_ingredients"),
        sf.sum(sf.col("food_id").isNotNull().cast("int")).alias("n_name_mapped"),
        sf.sum(
            (sf.col("food_id").isNotNull() & sf.col("grams").isNotNull()).cast("int")
        ).alias("n_fully_mapped"),
        sf.sum("est_kcal").alias("est_kcal_total"),
        sf.sum("est_protein").alias("est_protein_total"),
        sf.sum("est_fat").alias("est_fat_total"),
        sf.sum("est_carb").alias("est_carb_total"),
    )
    out = per_recipe.join(recipes, "recipe_id")
    return (
        out.withColumn(
            "pct_name_mapped",
            sf.col("n_name_mapped") / sf.col("n_ingredients") * 100.0,
        )
        .withColumn(
            "pct_fully_mapped",
            sf.col("n_fully_mapped") / sf.col("n_ingredients") * 100.0,
        )
        .withColumn(
            "est_kcal_per_serving", sf.col("est_kcal_total") / sf.col("servings")
        )
    )
