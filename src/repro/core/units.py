"""Unit cleaning, alias collapse, and measurement conversion (paper §II-C).

The paper's recipe for a usable unit:

1. lemmatize the unit string, take its first word, strip non-alphabetic
   characters ('pat (1" sq, 1/3" high)' → ``pat``);
2. collapse aliases to a standard unit (``tbsp`` → ``tablespoon``,
   ``lb`` → ``pound``);
3. if the matched USDA food lacks the unit, derive it through volume
   conversion tables (1 cup = 16 tbsp = 48 tsp …) from any volume unit
   the food *does* have; mass units convert directly (nutrients are per
   100 g);
4. sizes small/medium/large are treated as one equivalent unit class.

``build_unit_lookup`` materializes steps 2–4 as a per-food unit→grams
lookup DataFrame, so downstream gram resolution is a plain equi-join —
the relational form of the paper's "measurement conversion tables were
used to check for the missing units".
"""
from __future__ import annotations

import re

import pandas as pd
from pyspark.sql import Column, DataFrame, SparkSession
from pyspark.sql import functions as sf
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import StringType
from pyspark.sql.window import Window

from repro.text.lemmatizer import lemmatize

_ALPHA_RE = re.compile(r"[a-z]+")

#: cleaned first word → standard unit name.
ALIASES: dict[str, str] = {
    "tablespoon": "tablespoon", "tbsp": "tablespoon", "tbs": "tablespoon",
    "teaspoon": "teaspoon", "tsp": "teaspoon",
    "cup": "cup",
    "pound": "pound", "lb": "pound", "lbs": "pound",
    "ounce": "ounce", "oz": "ounce",
    "gram": "gram", "g": "gram", "gm": "gram",
    "kilogram": "kilogram", "kg": "kilogram",
    "milliliter": "milliliter", "millilitre": "milliliter", "ml": "milliliter",
    "liter": "liter", "litre": "liter", "l": "liter",
    "pint": "pint", "pt": "pint",
    "quart": "quart", "qt": "quart",
    "gallon": "gallon", "gal": "gallon",
    "fl": "fluidounce", "floz": "fluidounce",
    "pinch": "pinch", "dash": "dash",
    "pat": "pat", "stick": "stick", "clove": "clove", "slice": "slice",
    "can": "can", "package": "package", "pkg": "package",
    "sprig": "sprig", "bunch": "bunch", "stalk": "stalk", "head": "head",
    "small": "small", "medium": "medium", "large": "large", "piece": "piece",
}

#: standard volume unit → milliliters (Book-of-Yields-style table).
VOLUME_ML: dict[str, float] = {
    "teaspoon": 4.92892,
    "tablespoon": 14.7868,
    "fluidounce": 29.5735,
    "cup": 236.588,
    "pint": 473.176,
    "quart": 946.353,
    "gallon": 3785.41,
    "milliliter": 1.0,
    "liter": 1000.0,
    "pinch": 0.308,
    "dash": 0.616,
}

#: standard mass unit → grams (nutrients are per 100 g, so mass converts
#: without any USDA weight row).
MASS_G: dict[str, float] = {
    "gram": 1.0,
    "kilogram": 1000.0,
    "ounce": 28.3495,
    "pound": 453.592,
}

#: sizes (and bare counts) form one equivalence class (paper: "All 3 were
#: considered equivalent because of ambiguity between sizes").
SIZE_UNITS: frozenset[str] = frozenset({"small", "medium", "large", "piece"})
SIZE_KEY = "::size"


def clean_unit(raw: str | None) -> str | None:
    """Steps 1–2: 'pat (1" sq, 1/3" high)' → ``pat``; ``tbsp`` → ``tablespoon``.

    Returns None for empty/unknown units (unknowns keep their cleaned
    first word only if it is a known standard; the paper's fixed unit set
    means anything else is noise).
    """
    if raw is None:
        return None
    first = raw.strip().split(" ")[0].lower() if raw.strip() else ""
    m = _ALPHA_RE.search(first)
    if not m:
        return None
    word = lemmatize(m.group(0))
    return ALIASES.get(word, ALIASES.get(m.group(0)))


def unit_key(std: str | None) -> str | None:
    """Join key for the unit lookup: sizes collapse to one class."""
    if std is None:
        return None
    return SIZE_KEY if std in SIZE_UNITS else std


# A DataType instance (not a DDL string) keeps the udf constructible at
# import time, before any SparkSession exists.
@pandas_udf(StringType())
def _clean_unit_key_udf(s: pd.Series) -> pd.Series:
    return s.map(lambda r: unit_key(clean_unit(r)), na_action="ignore")


def clean_unit_key_col(col: Column) -> Column:
    """Spark column: raw unit string → standard unit-key (or null)."""
    return _clean_unit_key_udf(col)


def grams_per_unit_py(
    unit: str | None,
    size: str | None,
    weight_rows: list[tuple[int, float, str, float]],
) -> float | None:
    """Pure-Python gram resolution for ONE food — the generator uses this
    to compute gold grams, guaranteeing gold truth and the Spark lookup
    share one conversion semantics (only the *size-equivalence* treatment
    differs: gold honours the exact size row; the pipeline collapses
    sizes, which is a deliberate, paper-faithful error source).

    ``weight_rows``: (seq, amount, raw_unit, grams), any order.
    """
    rows = sorted(
        ((seq, amount, clean_unit(u), grams) for seq, amount, u, grams in weight_rows),
        key=lambda r: r[0],
    )
    if unit is None:
        size_rows = [r for r in rows if r[2] in SIZE_UNITS]
        if not size_rows:
            return None
        if size is not None:
            for _, amount, u, grams in size_rows:
                if u == size:
                    return grams / amount
        _, amount, _, grams = size_rows[0]
        return grams / amount
    for _, amount, u, grams in rows:
        if u == unit:
            return grams / amount
    if unit in MASS_G:
        return MASS_G[unit]
    if unit in VOLUME_ML:
        for _, amount, u, grams in rows:
            if u in VOLUME_ML:
                density = grams / (amount * VOLUME_ML[u])
                return VOLUME_ML[unit] * density
    return None


def build_unit_lookup(spark: SparkSession, weights_df: DataFrame) -> DataFrame:
    """Per-food complete unit lookup: ``(food_id, unit_key, gram_per_unit,
    derivation)`` with derivation ∈ {exact, volume, mass}.

    - *exact*: first weight row (by seq) for that unit key;
    - *volume*: derived from the food's first volume row via VOLUME_ML
      ratios, for volume units the food lacks;
    - *mass*: direct gram conversion, for every food.
    """
    w = weights_df.withColumn("unit_key", clean_unit_key_col(sf.col("unit"))).where(
        sf.col("unit_key").isNotNull()
    )
    w = w.withColumn("gram_per_unit", sf.col("grams") / sf.col("amount"))

    by_key = Window.partitionBy("food_id", "unit_key").orderBy("seq")
    exact = (
        w.withColumn("rn", sf.row_number().over(by_key))
        .where(sf.col("rn") == 1)
        .select("food_id", "unit_key", "gram_per_unit")
        .withColumn("derivation", sf.lit("exact"))
    )

    vol_ml = spark.createDataFrame(
        pd.DataFrame(
            {"unit_key": list(VOLUME_ML), "ml": list(VOLUME_ML.values())}
        )
    )
    by_food = Window.partitionBy("food_id").orderBy("seq")
    densities = (
        w.join(vol_ml.withColumnRenamed("unit_key", "vk"), w.unit_key == sf.col("vk"))
        .withColumn("rn", sf.row_number().over(by_food))
        .where(sf.col("rn") == 1)
        .select("food_id", (sf.col("gram_per_unit") / sf.col("ml")).alias("g_per_ml"))
    )
    derived_vol = (
        densities.crossJoin(vol_ml)
        .select(
            "food_id",
            "unit_key",
            (sf.col("g_per_ml") * sf.col("ml")).alias("gram_per_unit"),
        )
        .join(exact.select("food_id", "unit_key"), ["food_id", "unit_key"], "left_anti")
        .withColumn("derivation", sf.lit("volume"))
    )

    mass = spark.createDataFrame(
        pd.DataFrame({"unit_key": list(MASS_G), "gram_per_unit": list(MASS_G.values())})
    )
    derived_mass = (
        w.select("food_id")
        .distinct()
        .crossJoin(mass)
        .join(exact.select("food_id", "unit_key"), ["food_id", "unit_key"], "left_anti")
        .withColumn("derivation", sf.lit("mass"))
    )

    return exact.unionByName(derived_vol).unionByName(derived_mass)
