"""Assemble the synthetic USDA-SR as Spark DataFrames.

Three tables, mirroring the real SR layout the paper joins against:

- ``foods``:      food_id, description, category            (FOOD_DES)
- ``nutrients``:  food_id, kcal, protein, fat, carb per 100 g (NUT_DATA)
- ``weights``:    food_id, seq, amount, unit, grams          (WEIGHT)

All three are tiny (hundreds of rows) but are kept as DataFrames so the
matcher and unit resolver are pure Catalyst dataflows; the session fixture
disables broadcast joins, so these participate in real shuffle joins
against the (large) recipe side.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.usda.foods import all_foods
from repro.usda.weights import all_weight_rows


def usda_foods_df(spark: SparkSession) -> DataFrame:
    """``(food_id, description, category)`` — index order is food_id order."""
    rows = all_foods()
    return spark.createDataFrame(
        pd.DataFrame(
            {
                "food_id": [f.food_id for f in rows],
                "description": [f.description for f in rows],
                "category": [f.category for f in rows],
            }
        )
    )


def usda_nutrients_df(spark: SparkSession) -> DataFrame:
    """``(food_id, kcal, protein, fat, carb)`` per 100 g."""
    rows = all_foods()
    return spark.createDataFrame(
        pd.DataFrame(
            {
                "food_id": [f.food_id for f in rows],
                "kcal": [round(f.kcal, 2) for f in rows],
                "protein": [round(f.protein, 2) for f in rows],
                "fat": [round(f.fat, 2) for f in rows],
                "carb": [round(f.carb, 2) for f in rows],
            }
        )
    )


def usda_weights_df(spark: SparkSession) -> DataFrame:
    """``(food_id, seq, amount, unit, grams)`` — Table IV shape."""
    rows = all_weight_rows()
    return spark.createDataFrame(
        pd.DataFrame(rows, columns=["food_id", "seq", "amount", "unit", "grams"])
    )
