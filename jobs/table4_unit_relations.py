"""Table IV — ingredient and unit relations (Butter,salted).

Prints the weights rows for "Butter, salted" with ``gram_per_amount``
exactly as in the paper's Table IV (pat 5.0 / tbsp 14.2 / cup 227.0 /
stick 113.0), plus the cleaned unit-key each raw unit collapses to.

Run: ``spark-submit jobs/table4_unit_relations.py``
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as sf

from repro.core.units import clean_unit_key_col
from repro.usda.db import usda_foods_df, usda_weights_df


def run(spark: SparkSession, *, ingredient: str = "Butter, salted") -> DataFrame:
    foods = usda_foods_df(spark).where(sf.col("description") == ingredient)
    w = usda_weights_df(spark).join(foods, "food_id")
    return (
        w.select(
            sf.col("description").alias("ingredient"),
            "seq",
            "amount",
            "unit",
            "grams",
            (sf.col("grams") / sf.col("amount")).alias("gram_per_amount"),
            clean_unit_key_col(sf.col("unit")).alias("unit_key"),
        )
        .orderBy("seq")
    )


def main() -> None:
    from _session import get_session

    spark = get_session("table4")
    print("TABLE IV. INGREDIENT AND UNIT RELATIONS (reproduced)")
    run(spark).show(truncate=False)


if __name__ == "__main__":
    main()
