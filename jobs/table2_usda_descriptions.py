"""Table II — example food descriptions from the (synthetic) USDA-SR.

The first 19 foods of the synthetic database are exactly the paper's
Table II rows, in the paper's index order; this job prints them from the
Spark DataFrame to prove the substrate carries them.

Run: ``spark-submit jobs/table2_usda_descriptions.py``
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as sf

from repro.usda.db import usda_foods_df


def run(spark: SparkSession, *, n: int = 19) -> DataFrame:
    return (
        usda_foods_df(spark)
        .where(sf.col("food_id") <= n)
        .orderBy("food_id")
        .select(sf.col("food_id").alias("S.No"), sf.col("description").alias("Description"))
    )


def main() -> None:
    from _session import get_session

    spark = get_session("table2")
    print("TABLE II. EXAMPLES OF FOOD DESCRIPTION IN USDA-SR DATABASE (synthetic)")
    run(spark).show(19, truncate=False)


if __name__ == "__main__":
    main()
