"""Benchmark for Table IV's substrate: building the per-food unit lookup
(exact + derived volume + mass) and resolving grams for all SF=0.1
ingredient rows (gold extraction, so only unit logic is timed)."""
from pyspark.sql import functions as sf

from repro.core.nutrition import resolve_units
from repro.core.units import build_unit_lookup
from repro.usda.db import usda_weights_df


def test_bench_unit_lookup_build(benchmark, spark):
    weights = usda_weights_df(spark).cache()
    weights.count()

    def build():
        return build_unit_lookup(spark, weights).count()

    n = benchmark.pedantic(build, rounds=3, iterations=1)
    assert n > 1000


def test_bench_gram_resolution(benchmark, spark, bench_corpus):
    _, ingredients = bench_corpus
    rows = ingredients.select(
        "recipe_id",
        "ing_idx",
        "phrase",
        sf.col("gold_name").alias("ner_name"),
        sf.col("gold_qty").cast("string").alias("ner_qty"),
        sf.col("gold_unit").alias("ner_unit"),
        sf.col("gold_size").alias("ner_size"),
        sf.col("gold_food_id").alias("food_id"),
    ).cache()
    rows.count()
    lookup = build_unit_lookup(spark, usda_weights_df(spark)).cache()
    lookup.count()

    def resolve():
        out = resolve_units(rows, lookup)
        return out.where(sf.col("grams").isNotNull()).count()

    n = benchmark.pedantic(resolve, rounds=2, iterations=1)
    assert n > 80_000
