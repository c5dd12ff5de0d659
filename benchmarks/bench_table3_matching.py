"""Benchmark for Table III's substrate: modified-Jaccard matching of all
distinct SF=0.1 ingredient keys against the USDA description index, and
the vanilla-metric comparison run."""
from pyspark.sql import functions as sf

from repro.core.matching import best_matches, usda_description_tokens


def _keys(ingredients):
    return ingredients.select(
        sf.col("gold_name").alias("name"),
        sf.col("gold_state").alias("state"),
        sf.col("gold_temp").alias("temp"),
        sf.col("gold_df").alias("df"),
    )


def test_bench_modified_matching(benchmark, spark, bench_corpus):
    _, ingredients = bench_corpus
    keys = _keys(ingredients)
    ut = usda_description_tokens(spark).cache()
    ut.count()

    def match():
        return best_matches(keys, ut, metric="modified").count()

    n = benchmark.pedantic(match, rounds=2, iterations=1)
    assert n > 100  # distinct mappable keys


def test_bench_both_metrics(benchmark, spark, bench_corpus):
    """The Table III comparison: run both metrics over the corpus keys."""
    _, ingredients = bench_corpus
    keys = _keys(ingredients)
    ut = usda_description_tokens(spark).cache()
    ut.count()

    def match_both():
        a = best_matches(keys, ut, metric="modified").count()
        b = best_matches(keys, ut, metric="vanilla").count()
        return a + b

    n = benchmark.pedantic(match_both, rounds=1, iterations=1)
    assert n > 200
