"""Benchmark for Table II's substrate: building the synthetic USDA-SR
tables and the tokenized description index."""
from repro.core.matching import usda_description_tokens
from repro.usda.db import usda_foods_df, usda_nutrients_df, usda_weights_df


def test_bench_usda_tables(benchmark, spark):
    def build():
        n = usda_foods_df(spark).count()
        n += usda_nutrients_df(spark).count()
        n += usda_weights_df(spark).count()
        return n

    total = benchmark.pedantic(build, rounds=3, iterations=1)
    assert total > 500


def test_bench_description_index(benchmark, spark):
    def build():
        return usda_description_tokens(spark).count()

    n = benchmark.pedantic(build, rounds=3, iterations=1)
    assert n > 1000
