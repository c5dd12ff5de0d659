"""Benchmark fixtures: SF=0.1 corpus + trained tagger, built once."""
from __future__ import annotations

import pytest

from repro.ner.tagger import NerTagger
from repro.recipes.generator import recipe_corpus, tagged_corpus

BENCH_SF = 0.1
BENCH_SEED = 0


@pytest.fixture(scope="session")
def bench_corpus(spark):
    """(recipes_df, ingredients_df) at SF=0.1 (~11.8k recipes, ~105k
    ingredient rows), cached and materialized."""
    recipes, ingredients = recipe_corpus(spark, sf=BENCH_SF, seed=BENCH_SEED)
    recipes = recipes.cache()
    ingredients = ingredients.cache()
    recipes.count(), ingredients.count()
    return recipes, ingredients


@pytest.fixture(scope="session")
def bench_tagger() -> NerTagger:
    return NerTagger().fit(tagged_corpus(6612, seed=7), epochs=5)
