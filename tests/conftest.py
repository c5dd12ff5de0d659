"""Shared heavy fixtures: a trained tagger, a small corpus, and pipeline
runs are built once per session — many test modules probe them."""
from __future__ import annotations

import pytest

from repro.core.pipeline import PipelineResult, run_pipeline
from repro.ner.tagger import NerTagger
from repro.recipes.generator import recipe_corpus, tagged_corpus

#: test-scale corpus: ~590 recipes, ~5k ingredient rows.
TEST_SF = 0.005
TEST_SEED = 0


@pytest.fixture(scope="session")
def tagger() -> NerTagger:
    """Tagger trained on a mid-sized corpus (fast, F1 ≈ paper's 0.95)."""
    return NerTagger().fit(tagged_corpus(3000, seed=7), epochs=5)


@pytest.fixture(scope="session")
def corpus(spark):
    """(recipes_df, ingredients_df) at test scale, cached."""
    recipes, ingredients = recipe_corpus(spark, sf=TEST_SF, seed=TEST_SEED)
    return recipes.cache(), ingredients.cache()


@pytest.fixture(scope="session")
def pipeline_ner(spark, corpus, tagger) -> PipelineResult:
    """Full pipeline with NER extraction."""
    recipes, ingredients = corpus
    res = run_pipeline(spark, recipes, ingredients, tagger=tagger)
    res.tagged.cache()
    res.matches.cache()
    res.resolved.cache()
    res.profiles.cache()
    return res


@pytest.fixture(scope="session")
def pipeline_gold(spark, corpus) -> PipelineResult:
    """Pipeline with gold extraction — isolates matching/unit error."""
    recipes, ingredients = corpus
    res = run_pipeline(spark, recipes, ingredients, use_gold_extraction=True)
    res.tagged.cache()
    res.matches.cache()
    res.resolved.cache()
    res.profiles.cache()
    return res
