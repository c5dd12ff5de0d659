"""Synthetic RecipeDB substrate.

RecipeDB (118,071 scraped recipes) is not available offline, so this
package generates a corpus with the same observable properties: noisy,
source-heterogeneous ingredient phrase strings. Because phrases are
*rendered from* structured ground truth (name, state, quantity, unit,
size, temperature, dry/fresh, gold USDA food, gold grams), the corpus
doubles as (1) the manually-tagged NER corpus (gold token tags come free),
(2) the manual match audit (gold food ids), and (3) the AllRecipes
calorie gold standard (gold per-serving kcal plus physical-variation
noise) that the paper evaluates against.

Scale: SF=1.0 ≈ 118,071 recipes, matching the paper; tests run SF≈0.01
and benchmarks SF≈0.1. All generation is deterministic in ``seed``.
"""
from repro.recipes.generator import recipe_corpus, tagged_corpus

__all__ = ["recipe_corpus", "tagged_corpus"]
