"""§III calorie-error evaluation.

Paper protocol: recipes with an AllRecipes third-party calorie label,
100 % ingredient mapping and clean servings (paper: 2,482 recipes) —
report the mean per-serving |estimate − label| (paper: 36.42 kcal, vs
35 kcal for one teaspoon of butter).

Run: ``REPRO_SF=0.1 spark-submit jobs/results_calorie_error.py``
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession

from repro.core.pipeline import run_pipeline
from repro.core.stats import CalorieErrorResult, calorie_error
from repro.ner.tagger import NerTagger
from repro.recipes.generator import recipe_corpus, tagged_corpus


def run(
    spark: SparkSession, *, sf: float = 0.1, seed: int = 0
) -> CalorieErrorResult:
    recipes, ingredients = recipe_corpus(spark, sf=sf, seed=seed)
    tagger = NerTagger().fit(tagged_corpus(6612, seed=7), epochs=5)
    res = run_pipeline(spark, recipes, ingredients, tagger=tagger)
    return calorie_error(res.profiles)


def main() -> None:
    from _session import get_session

    spark = get_session("calorie_error")
    sf = float(os.environ.get("REPRO_SF", "0.1"))
    r = run(spark, sf=sf)
    print("== §III calorie error (paper → measured) ==")
    print(f"selected recipes:   2482  → {r.n_recipes}")
    print(f"mean abs error:     36.42 → {r.mean_abs_error:.2f} kcal/serving")
    print(f"median abs error:         → {r.median_abs_error:.2f} kcal/serving")
    print(f"mean label kcal/serving:  → {r.mean_label_kcal:.1f}")


if __name__ == "__main__":
    main()
