"""Figure 2 — percentage mapping of recipes to their nutritional profile.

Figures are out of scope; this job prints the distribution behind the
figure as a table: the share of recipes whose ingredient-mapping
percentage falls in each 10-point bucket, for (a) name matching only and
(b) full name+unit mapping. The paper's qualitative claims to check:
most recipes sit in the top buckets, and the full-mapping series lags
the name-mapping series (units are the bottleneck).

Run: ``REPRO_SF=0.1 spark-submit jobs/figure2_mapping.py``
"""
from __future__ import annotations

import os

from pyspark.sql import DataFrame, SparkSession

from repro.core.pipeline import run_pipeline
from repro.core.stats import mapping_histogram
from repro.ner.tagger import NerTagger
from repro.recipes.generator import recipe_corpus, tagged_corpus


def run(spark: SparkSession, *, sf: float = 0.1, seed: int = 0) -> DataFrame:
    recipes, ingredients = recipe_corpus(spark, sf=sf, seed=seed)
    tagger = NerTagger().fit(tagged_corpus(6612, seed=7), epochs=5)
    res = run_pipeline(spark, recipes, ingredients, tagger=tagger)
    return mapping_histogram(res.profiles)


def main() -> None:
    from _session import get_session

    spark = get_session("figure2")
    sf = float(os.environ.get("REPRO_SF", "0.1"))
    print("== Figure 2 as a table: % of recipes per mapping bucket ==")
    run(spark, sf=sf).show(30, truncate=False)


if __name__ == "__main__":
    main()
