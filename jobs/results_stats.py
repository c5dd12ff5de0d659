"""§III statistics: NER F1, unique-ingredient match rate, audit accuracy,
and vanilla-vs-modified disagreement.

Paper numbers: F1 = 0.95 (5-fold CV); 94.49 % unique ingredients
matched; 3,580/5,000 = 71.6 % audit accuracy; 227/1000 phrases change
match between metrics.

Run: ``REPRO_SF=0.1 spark-submit jobs/results_stats.py``
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession

from repro.core import stats
from repro.core.matching import usda_description_tokens
from repro.core.pipeline import run_pipeline
from repro.ner.corpus_selection import select_corpus
from repro.ner.evaluate import cross_validate
from repro.ner.tagger import NerTagger
from repro.recipes.generator import recipe_corpus, tagged_corpus


def run(spark: SparkSession, *, sf: float = 0.1, seed: int = 0) -> dict:
    """Compute all §III statistics; returns a dict of named numbers."""
    # --- NER: cluster-selected corpus, paper-sized splits, 5-fold CV ----
    pool = tagged_corpus(8800, seed=7)
    train, test = select_corpus(pool, n_train=6612, n_test=2188)
    tagger = NerTagger().fit(train, epochs=5)
    # 5-fold CV over the full selected corpus (train ∪ test), as in §II-A
    cv = cross_validate(train + test, k=5)
    f1_cv = sum(s.f1 for s in cv) / len(cv)

    # --- pipeline over the corpus --------------------------------------
    recipes, ingredients = recipe_corpus(spark, sf=sf, seed=seed)
    res = run_pipeline(spark, recipes, ingredients, tagger=tagger)
    res.tagged.cache()
    res.matches.cache()

    match_rate = stats.unique_ingredient_match_rate(res.tagged, res.matches)
    n_correct, n_audited, audit_pct = stats.audit_accuracy(res.tagged, res.matches)
    ut = usda_description_tokens(spark)
    differing, n_sampled = stats.metric_disagreement(res.tagged, ut)

    return {
        "ner_f1_5fold_cv": round(f1_cv, 4),
        "unique_ingredient_match_rate_pct": round(match_rate, 2),
        "audit_n_correct": n_correct,
        "audit_n_audited": n_audited,
        "audit_accuracy_pct": round(audit_pct, 2),
        "metric_disagreement_count": differing,
        "metric_disagreement_sample": n_sampled,
    }


def main() -> None:
    from _session import get_session

    spark = get_session("results_stats")
    sf = float(os.environ.get("REPRO_SF", "0.1"))
    out = run(spark, sf=sf)
    print("== §III statistics (paper → measured) ==")
    print(f"NER F1 (5-fold CV):        0.95   → {out['ner_f1_5fold_cv']}")
    print(
        "unique ingredients matched: 94.49% → "
        f"{out['unique_ingredient_match_rate_pct']}%"
    )
    print(
        "audit accuracy:            71.6%  → "
        f"{out['audit_accuracy_pct']}% "
        f"({out['audit_n_correct']}/{out['audit_n_audited']})"
    )
    print(
        "metric disagreement:       227/1000 → "
        f"{out['metric_disagreement_count']}/{out['metric_disagreement_sample']}"
    )


if __name__ == "__main__":
    main()
