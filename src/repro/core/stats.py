"""Evaluation statistics of paper §III, computed from pipeline outputs.

- :func:`unique_ingredient_match_rate` — "94.49 % of the unique
  ingredients from the recipes" matched;
- :func:`audit_accuracy` — "the 5000 most frequent ingredients+states
  were manually matched … 3580 were deemed correct (71.6 %)", with the
  generator's gold food standing in for the manual audit;
- :func:`metric_disagreement` — "227 out of 1000 randomly sampled
  ingredient phrases … having a different match" under vanilla vs
  modified Jaccard;
- :func:`mapping_histogram` — Figure 2's per-recipe mapping percentage
  distribution;
- :func:`calorie_error` — mean per-serving kcal error over recipes with
  100 % mapping and clean servings (paper: 36.42 kcal on 2,482 recipes).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as sf

from repro.core.matching import KEY_COLS, best_matches


def unique_ingredient_match_rate(tagged: DataFrame, matches: DataFrame) -> float:
    """% of distinct extracted ingredient names with a USDA match."""
    names = tagged.select(sf.col("ner_name").alias("name")).where(
        sf.col("name").isNotNull()
    ).distinct()
    matched = matches.where(sf.col("score") > 0).select("name").distinct()
    total = names.count()
    hit = names.join(matched, "name", "left_semi").count()
    return 100.0 * hit / total if total else 0.0


def audit_accuracy(
    tagged: DataFrame, matches: DataFrame, *, top_n: int = 5000
) -> tuple[int, int, float]:
    """Accuracy of the matcher on the ``top_n`` most frequent
    (name, state) pairs, judged against the generator's gold food.

    Follows the paper's audit protocol: frequency-ranked distinct
    ingredient+state combinations, each counted once. Pairs whose gold
    food is null (region-centric items) are excluded — the audit judges
    match *quality*, not coverage. Returns (n_correct, n_audited, pct).
    """
    freq = (
        tagged.where(sf.col("ner_name").isNotNull() & sf.col("gold_food_id").isNotNull())
        .groupBy("ner_name", "ner_state")
        .agg(
            sf.count("*").alias("freq"),
            # the most common gold food for this surface pair is the
            # "manual" answer (NER noise can mix pairs across golds)
            sf.mode("gold_food_id").alias("gold_food_id"),
        )
        .orderBy(sf.col("freq").desc(), sf.col("ner_name"))
        .limit(top_n)
    )
    m = matches.select(
        sf.col("name").alias("ner_name"),
        sf.col("state").alias("ner_state"),
        "food_id",
    ).dropDuplicates(["ner_name", "ner_state"])
    joined = freq.join(
        m,
        freq.ner_name.eqNullSafe(m.ner_name)
        & freq.ner_state.eqNullSafe(m.ner_state),
        "left",
    ).drop(m.ner_name).drop(m.ner_state)
    n_audited = joined.count()
    n_correct = joined.where(
        sf.col("food_id").isNotNull()
        & (sf.col("food_id") == sf.col("gold_food_id"))
    ).count()
    return n_correct, n_audited, 100.0 * n_correct / max(1, n_audited)


def metric_disagreement(
    tagged: DataFrame, usda_tokens: DataFrame, *, n_sample: int = 1000, seed: int = 11
) -> tuple[int, int]:
    """Sample ``n_sample`` ingredient phrases; count how many get a
    different USDA food under vanilla vs modified Jaccard."""
    sample = (
        tagged.where(sf.col("ner_name").isNotNull())
        .orderBy(sf.rand(seed))
        .limit(n_sample)
        .select(
            sf.col("ner_name").alias("name"),
            sf.col("ner_state").alias("state"),
            sf.col("ner_temp").alias("temp"),
            sf.col("ner_df").alias("df"),
        )
    ).cache()

    def picks(metric: str, out_col: str) -> DataFrame:
        return best_matches(sample, usda_tokens, metric=metric).select(
            *[sf.col(c).alias(f"{out_col}_{c}") for c in KEY_COLS],
            sf.col("food_id").alias(out_col),
        )

    keyed = sample
    for metric, out_col in (("modified", "food_mod"), ("vanilla", "food_van")):
        p = picks(metric, out_col)
        cond = [
            keyed[c].eqNullSafe(p[f"{out_col}_{c}"]) for c in KEY_COLS
        ]
        keyed = keyed.join(p, cond, "left").drop(
            *[f"{out_col}_{c}" for c in KEY_COLS]
        )
    n = keyed.count()
    differing = keyed.where(
        ~sf.col("food_mod").eqNullSafe(sf.col("food_van"))
    ).count()
    return differing, n


def mapping_histogram(profiles: DataFrame) -> DataFrame:
    """Figure 2 as a table: 10-point buckets of per-recipe mapping %,
    for name-mapping and full (name+unit) mapping."""
    def bucket(col: str):
        return sf.least(sf.floor(sf.col(col) / 10.0) * 10, sf.lit(100)).alias("bucket")

    out = []
    for series, col in (
        ("name_mapped", "pct_name_mapped"),
        ("fully_mapped", "pct_fully_mapped"),
    ):
        h = (
            profiles.select(bucket(col))
            .groupBy("bucket")
            .agg(sf.count("*").alias("n_recipes"))
            .withColumn("series", sf.lit(series))
        )
        out.append(h)
    hist = out[0].unionByName(out[1])
    total = profiles.count()
    return hist.withColumn(
        "pct_recipes", sf.col("n_recipes") / sf.lit(total) * 100.0
    ).orderBy("series", "bucket")


@dataclass(frozen=True)
class CalorieErrorResult:
    n_recipes: int
    mean_abs_error: float
    median_abs_error: float
    mean_label_kcal: float


def calorie_error(profiles: DataFrame) -> CalorieErrorResult:
    """Paper §III protocol: recipes with a third-party calorie label
    (AllRecipes source), 100 % ingredient mapping, and clean servings;
    mean |estimated − label| per serving."""
    sel = profiles.where(
        sf.col("label_kcal_per_serving").isNotNull()
        & sf.col("servings_clean")
        & (sf.col("pct_fully_mapped") >= 100.0)
    ).select(
        "est_kcal_per_serving",
        "label_kcal_per_serving",
        sf.abs(
            sf.col("est_kcal_per_serving") - sf.col("label_kcal_per_serving")
        ).alias("abs_err"),
    )
    row = sel.agg(
        sf.count("*").alias("n"),
        sf.avg("abs_err").alias("mean_err"),
        sf.median("abs_err").alias("median_err"),
        sf.avg("label_kcal_per_serving").alias("mean_label"),
    ).collect()[0]
    return CalorieErrorResult(
        n_recipes=row["n"],
        mean_abs_error=float(row["mean_err"] or 0.0),
        median_abs_error=float(row["median_err"] or 0.0),
        mean_label_kcal=float(row["mean_label"] or 0.0),
    )
