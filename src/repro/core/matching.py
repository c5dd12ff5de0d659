"""Distributed ingredient→USDA description matching — heuristics (a)–(i).

No recipe×USDA cross join and no per-pair Python scoring: the matcher is
an inverted-index token join, visible to Catalyst end to end.

1. Ingredient side: distinct (name, state, temp, df) keys → one row per
   normalized word (``mapInPandas``, Arrow batches), carrying |A| and the
   has-state flag.
2. Description side: one row per word with its term priority, carrying
   |B| and the has-raw flag (a few hundred foods → built driver-side
   once, joined as a regular table — broadcast stays disabled, so this
   exercises the shuffle path).
3. Equi-join on ``word`` → groupBy (ingredient, food): ``|A∩B| =
   count(*)``, ``best_priority = min(priority)``.
4. Scores as column expressions: modified ``(|A∩B| + raw_bonus)/|A|``,
   vanilla ``|A∩B|/(|A|+|B|-|A∩B|)``.
5. ``row_number()`` over (score DESC, best_priority ASC, food_id ASC) —
   heuristic (h) then (i); rank 1 is the match.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as sf
from pyspark.sql import types as T
from pyspark.sql.window import Window

from repro.core.preprocess import (
    description_word_priorities,
    phrase_word_set,
)
from repro.usda.foods import all_foods

#: the four entity columns that identify a distinct ingredient key.
KEY_COLS = ["name", "state", "temp", "df"]

_ING_TOKEN_SCHEMA = T.StructType(
    [
        T.StructField("name", T.StringType(), True),
        T.StructField("state", T.StringType(), True),
        T.StructField("temp", T.StringType(), True),
        T.StructField("df", T.StringType(), True),
        T.StructField("word", T.StringType(), False),
        T.StructField("a_size", T.IntegerType(), False),
        T.StructField("has_state", T.BooleanType(), False),
        T.StructField("from_name", T.BooleanType(), False),
    ]
)


def ingredient_tokens(keys_df: DataFrame) -> DataFrame:
    """Explode distinct ingredient keys into normalized word rows.

    ``keys_df`` needs columns name/state/temp/df (nulls allowed). Keys
    whose word set is empty produce no rows (they can never match).
    """

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            rows = []
            for name, state, temp, df in zip(
                pdf["name"], pdf["state"], pdf["temp"], pdf["df"]
            ):
                if name is None or (isinstance(name, float) and pd.isna(name)):
                    continue
                words, has_state = phrase_word_set(name, state, temp, df)
                name_words, _ = phrase_word_set(name)
                for w in words:
                    rows.append(
                        (name, state, temp, df, w, len(words), has_state,
                         w in name_words)
                    )
            yield pd.DataFrame(
                rows, columns=[f.name for f in _ING_TOKEN_SCHEMA.fields]
            )

    return keys_df.select(*KEY_COLS).distinct().mapInPandas(
        run, schema=_ING_TOKEN_SCHEMA
    )


def usda_description_tokens(spark: SparkSession) -> DataFrame:
    """One row per (food_id, word): priority, |B|, has_raw."""
    rows = []
    for food in all_foods():
        prios = description_word_priorities(food.description)
        has_raw = "raw" in prios
        for w, p in prios.items():
            rows.append((food.food_id, w, p, len(prios), has_raw))
    return spark.createDataFrame(
        pd.DataFrame(
            rows, columns=["food_id", "word", "priority", "b_size", "has_raw"]
        )
    )


def score_candidates(
    keys_df: DataFrame, usda_tokens: DataFrame
) -> DataFrame:
    """All (ingredient key, food) candidate pairs with both scores.

    Columns: KEY_COLS + food_id, overlap, a_size, b_size, best_priority,
    modified_score, vanilla_score.
    """
    ing = ingredient_tokens(keys_df)
    joined = ing.join(usda_tokens, "word")
    return (
        joined.groupBy(*KEY_COLS, "food_id")
        .agg(
            sf.count("*").alias("overlap"),
            sf.first("a_size").alias("a_size"),
            sf.first("b_size").alias("b_size"),
            sf.first("has_state").alias("has_state"),
            sf.first("has_raw").alias("has_raw"),
            sf.min("priority").alias("best_priority"),
            sf.sum(sf.col("from_name").cast("int")).alias("name_overlap"),
        )
        # a candidate that shares no NAME word is noise (a state word like
        # "ground" overlapping some spice description must not count as a
        # mapping — it is what keeps region-centric ingredients unmapped)
        .where(sf.col("name_overlap") >= 1)
        .withColumn(
            "raw_bonus",
            (sf.col("has_raw") & ~sf.col("has_state")).cast("int"),
        )
        .withColumn(
            "modified_score",
            (sf.col("overlap") + sf.col("raw_bonus")) / sf.col("a_size"),
        )
        .withColumn(
            "vanilla_score",
            sf.col("overlap")
            / (sf.col("a_size") + sf.col("b_size") - sf.col("overlap")),
        )
    )


def best_matches(
    keys_df: DataFrame,
    usda_tokens: DataFrame,
    *,
    metric: str = "modified",
) -> DataFrame:
    """Rank-1 match per ingredient key under the chosen metric.

    Heuristic (h): higher score wins, then lower term priority;
    heuristic (i): remaining ties go to the lower USDA index (food_id).
    Vanilla ranking ignores the raw bonus and priorities? No — the paper
    compares *metrics*, keeping the rest of the pipeline fixed, so both
    metrics share the priority/index tie-breakers.
    """
    score_col = {"modified": "modified_score", "vanilla": "vanilla_score"}[metric]
    cands = score_candidates(keys_df, usda_tokens)
    # score first; then true overlap (so the heuristic-(g) raw bonus can
    # lift a food into a tie but never beat an actual extra matched word);
    # then heuristic (h) term priority; then heuristic (i) index order.
    w = Window.partitionBy(*KEY_COLS).orderBy(
        sf.col(score_col).desc(),
        sf.col("overlap").desc(),
        sf.col("best_priority").asc(),
        sf.col("food_id").asc(),
    )
    return (
        cands.withColumn("match_rank", sf.row_number().over(w))
        .where(sf.col("match_rank") == 1)
        .select(
            *KEY_COLS,
            "food_id",
            sf.col(score_col).alias("score"),
            "best_priority",
            "overlap",
            "a_size",
            "b_size",
        )
    )
