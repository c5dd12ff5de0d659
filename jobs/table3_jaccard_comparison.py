"""Table III — food descriptions inferred with modified vs vanilla
Jaccard for the paper's ten ingredient phrases.

Reproduces the paper's comparison: the same extracted (name, state)
inputs matched under both metrics over the full synthetic USDA-SR. The
phenomenon to verify is the *bias*: where the two metrics disagree, the
vanilla pick is the shorter, less specific description.

Run: ``spark-submit jobs/table3_jaccard_comparison.py``
"""
from __future__ import annotations

from pyspark.sql import SparkSession
from pyspark.sql import types as T

from repro.core.matching import best_matches, usda_description_tokens
from repro.usda.foods import all_foods

#: (ingredient phrase, NER name, NER state) — phrases and extracted names
#: exactly as in the paper's Table III.
TABLE3_INPUTS: list[tuple[str, str, str | None]] = [
    ("1 cup red lentil", "red lentils", None),
    ("1 roma tomato , quartered", "roma tomato", "quartered"),
    ("1/4 teaspoon ground coriander", "coriander", "ground"),
    ("2 tablespoons tomato paste", "tomato paste", None),
    ("1 1/4 cups vegetable broth", "vegetable broth", None),
    ("1 can fava beans", "fava beans", None),
    ("1 teaspoon ground cayenne pepper", "cayenne pepper", "ground"),
    ("1 whole chicken with giblets patted dry and quartered",
     "chicken with giblets", "quartered"),
    ("2 tablespoons sesame seeds", "sesame seeds", None),
    ("1 teaspoon ground coriander", "coriander", "ground"),
]

_SCHEMA = T.StructType(
    [T.StructField(c, T.StringType(), True) for c in ("name", "state", "temp", "df")]
)


def run(spark: SparkSession) -> list[dict[str, str]]:
    """Returns one row per Table III phrase with both metric picks."""
    keys = spark.createDataFrame(
        [(name, state, None, None) for _, name, state in TABLE3_INPUTS], _SCHEMA
    ).distinct()
    ut = usda_description_tokens(spark)
    foods = {f.food_id: f.description for f in all_foods()}

    def collect(metric: str) -> dict[tuple[str | None, str | None], str]:
        rows = best_matches(keys, ut, metric=metric).collect()
        return {(r["name"], r["state"]): foods[r["food_id"]] for r in rows}

    mod, van = collect("modified"), collect("vanilla")
    out = []
    for phrase, name, state in TABLE3_INPUTS:
        out.append(
            {
                "Ingredient Phrase": phrase,
                "Ingredient Name": name,
                "Food Desc. Inferred W/ Modified JI": mod.get((name, state), "—"),
                "Food Desc. Inferred W/ Vanilla JI": van.get((name, state), "—"),
            }
        )
    return out


def main() -> None:
    from _session import get_session

    spark = get_session("table3")
    rows = run(spark)
    print("TABLE III. MODIFIED VS VANILLA JACCARD (reproduced)")
    for r in rows:
        print(f"- {r['Ingredient Phrase']!r} ({r['Ingredient Name']})")
        print(f"    modified: {r['Food Desc. Inferred W/ Modified JI']}")
        print(f"    vanilla : {r['Food Desc. Inferred W/ Vanilla JI']}")


if __name__ == "__main__":
    main()
