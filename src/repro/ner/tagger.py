"""The NER tagger: training, greedy decoding, and Spark batch tagging.

``NerTagger.fit`` trains the averaged perceptron over tagged phrases;
``predict`` decodes left-to-right, feeding each predicted tag into the
next token's features. ``tag_ingredients`` applies a trained model to a
phrase DataFrame via ``mapInPandas`` — the model's weight dict rides to
executors inside the closure (a broadcast in local mode) and each Arrow
batch is tagged vectorized-per-row, which is the idiomatic way to run a
Python model inside a Catalyst plan.
"""
from __future__ import annotations

import random
from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import types as T

from repro.ner.features import token_features
from repro.ner.perceptron import AveragedPerceptron, shuffled
from repro.recipes.phrases import ALL_TAGS, ner_tokenize


class NerTagger:
    """Greedy left-to-right averaged-perceptron sequence tagger."""

    def __init__(self) -> None:
        self.model = AveragedPerceptron(list(ALL_TAGS))

    def fit(
        self,
        corpus: list[tuple[list[str], list[str]]],
        *,
        epochs: int = 5,
        seed: int = 13,
    ) -> "NerTagger":
        """Train on ``(tokens, tags)`` pairs; shuffles each epoch."""
        rng = random.Random(seed)
        for _ in range(epochs):
            for tokens, tags in shuffled(corpus, rng):
                prev = "<start>"
                for i, truth in enumerate(tags):
                    feats = token_features(tokens, i, prev)
                    guess = self.model.predict(feats)
                    self.model.update(truth, guess, feats)
                    prev = guess
        self.model.average()
        self.model.prune()
        return self

    def predict(self, tokens: list[str]) -> list[str]:
        prev = "<start>"
        out = []
        for i in range(len(tokens)):
            tag = self.model.predict(token_features(tokens, i, prev))
            out.append(tag)
            prev = tag
        return out

    def predict_phrase(self, phrase: str) -> tuple[list[str], list[str]]:
        tokens = ner_tokenize(phrase)
        return tokens, self.predict(tokens)


_TAGGED_FIELDS = [
    T.StructField("pred_tags", T.ArrayType(T.StringType()), True),
    T.StructField("ner_name", T.StringType(), True),
    T.StructField("ner_state", T.StringType(), True),
    T.StructField("ner_qty", T.StringType(), True),
    T.StructField("ner_unit", T.StringType(), True),
    T.StructField("ner_size", T.StringType(), True),
    T.StructField("ner_temp", T.StringType(), True),
    T.StructField("ner_df", T.StringType(), True),
]


def extract_entities(tokens: list[str], tags: list[str]) -> dict[str, str | None]:
    """Collapse token tags into the paper's Table I columns.

    NAME and QUANTITY take their *first contiguous run* — "3/4 cup butter
    or 3/4 cup margarine" keeps only the first alternative, exactly the
    paper's behaviour; "2 1/2" stays one quantity. STATE concatenates all
    runs ("hard-cooked chopped"); UNIT/SIZE/TEMP/DF take the first token.
    """
    runs: dict[str, list[list[str]]] = {}
    prev_tag = None
    for tok, tag in zip(tokens, tags):
        if tag != "O":
            if tag == prev_tag:
                runs[tag][-1].append(tok)
            else:
                runs.setdefault(tag, []).append([tok])
        prev_tag = tag

    def first_run(tag: str) -> str | None:
        return " ".join(runs[tag][0]) if tag in runs else None

    state_runs = runs.get("STATE")
    return {
        "ner_name": first_run("NAME"),
        "ner_state": " ".join(t for r in state_runs for t in r) if state_runs else None,
        "ner_qty": first_run("QUANTITY"),
        "ner_unit": runs["UNIT"][0][0] if "UNIT" in runs else None,
        "ner_size": runs["SIZE"][0][0] if "SIZE" in runs else None,
        "ner_temp": runs["TEMP"][0][0] if "TEMP" in runs else None,
        "ner_df": runs["DF"][0][0] if "DF" in runs else None,
    }


def tag_ingredients(tagger: NerTagger, ingredients_df: DataFrame) -> DataFrame:
    """Add ``pred_tags`` + extracted ``ner_*`` columns to a phrase DataFrame."""
    weights = tagger.model.weights
    classes = tagger.model.classes
    schema = T.StructType(list(ingredients_df.schema.fields) + _TAGGED_FIELDS)

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        local = NerTagger()
        local.model = AveragedPerceptron(classes)
        local.model.weights = weights
        for pdf in batches:
            preds, extracted = [], []
            for phrase in pdf["phrase"]:
                tokens = ner_tokenize(phrase)
                tags = local.predict(tokens)
                preds.append(tags)
                extracted.append(extract_entities(tokens, tags))
            out = pdf.copy()
            out["pred_tags"] = preds
            for col in (
                "ner_name", "ner_state", "ner_qty", "ner_unit",
                "ner_size", "ner_temp", "ner_df",
            ):
                out[col] = [e[col] for e in extracted]
            yield out

    return ingredients_df.mapInPandas(run, schema=schema)
