"""Tests for NerTagger training, decoding, entity extraction, and the
Spark batch-tagging path."""
import pytest
from pyspark.sql import functions as sf

from repro.ner.tagger import NerTagger, extract_entities, tag_ingredients
from repro.recipes.generator import tagged_corpus
from repro.recipes.phrases import ner_tokenize


@pytest.fixture(scope="module")
def clean_tagger():
    """Trained on a noise-free corpus — should be near-perfect."""
    return NerTagger().fit(tagged_corpus(1500, seed=21, tag_noise=0.0), epochs=5)


class TestTraining:
    def test_high_accuracy_on_clean_data(self, clean_tagger):
        test = tagged_corpus(300, seed=22, tag_noise=0.0)
        correct = total = 0
        for tokens, tags in test:
            pred = clean_tagger.predict(tokens)
            correct += sum(p == g for p, g in zip(pred, tags))
            total += len(tags)
        assert correct / total > 0.97

    def test_predict_length(self, clean_tagger):
        tokens = ner_tokenize("2 cups all-purpose flour")
        assert len(clean_tagger.predict(tokens)) == 4

    def test_predict_phrase(self, clean_tagger):
        tokens, tags = clean_tagger.predict_phrase("1 teaspoon salt")
        assert tokens == ["1", "teaspoon", "salt"]
        assert tags == ["QUANTITY", "UNIT", "NAME"]

    def test_deterministic_fit(self):
        c = tagged_corpus(200, seed=23)
        a = NerTagger().fit(c, epochs=2).predict(["1", "cup", "sugar"])
        b = NerTagger().fit(c, epochs=2).predict(["1", "cup", "sugar"])
        assert a == b


class TestExtractEntities:
    def test_basic(self):
        ents = extract_entities(
            ["1", "cup", "flour"], ["QUANTITY", "UNIT", "NAME"]
        )
        assert ents["ner_qty"] == "1"
        assert ents["ner_unit"] == "cup"
        assert ents["ner_name"] == "flour"

    def test_multi_token_quantity_joined(self):
        ents = extract_entities(
            ["2", "1/2", "cups", "sugar"],
            ["QUANTITY", "QUANTITY", "UNIT", "NAME"],
        )
        assert ents["ner_qty"] == "2 1/2"

    def test_multi_token_name_and_state(self):
        ents = extract_entities(
            ["black", "pepper", ",", "minced"],
            ["NAME", "NAME", "O", "STATE"],
        )
        assert ents["ner_name"] == "black pepper"
        assert ents["ner_state"] == "minced"

    def test_first_unit_wins(self):
        ents = extract_entities(
            ["500", "g", "or", "1", "cup"],
            ["QUANTITY", "UNIT", "O", "O", "UNIT"],
        )
        assert ents["ner_unit"] == "g"

    def test_absent_entities_none(self):
        ents = extract_entities(["salt"], ["NAME"])
        assert ents["ner_state"] is None
        assert ents["ner_qty"] is None
        assert ents["ner_size"] is None

    def test_size_temp_df(self):
        ents = extract_entities(
            ["1", "small", "cold", "fresh", "onion"],
            ["QUANTITY", "SIZE", "TEMP", "DF", "NAME"],
        )
        assert ents["ner_size"] == "small"
        assert ents["ner_temp"] == "cold"
        assert ents["ner_df"] == "fresh"


class TestSparkTagging:
    def test_tag_ingredients_columns(self, spark, clean_tagger):
        df = spark.createDataFrame(
            [("1 cup sugar",), ("2 eggs , beaten",)], ["phrase"]
        )
        out = tag_ingredients(clean_tagger, df)
        for col in ("pred_tags", "ner_name", "ner_qty", "ner_unit"):
            assert col in out.columns
        rows = {r["phrase"]: r for r in out.collect()}
        assert rows["1 cup sugar"]["ner_name"] == "sugar"
        assert rows["1 cup sugar"]["ner_unit"] == "cup"

    def test_row_count_preserved(self, spark, clean_tagger, corpus):
        _, ingredients = corpus
        sample = ingredients.limit(200)
        assert tag_ingredients(clean_tagger, sample).count() == 200
