"""Tests for NER scoring and cross-validation."""
import pytest

from repro.ner.evaluate import cross_validate, evaluate, score_predictions
from repro.ner.tagger import NerTagger
from repro.recipes.generator import tagged_corpus


class TestScoreMath:
    def test_perfect(self):
        s = score_predictions([["NAME", "O"]], [["NAME", "O"]])
        assert s.precision == s.recall == s.f1 == 1.0

    def test_all_wrong(self):
        s = score_predictions([["NAME"]], [["UNIT"]])
        assert s.f1 == 0.0

    def test_o_tokens_excluded(self):
        # predicting O for O adds nothing; only entity tokens count
        s = score_predictions([["O", "NAME"]], [["O", "NAME"]])
        assert s.f1 == 1.0

    def test_precision_recall_asymmetry(self):
        # gold has 2 entities, predictions find 1 of them + 0 spurious
        s = score_predictions([["NAME", "UNIT"]], [["NAME", "O"]])
        assert s.precision == 1.0
        assert s.recall == 0.5
        assert s.f1 == pytest.approx(2 / 3)

    def test_spurious_prediction_costs_precision(self):
        s = score_predictions([["O", "NAME"]], [["UNIT", "NAME"]])
        assert s.precision == 0.5
        assert s.recall == 1.0

    def test_per_tag_f1(self):
        s = score_predictions(
            [["NAME", "UNIT"]], [["NAME", "NAME"]]
        )
        assert s.per_tag_f1["UNIT"] == 0.0
        assert 0 < s.per_tag_f1["NAME"] < 1.0


class TestEvaluate:
    def test_on_trained_tagger(self):
        corpus = tagged_corpus(600, seed=31, tag_noise=0.0)
        tagger = NerTagger().fit(corpus[:500], epochs=4)
        s = evaluate(tagger, corpus[500:])
        assert s.f1 > 0.9


class TestCrossValidate:
    def test_fold_count(self):
        corpus = tagged_corpus(250, seed=32)
        scores = cross_validate(corpus, k=5, epochs=2)
        assert len(scores) == 5

    def test_reasonable_f1(self):
        corpus = tagged_corpus(1000, seed=33)
        scores = cross_validate(corpus, k=4, epochs=3)
        mean_f1 = sum(s.f1 for s in scores) / len(scores)
        assert 0.80 < mean_f1 <= 1.0
