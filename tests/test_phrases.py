"""Tests for phrase rendering and the tokenizer invariants."""
import random

import pytest

from repro.recipes.phrases import (
    ALL_TAGS,
    RenderedIngredient,
    ner_tokenize,
    pluralize,
    render_ingredient,
)
from repro.recipes.vocabulary import vocabulary


class TestNerTokenize:
    def test_plain(self):
        assert ner_tokenize("1 cup flour") == ["1", "cup", "flour"]

    def test_spaced_comma(self):
        assert ner_tokenize("onion , chopped") == ["onion", ",", "chopped"]

    def test_comma_glued_to_next(self):
        assert ner_tokenize("salt ,minced") == ["salt", ",", "minced"]

    def test_comma_glued_to_prev(self):
        assert ner_tokenize("salt, minced") == ["salt", ",", "minced"]

    def test_internal_comma_from_paper(self):
        # Table I: "1/8 teaspoon black pepper,minced"
        assert ner_tokenize("black pepper,minced") == [
            "black", "pepper", ",", "minced",
        ]

    def test_hyphens_survive(self):
        assert ner_tokenize("1 hard-cooked egg") == ["1", "hard-cooked", "egg"]

    def test_fraction_tokens(self):
        assert ner_tokenize("1/2 lb beef") == ["1/2", "lb", "beef"]

    def test_parens(self):
        assert ner_tokenize("salt ( optional )") == ["salt", "(", "optional", ")"]


class TestPluralize:
    @pytest.mark.parametrize(
        "sing,plural",
        [("egg", "eggs"), ("tomato", "tomatoes"), ("cherry", "cherries"),
         ("carrot", "carrots"), ("radish", "radishes")],
    )
    def test_pluralize(self, sing, plural):
        assert pluralize(sing) == plural


class TestRenderInvariants:
    """Rendering must keep tokens/tags aligned with re-tokenization — the
    property that makes generator gold usable as NER supervision."""

    def test_many_samples_aligned(self):
        rng = random.Random(42)
        vocab = vocabulary()
        for _ in range(800):
            ing = rng.choice(vocab)
            r = render_ingredient(ing, rng, vocab)
            assert ner_tokenize(r.phrase) == r.tokens, r.phrase
            assert len(r.tokens) == len(r.tags)

    def test_tags_valid(self):
        rng = random.Random(1)
        vocab = vocabulary()
        for _ in range(300):
            r = render_ingredient(rng.choice(vocab), rng, vocab)
            assert set(r.tags) <= set(ALL_TAGS)

    def test_name_tokens_present(self):
        rng = random.Random(2)
        vocab = vocabulary()
        for _ in range(300):
            r = render_ingredient(rng.choice(vocab), rng, vocab)
            assert "NAME" in r.tags

    def test_gold_kcal_nonnegative(self):
        rng = random.Random(3)
        vocab = vocabulary()
        for _ in range(300):
            r = render_ingredient(rng.choice(vocab), rng, vocab)
            assert r.gold_kcal >= 0.0

    def test_grams_consistent_with_kcal(self):
        rng = random.Random(4)
        vocab = vocabulary()
        for _ in range(300):
            r = render_ingredient(rng.choice(vocab), rng, vocab)
            if r.gold_grams is None:
                assert r.gold_kcal == 0.0

    def test_deterministic_given_rng(self):
        vocab = vocabulary()
        a = render_ingredient(vocab[0], random.Random(9), vocab)
        b = render_ingredient(vocab[0], random.Random(9), vocab)
        assert a == b

    def test_returns_dataclass(self):
        vocab = vocabulary()
        r = render_ingredient(vocab[0], random.Random(0), vocab)
        assert isinstance(r, RenderedIngredient)
