"""Tests for the rule-based noun lemmatizer (NLTK WordNet stand-in)."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.text.lemmatizer import lemmatize, lemmatize_words


class TestRegularPlurals:
    @pytest.mark.parametrize(
        "plural,singular",
        [
            ("apples", "apple"),
            ("eggs", "egg"),
            ("lentils", "lentil"),
            ("onions", "onion"),
            ("carrots", "carrot"),
            ("shakes", "shake"),
            ("cups", "cup"),
            ("grams", "gram"),
            ("seeds", "seed"),
            ("beans", "bean"),
        ],
    )
    def test_s_plural(self, plural, singular):
        assert lemmatize(plural) == singular

    @pytest.mark.parametrize(
        "plural,singular",
        [
            ("berries", "berry"),
            ("cherries", "cherry"),
            ("strawberries", "strawberry"),
            ("tomatoes", "tomato"),
            ("potatoes", "potato"),
            ("peaches", "peach"),
            ("radishes", "radish"),
            ("boxes", "box"),
        ],
    )
    def test_suffix_rules(self, plural, singular):
        assert lemmatize(plural) == singular


class TestIrregulars:
    @pytest.mark.parametrize(
        "plural,singular",
        [("leaves", "leaf"), ("halves", "half"), ("loaves", "loaf")],
    )
    def test_irregular(self, plural, singular):
        assert lemmatize(plural) == singular


class TestConservativeness:
    """The paper rejects stemmers for aggression; the lemmatizer must not
    mangle words that only look plural."""

    @pytest.mark.parametrize(
        "word", ["molasses", "couscous", "hummus", "asparagus", "swiss",
                 "cress", "watercress", "butter", "salt", "milk"]
    )
    def test_untouched(self, word):
        assert lemmatize(word) == word

    def test_short_words_untouched(self):
        for w in ("gas", "is", "as", "its"):
            assert lemmatize(w) == w

    def test_uppercase_normalized(self):
        assert lemmatize("Apples") == "apple"


class TestProperties:
    @given(st.text(alphabet="abcdefghijklmnopqrstuvwxyz", min_size=1, max_size=12))
    def test_idempotent(self, w):
        assert lemmatize(lemmatize(w)) == lemmatize(w)

    @given(st.text(alphabet="abcdefghijklmnopqrstuvwxyz", min_size=1, max_size=12))
    def test_never_longer_by_more_than_one(self, w):
        # -ies → y shrinks; nothing should grow beyond +0 chars
        assert len(lemmatize(w)) <= len(w)

    def test_lemmatize_words(self):
        assert lemmatize_words(["apples", "leaves"]) == ["apple", "leaf"]
