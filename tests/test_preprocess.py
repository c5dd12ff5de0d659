"""Tests for word-set construction (heuristics (b), (d), (f), (g))."""
from repro.core.preprocess import (
    description_has_raw,
    description_word_priorities,
    description_word_set,
    phrase_word_set,
)


class TestPhraseWordSet:
    def test_simple(self):
        words, has_state = phrase_word_set("butter")
        assert words == {"butter"}
        assert has_state is False

    def test_negation(self):
        words, _ = phrase_word_set("unsalted butter")
        assert words == {"not", "salt", "butter"}

    def test_lemmatization(self):
        words, _ = phrase_word_set("red lentils")
        assert words == {"red", "lentil"}

    def test_state_included_and_flagged(self):
        words, has_state = phrase_word_set("onion", state="chopped")
        assert "chopped" in words and "onion" in words
        assert has_state is True

    def test_temp_and_df_included(self):
        words, _ = phrase_word_set("water", temp="cold", df=None)
        assert words == {"water", "cold"}
        words, _ = phrase_word_set("dill weed", df="fresh")
        assert "fresh" in words

    def test_stopwords_dropped(self):
        words, _ = phrase_word_set("chicken with giblets")
        assert words == {"chicken", "giblet"}

    def test_plural_name(self):
        words, _ = phrase_word_set("sesame seeds")
        assert words == {"sesame", "seed"}


class TestDescriptionWordPriorities:
    def test_paper_example(self):
        assert description_word_priorities("Apples, raw, with skin") == {
            "apple": 1, "raw": 2, "skin": 3,
        }

    def test_min_priority_on_repeat(self):
        # a word in two terms keeps the earlier (lower) priority
        p = description_word_priorities("Milk, milk solids")
        assert p["milk"] == 1

    def test_negation_in_description(self):
        p = description_word_priorities("Butter, without salt")
        assert "not" in p and "salt" in p and "butter" in p

    def test_long_description(self):
        p = description_word_priorities(
            "Milk, reduced fat, fluid, 2% milkfat, with added vitamin A and vitamin D"
        )
        assert p["milk"] == 1
        assert p["milkfat"] == 4

    def test_symmetry_with_set(self):
        desc = "Egg, whole, raw, fresh"
        assert description_word_set(desc) == set(description_word_priorities(desc))


class TestHasRaw:
    def test_raw_present(self):
        assert description_has_raw("Apples, raw, with skin") is True

    def test_raw_absent(self):
        assert description_has_raw("Butter, salted") is False


class TestMatchSemantics:
    """The preprocessing pairs the paper calls out must become equal sets."""

    def test_unsalted_butter_equals_butter_without_salt(self):
        a, _ = phrase_word_set("unsalted butter")
        b = description_word_set("Butter, without salt")
        assert a == b

    def test_egg_whites_vs_description(self):
        a, _ = phrase_word_set("egg whites")
        b = description_word_set("Egg, white, raw, fresh")
        assert a <= b  # full coverage → J* = 1
