"""Tests for repro.text.tokenize."""
from repro.text.tokenize import STOPWORDS, content_words, tokenize


class TestTokenize:
    def test_lowercases(self):
        assert tokenize("Butter") == ["butter"]

    def test_splits_on_punctuation(self):
        assert tokenize("Butter, salted") == ["butter", "salted"]

    def test_drops_digits_and_percent(self):
        assert tokenize("2% milkfat") == ["milkfat"]

    def test_splits_hyphens(self):
        assert tokenize("all-purpose flour") == ["all", "purpose", "flour"]

    def test_parentheses(self):
        assert tokenize("Coriander (cilantro) leaves") == [
            "coriander", "cilantro", "leaves",
        ]

    def test_empty(self):
        assert tokenize("") == []

    def test_numbers_only(self):
        assert tokenize("1 1/2") == []

    def test_apostrophe_splits(self):
        assert tokenize("baker's yeast") == ["baker", "s", "yeast"]


class TestStopwords:
    def test_connectives_are_stopwords(self):
        for w in ("with", "or", "and", "of", "added"):
            assert w in STOPWORDS

    def test_not_is_never_a_stopword(self):
        # negation normalization depends on "not" surviving
        assert "not" not in STOPWORDS

    def test_food_words_are_not_stopwords(self):
        for w in ("milk", "fat", "raw", "butter", "salt"):
            assert w not in STOPWORDS


class TestContentWords:
    def test_removes_stopwords(self):
        assert content_words("Butter, with salt") == ["butter", "salt"]

    def test_keeps_order_and_duplicates(self):
        assert content_words("milk milk shakes") == ["milk", "milk", "shakes"]

    def test_long_description(self):
        ws = content_words(
            "Milk, reduced fat, fluid, 2% milkfat, with added vitamin A and vitamin D"
        )
        assert ws == ["milk", "reduced", "fat", "fluid", "milkfat",
                      "vitamin", "vitamin", "d"]
