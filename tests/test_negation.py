"""Tests for negation normalization (heuristic (f))."""
import pytest

from repro.text.negation import NEGATION_TOKENS, normalize_negations


class TestStandaloneNegators:
    @pytest.mark.parametrize("neg", ["without", "no", "non", "free"])
    def test_mapped_to_not(self, neg):
        assert normalize_negations([neg, "salt"]) == ["not", "salt"]

    def test_tokens_constant_matches(self):
        assert NEGATION_TOKENS == frozenset({"without", "no", "non", "free"})


class TestUnPrefix:
    def test_unsalted(self):
        assert normalize_negations(["unsalted", "butter"]) == [
            "not", "salt", "butter",
        ]

    def test_unsweetened(self):
        out = normalize_negations(["unsweetened", "cocoa"])
        assert out[0] == "not" and out[-1] == "cocoa"

    def test_uncooked(self):
        assert normalize_negations(["uncooked"]) == ["not", "cook"]

    def test_non_whitelisted_un_word_untouched(self):
        # "union", "under" must not be split
        assert normalize_negations(["union"]) == ["union"]
        assert normalize_negations(["under"]) == ["under"]


class TestPaperExample:
    """'unsalted butter' and 'Butter, without salt' become equal sets."""

    def test_sets_equal(self):
        a = set(normalize_negations(["unsalted", "butter"]))
        b = set(normalize_negations(["butter", "without", "salt"]))
        assert a == b == {"not", "salt", "butter"}

    def test_passthrough(self):
        assert normalize_negations(["plain", "flour"]) == ["plain", "flour"]

    def test_empty(self):
        assert normalize_negations([]) == []
