"""Tests for vanilla and modified Jaccard (heuristic (e))."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core.jaccard import modified_jaccard, vanilla_jaccard

words = st.sets(st.sampled_from("abcdefghij"), max_size=8)


class TestVanilla:
    def test_identical(self):
        assert vanilla_jaccard({"a", "b"}, {"a", "b"}) == 1.0

    def test_disjoint(self):
        assert vanilla_jaccard({"a"}, {"b"}) == 0.0

    def test_partial(self):
        assert vanilla_jaccard({"a", "b"}, {"b", "c"}) == pytest.approx(1 / 3)

    def test_empty_both(self):
        assert vanilla_jaccard(set(), set()) == 0.0


class TestModified:
    def test_full_coverage_of_a(self):
        # every ingredient word matched → 1.0 regardless of |B|
        a = {"skim", "milk"}
        b = {"milk", "skim", "vitamin", "d", "fluid", "fortified"}
        assert modified_jaccard(a, b) == 1.0

    def test_empty_a(self):
        assert modified_jaccard(set(), {"x"}) == 0.0

    def test_raw_bonus_applies(self):
        a, b = {"apple"}, {"apple", "raw", "skin"}
        assert modified_jaccard(a, b, raw_bonus=True) == 2.0
        assert modified_jaccard(a, b, raw_bonus=False) == 1.0

    def test_raw_bonus_requires_raw_in_b(self):
        a, b = {"apple"}, {"apple", "skin"}
        assert modified_jaccard(a, b, raw_bonus=True) == 1.0


class TestPaperBias:
    """The motivating example: 'skimmed milk' vs a short distractor and a
    long correct description (§II-B(e))."""

    A = {"skim", "milk"}
    SHAKE = {"milk", "shake", "thick", "chocolate"}
    LONG = {"milk", "reduced", "fat", "fluid", "milkfat", "protein",
            "fortified", "vitamin", "d", "skim", "free"}

    def test_vanilla_prefers_short_wrong(self):
        assert vanilla_jaccard(self.A, self.SHAKE) > vanilla_jaccard(self.A, self.LONG) / 2
        # the long description is *more* covered yet scores barely better
        assert vanilla_jaccard(self.A, self.LONG) < 0.2

    def test_modified_prefers_correct_long(self):
        assert modified_jaccard(self.A, self.LONG) == 1.0
        assert modified_jaccard(self.A, self.SHAKE) == 0.5


class TestProperties:
    @given(words, words)
    def test_vanilla_bounded(self, a, b):
        assert 0.0 <= vanilla_jaccard(a, b) <= 1.0

    @given(words, words)
    def test_modified_dominates_vanilla(self, a, b):
        # |A| ≤ |A∪B| ⇒ J* ≥ J (no bonus)
        assert modified_jaccard(a, b) >= vanilla_jaccard(a, b) - 1e-12

    @given(words, words)
    def test_vanilla_symmetric(self, a, b):
        assert vanilla_jaccard(a, b) == vanilla_jaccard(b, a)

    @given(words)
    def test_modified_self_is_one(self, a):
        if a:
            assert modified_jaccard(a, a) == 1.0
