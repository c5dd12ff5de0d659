"""Tests for quantity normalization (paper §II-C preprocessing)."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core.quantity import parse_quantity


class TestPaperExamples:
    def test_range_averaged(self):
        assert parse_quantity("2-4") == 3.0

    def test_mixed_number(self):
        assert parse_quantity("2 1/2") == 2.5

    def test_simple_fraction(self):
        assert parse_quantity("1/2") == 0.5

    def test_integer(self):
        assert parse_quantity("3") == 3.0

    def test_decimal(self):
        assert parse_quantity("1.5") == 1.5


class TestVariants:
    @pytest.mark.parametrize(
        "text,value",
        [
            ("1/8", 0.125),
            ("3/4", 0.75),
            ("10", 10.0),
            ("2 to 4", 3.0),
            ("1-2", 1.5),
            ("0.25", 0.25),
            ("  2  1/2 ", 2.5),
            ("1 / 2", 0.5),
        ],
    )
    def test_value(self, text, value):
        assert parse_quantity(text) == pytest.approx(value)

    @pytest.mark.parametrize("uni,value", [("½", 0.5), ("¼", 0.25), ("⅓", 1 / 3)])
    def test_unicode_fractions(self, uni, value):
        assert parse_quantity(uni) == pytest.approx(value, rel=1e-2)

    def test_mixed_unicode(self):
        assert parse_quantity("2½") == pytest.approx(2.5)


class TestRejects:
    @pytest.mark.parametrize("bad", ["", "garbage", "a-b", "1/0", None, "to taste"])
    def test_none(self, bad):
        assert parse_quantity(bad) is None


class TestProperties:
    @given(st.integers(min_value=0, max_value=10_000))
    def test_integer_roundtrip(self, n):
        assert parse_quantity(str(n)) == float(n)

    @given(
        st.integers(min_value=1, max_value=100),
        st.integers(min_value=1, max_value=100),
    )
    def test_fraction(self, num, den):
        assert parse_quantity(f"{num}/{den}") == pytest.approx(num / den)

    @given(
        st.integers(min_value=0, max_value=50),
        st.integers(min_value=0, max_value=50),
    )
    def test_range_is_mean(self, a, b):
        assert parse_quantity(f"{a}-{b}") == pytest.approx((a + b) / 2)
