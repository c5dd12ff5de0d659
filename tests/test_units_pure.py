"""Tests for unit cleaning, aliasing, and pure gram resolution (§II-C)."""
import pytest

from repro.core.units import (
    MASS_G,
    SIZE_KEY,
    SIZE_UNITS,
    VOLUME_ML,
    clean_unit,
    grams_per_unit_py,
    unit_key,
)

#: Table IV-style weight rows for Butter,salted (no teaspoon!).
BUTTER_ROWS = [
    (1, 1.0, 'pat (1" sq, 1/3" high)', 5.0),
    (2, 1.0, "tbsp", 14.2),
    (3, 1.0, "cup", 227.0),
    (4, 1.0, "stick", 113.0),
]

EGG_ROWS = [
    (1, 1.0, "large", 50.0),
    (2, 1.0, "medium", 44.0),
    (3, 1.0, "small", 38.0),
    (4, 1.0, "cup", 243.0),
]


class TestCleanUnit:
    def test_messy_pat_from_paper(self):
        assert clean_unit('pat (1" sq, 1/3" high)') == "pat"

    @pytest.mark.parametrize(
        "raw,std",
        [
            ("tbsp", "tablespoon"),
            ("tablespoons", "tablespoon"),
            ("tsp", "teaspoon"),
            ("teaspoon", "teaspoon"),
            ("lb", "pound"),
            ("lbs", "pound"),
            ("pound", "pound"),
            ("oz", "ounce"),
            ("cups", "cup"),
            ("cup chopped", "cup"),
            ("cup packed", "cup"),
            ("g", "gram"),
            ("grams", "gram"),
            ("fl oz", "fluidounce"),
            ("cloves", "clove"),
            ("sprigs", "sprig"),
            ("ml", "milliliter"),
            ("oz package", "ounce"),
        ],
    )
    def test_aliases(self, raw, std):
        assert clean_unit(raw) == std

    def test_unknown_is_none(self):
        assert clean_unit("whatever") is None

    @pytest.mark.parametrize("empty", [None, "", "   ", "123"])
    def test_degenerate(self, empty):
        assert clean_unit(empty) is None


class TestUnitKey:
    def test_sizes_collapse(self):
        for s in SIZE_UNITS:
            assert unit_key(s) == SIZE_KEY

    def test_regular_unit_passthrough(self):
        assert unit_key("cup") == "cup"

    def test_none(self):
        assert unit_key(None) is None


class TestConversionTables:
    def test_cup_is_48_teaspoons(self):
        assert VOLUME_ML["cup"] / VOLUME_ML["teaspoon"] == pytest.approx(48.0, rel=1e-4)

    def test_cup_is_16_tablespoons(self):
        assert VOLUME_ML["cup"] / VOLUME_ML["tablespoon"] == pytest.approx(16.0, rel=1e-4)

    def test_pound_in_grams(self):
        assert MASS_G["pound"] == pytest.approx(453.592)


class TestGramsPerUnit:
    def test_exact_unit(self):
        assert grams_per_unit_py("cup", None, BUTTER_ROWS) == pytest.approx(227.0)

    def test_exact_alias(self):
        # tbsp row matches canonical tablespoon
        assert grams_per_unit_py("tablespoon", None, BUTTER_ROWS) == pytest.approx(14.2)

    def test_derived_teaspoon_for_butter(self):
        # paper's example: butter has no teaspoon — derive via volume ratio
        # from the first volume row by seq (tbsp, 14.2 g / 14.7868 ml)
        expected = VOLUME_ML["teaspoon"] * 14.2 / VOLUME_ML["tablespoon"]
        assert grams_per_unit_py("teaspoon", None, BUTTER_ROWS) == pytest.approx(expected)
        # ~4.7 g → ~35 kcal/tsp at 717 kcal/100 g, the paper's sanity figure
        assert 4.0 < expected < 5.5

    def test_mass_direct(self):
        assert grams_per_unit_py("pound", None, BUTTER_ROWS) == pytest.approx(453.592)

    def test_count_uses_first_size_row(self):
        assert grams_per_unit_py(None, None, EGG_ROWS) == pytest.approx(50.0)

    def test_count_with_explicit_size(self):
        assert grams_per_unit_py(None, "small", EGG_ROWS) == pytest.approx(38.0)

    def test_count_with_missing_size_falls_back(self):
        # egg rows have no "piece": unknown size → first size row
        assert grams_per_unit_py(None, "piece", EGG_ROWS) == pytest.approx(50.0)

    def test_count_without_size_rows_is_none(self):
        assert grams_per_unit_py(None, None, BUTTER_ROWS) is None

    def test_unknown_unit_is_none(self):
        assert grams_per_unit_py("clove", None, BUTTER_ROWS) is None

    def test_amount_normalization(self):
        rows = [(1, 2.0, "oz", 57.0)]
        assert grams_per_unit_py("ounce", None, rows) == pytest.approx(28.5)
