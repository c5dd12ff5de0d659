"""Tests for the gram-weights table (Table IV shape)."""
import pytest

from repro.usda.foods import all_foods, food_by_description
from repro.usda.weights import all_weight_rows, weights_for


class TestTable4:
    """The paper's Table IV rows for Butter,salted, to the gram."""

    def _butter_rows(self):
        butter = food_by_description()["Butter, salted"]
        return weights_for(butter)

    def test_row_count(self):
        assert len(self._butter_rows()) == 4

    def test_values(self):
        rows = {u.split(" ")[0]: (seq, amount, grams)
                for seq, amount, u, grams in self._butter_rows()}
        assert rows["pat"] == (1, 1.0, 5.0)
        assert rows["tbsp"] == (2, 1.0, 14.2)
        assert rows["cup"] == (3, 1.0, 227.0)
        assert rows["stick"] == (4, 1.0, 113.0)

    def test_no_teaspoon_row(self):
        # the paper's motivating gap: teaspoon must be DERIVED for butter
        units = [u for _, _, u, _ in self._butter_rows()]
        assert not any("tsp" in u or "teaspoon" in u for u in units)

    def test_messy_unit_string_preserved(self):
        units = [u for _, _, u, _ in self._butter_rows()]
        assert 'pat (1" sq, 1/3" high)' in units


class TestCoverage:
    def test_every_food_has_weights(self):
        for food in all_foods():
            assert weights_for(food), food.description

    def test_seq_starts_at_one_and_is_dense(self):
        for food in all_foods():
            seqs = [seq for seq, *_ in weights_for(food)]
            assert seqs == list(range(1, len(seqs) + 1))

    def test_grams_positive(self):
        for food_id, seq, amount, unit, grams in all_weight_rows():
            assert grams > 0 and amount > 0

    def test_flatten_consistent(self):
        rows = all_weight_rows()
        total = sum(len(weights_for(f)) for f in all_foods())
        assert len(rows) == total

    def test_egg_sizes(self):
        egg = food_by_description()["Egg, whole, raw, fresh"]
        units = {u for _, _, u, _ in weights_for(egg)}
        assert {"large", "medium", "small"} <= units
