"""Tests for the recipe ingredient vocabulary."""
from repro.recipes import vocabulary as V
from repro.recipes.vocabulary import Ingredient, unmapped_fraction, vocabulary
from repro.usda.foods import food_by_description


class TestVocabulary:
    def test_gold_descriptions_exist(self):
        by_desc = food_by_description()
        for ing in vocabulary():
            if ing.gold_description is not None:
                assert ing.gold_description in by_desc, ing.name
                assert ing.gold_food_id == by_desc[ing.gold_description].food_id

    def test_names_unique(self):
        names = [v.name for v in vocabulary()]
        assert len(names) == len(set(names))

    def test_unmapped_fraction_near_paper(self):
        # paper: 100 − 94.49 = 5.51 % of unique ingredients unmatched
        assert 0.03 <= unmapped_fraction() <= 0.08

    def test_unmapped_have_offtable_kcal(self):
        for ing in vocabulary():
            if ing.gold_food_id is None:
                assert ing.offtable_kcal > 0, ing.name

    def test_every_category_has_units(self):
        for ing in vocabulary():
            assert ing.category in V.UNIT_CHOICES, ing.name

    def test_unit_choices_have_qty_ranges(self):
        for choices in V.UNIT_CHOICES.values():
            for unit, w in choices:
                assert unit in V.QTY_CHOICES
                assert w > 0

    def test_state_prob_defined_for_stateful_categories(self):
        for cat, states in V.STATE_CHOICES.items():
            if states:
                assert V.STATE_PROB.get(cat, 0) >= 0

    def test_states_disjoint_from_temp_and_df_words(self):
        temps = set(V.TEMPS)
        dfs = {"fresh", "dried", "dry"}
        for states in V.STATE_CHOICES.values():
            for s in states:
                assert s not in temps, s
                assert s not in dfs, s

    def test_deterministic_order(self):
        assert [v.name for v in vocabulary()] == [v.name for v in vocabulary()]

    def test_entry_types(self):
        for ing in vocabulary():
            assert isinstance(ing, Ingredient)
