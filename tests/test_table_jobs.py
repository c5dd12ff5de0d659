"""Tests that the per-table jobs reproduce the paper's artifacts."""
import sys

import pytest

sys.path.insert(0, "jobs")

from table1_ner_tags import TABLE1_PHRASES, run as run_table1  # noqa: E402
from table2_usda_descriptions import run as run_table2  # noqa: E402
from table3_jaccard_comparison import TABLE3_INPUTS, run as run_table3  # noqa: E402
from table4_unit_relations import run as run_table4  # noqa: E402


@pytest.fixture(scope="module")
def table1_rows(tagger):
    return run_table1(tagger)


class TestTable1:
    def test_twelve_phrases(self, table1_rows):
        assert len(table1_rows) == 12
        assert len(TABLE1_PHRASES) == 12

    @pytest.mark.parametrize(
        "idx,qty,unit",
        [
            (0, "1/2", "lb"),
            (3, "1", "tablespoon"),
            (4, "1/2", "teaspoon"),
            (5, "1/8", "teaspoon"),
            (7, "2", "cups"),
            (8, "1", "teaspoon"),
        ],
    )
    def test_quantities_and_units(self, table1_rows, idx, qty, unit):
        assert table1_rows[idx]["Quantity"] == qty
        assert table1_rows[idx]["Unit"] == unit

    def test_small_onion(self, table1_rows):
        row = table1_rows[1]
        assert row["Name"] == "onion"
        assert row["Size"] == "small"
        assert "chopped" in row["State"]

    def test_cold_water_temp(self, table1_rows):
        row = table1_rows[11]
        assert row["Name"] == "water"
        assert row["Temperature"] == "cold"

    def test_fresh_dill_weed(self, table1_rows):
        row = table1_rows[3]
        assert row["Name"] == "dill weed"
        assert row["Dry/Fresh"] == "fresh"

    def test_butter_or_margarine_keeps_first(self, table1_rows):
        row = table1_rows[6]
        assert row["Name"] == "butter"
        assert "margarine" not in row["Name"]

    def test_egg_yolk(self, table1_rows):
        assert table1_rows[10]["Name"] == "egg yolk"


class TestTable2:
    def test_matches_paper(self, spark):
        from tests.test_usda_db import TABLE2

        rows = run_table2(spark).collect()
        assert [r["Description"] for r in rows] == TABLE2


class TestTable3:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        return run_table3(spark)

    def test_ten_rows(self, rows):
        assert len(rows) == len(TABLE3_INPUTS) == 10

    @pytest.mark.parametrize(
        "idx,expected_modified",
        [
            (0, "Lentils, pink or red, raw"),
            (2, "Coriander (cilantro) leaves, raw"),
            (3, "Tomato products, canned, paste, without salt added"),
            (4, "Soup, vegetable broth, ready to serve"),
            (5, "Broadbeans (fava beans), mature seeds, raw"),
            (6, "Spices, pepper, red or cayenne"),
            (7, "Chicken, broilers or fryers, meat and skin and giblets and neck, raw"),
            (8, "Seeds, sesame seeds, whole, dried"),
            (9, "Coriander (cilantro) leaves, raw"),
        ],
    )
    def test_modified_picks_match_paper(self, rows, idx, expected_modified):
        assert rows[idx]["Food Desc. Inferred W/ Modified JI"] == expected_modified

    def test_metrics_disagree_somewhere(self, rows):
        differing = sum(
            r["Food Desc. Inferred W/ Modified JI"]
            != r["Food Desc. Inferred W/ Vanilla JI"]
            for r in rows
        )
        assert differing >= 3

    def test_vanilla_bias_toward_short(self, rows):
        """Where the metrics disagree, vanilla's pick must have the
        smaller word set — |B| is exactly what its denominator penalizes
        (the paper's central claim about the bias)."""
        from repro.core.preprocess import description_word_set

        for r in rows:
            mod = r["Food Desc. Inferred W/ Modified JI"]
            van = r["Food Desc. Inferred W/ Vanilla JI"]
            if mod != van and "—" not in (mod, van):
                assert len(description_word_set(van)) <= len(
                    description_word_set(mod)
                ), r


class TestTable4:
    def test_exact_paper_values(self, spark):
        rows = run_table4(spark).collect()
        got = {r["unit_key"]: (r["seq"], r["amount"], r["grams"], r["gram_per_amount"])
               for r in rows}
        assert got["pat"] == (1, 1.0, 5.0, 5.0)
        assert got["tablespoon"] == (2, 1.0, 14.2, 14.2)
        assert got["cup"] == (3, 1.0, 227.0, 227.0)
        assert got["stick"] == (4, 1.0, 113.0, 113.0)

    def test_ingredient_label(self, spark):
        rows = run_table4(spark).collect()
        assert all(r["ingredient"] == "Butter, salted" for r in rows)
