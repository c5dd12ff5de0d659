"""Smoke tests for the §III results jobs at tiny scale — the heavy
statistics themselves are covered in tests/test_stats.py; these prove the
job entrypoints compose the pipeline correctly."""
import sys

import pytest

sys.path.insert(0, "jobs")

from figure2_mapping import run as run_figure2  # noqa: E402
from results_calorie_error import run as run_calorie  # noqa: E402


class TestCalorieErrorJob:
    @pytest.fixture(scope="class")
    def result(self, spark):
        return run_calorie(spark, sf=0.002, seed=1)

    def test_selects_recipes(self, result):
        assert result.n_recipes > 0

    def test_error_regime(self, result):
        # tens of kcal against meal-sized servings (paper: 36.42)
        assert 0 < result.mean_abs_error < 150.0
        assert result.mean_label_kcal > 200.0


class TestFigure2Job:
    def test_histogram_shape(self, spark):
        hist = run_figure2(spark, sf=0.002, seed=1).collect()
        series = {r["series"] for r in hist}
        assert series == {"name_mapped", "fully_mapped"}
        for s in series:
            total = sum(r["pct_recipes"] for r in hist if r["series"] == s)
            assert total == pytest.approx(100.0, abs=1e-6)
