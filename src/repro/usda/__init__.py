"""Synthetic USDA Standard Reference (USDA-SR) database substrate.

The paper matches ingredient names against the USDA-SR food-description
strings and resolves household units through its gram-weights table. The
real USDA-SR is not shippable offline, so this package builds a synthetic
replica that preserves every structural property the paper's heuristics
(a)–(i) key on:

- comma-separated descriptions with decreasing term importance (Table II);
- canonical foods indexed before their variants (heuristic (i));
- near-duplicate variants (with/without salt, raw with/without skin,
  fortified-milk strings with many trailing terms) that create the
  short-vs-long bias motivating the modified Jaccard index;
- distractor families (soups, babyfood, fast foods, milk shakes, salad
  dressings) behind the vanilla-Jaccard failures of Table III;
- a gram-weights table in the shape of Table IV (Butter,salted →
  pat/tbsp/cup/stick) with deliberately *missing* units (no teaspoon for
  butter) so the volume-conversion fallback path is exercised.

Modules: :mod:`foods` (descriptions + per-100 g nutrients),
:mod:`weights` (household-unit gram weights), :mod:`db` (Spark DataFrames).
"""
from repro.usda.db import usda_foods_df, usda_nutrients_df, usda_weights_df

__all__ = ["usda_foods_df", "usda_nutrients_df", "usda_weights_df"]
