"""The paper's contribution: NER-driven ingredient extraction feeding a
modified-Jaccard USDA matcher and a unit-resolution stage whose sum gives
a recipe's nutritional profile (paper §II).

- :mod:`repro.core.preprocess` — heuristics (b)(f)(g): word-set construction.
- :mod:`repro.core.jaccard` — vanilla J and modified J* (heuristic (e)).
- :mod:`repro.core.matching` — distributed matcher, heuristics (a)–(i).
- :mod:`repro.core.quantity` — quantity normalization ("2 1/2" → 2.5).
- :mod:`repro.core.units` — unit cleaning/aliases/conversions (§II-C).
- :mod:`repro.core.nutrition` — gram resolution → nutrient aggregation.
- :mod:`repro.core.pipeline` — end-to-end orchestration.
"""
