"""Household-unit gram weights — the shape of the paper's Table IV.

Each food carries rows ``(seq, amount, unit, grams)``; ``gram_per_amount =
grams / amount`` is what the unit matcher multiplies quantities by. The
table deliberately *omits* units the recipes will ask for (butter has
pat/tbsp/cup/stick but **no teaspoon**, exactly as in the paper) so the
volume-ratio derivation path of §II-C is exercised, and it includes messy
unit strings (``pat (1" sq, 1/3" high)``) that the regex cleaner must
reduce to ``pat``.

Weights come from per-description overrides (pinned for the foods the
paper names — Butter,salted matches Table IV to the gram) falling back to
category defaults.
"""
from __future__ import annotations

from repro.usda import foods as F

#: Raw unit strings are intentionally noisy where USDA-SR is noisy.
_MESSY_UNIT = {"pat": 'pat (1" sq, 1/3" high)'}

#: description → [(amount, unit, grams)] — seq is list position + 1.
_OVERRIDES: dict[str, list[tuple[float, str, float]]] = {
    # Table IV, to the gram.
    "Butter, salted": [(1.0, "pat", 5.0), (1.0, "tbsp", 14.2), (1.0, "cup", 227.0), (1.0, "stick", 113.0)],
    "Butter, whipped, with salt": [(1.0, "pat", 3.8), (1.0, "tbsp", 9.4), (1.0, "cup", 151.0), (1.0, "stick", 76.0)],
    "Butter, without salt": [(1.0, "pat", 5.0), (1.0, "tbsp", 14.2), (1.0, "cup", 227.0), (1.0, "stick", 113.0)],
    "Egg, whole, raw, fresh": [(1.0, "large", 50.0), (1.0, "medium", 44.0), (1.0, "small", 38.0), (1.0, "cup", 243.0)],
    "Egg, white, raw, fresh": [(1.0, "large", 33.0), (1.0, "cup", 243.0)],
    "Egg, yolk, raw, fresh": [(1.0, "large", 17.0), (1.0, "cup", 243.0)],
    "Wheat flour, white, all-purpose, enriched, bleached": [(1.0, "cup", 125.0), (1.0, "tbsp", 7.8)],
    "Wheat flour, whole-grain": [(1.0, "cup", 120.0), (1.0, "tbsp", 7.5)],
    "Sugars, granulated": [(1.0, "cup", 200.0), (1.0, "tbsp", 12.5), (1.0, "tsp", 4.2)],
    "Sugars, brown": [(1.0, "cup packed", 220.0), (1.0, "tbsp", 13.8)],
    "Sugars, powdered": [(1.0, "cup", 120.0), (1.0, "tbsp", 7.5)],
    "Salt, table": [(1.0, "tsp", 6.0), (1.0, "tbsp", 18.0)],
    "Leavening agents, baking powder, double-acting": [(1.0, "tsp", 4.6)],
    "Leavening agents, baking soda": [(1.0, "tsp", 4.6)],
    "Leavening agents, yeast, baker's, active dry": [(1.0, "tsp", 3.1), (0.25, "oz package", 7.0)],
    "Vanilla extract": [(1.0, "tsp", 4.2), (1.0, "tbsp", 13.0)],
    "Honey": [(1.0, "tbsp", 21.0), (1.0, "cup", 339.0)],
    "Molasses": [(1.0, "tbsp", 20.0), (1.0, "cup", 337.0)],
    "Peanut butter, smooth style, with salt": [(1.0, "tbsp", 16.0), (1.0, "cup", 258.0)],
    "Salad dressing, mayonnaise, regular": [(1.0, "tbsp", 13.8), (1.0, "cup", 220.0)],
    "Ketchup": [(1.0, "tbsp", 17.0), (1.0, "cup", 245.0)],
    "Soy sauce made from soy and wheat (shoyu)": [(1.0, "tbsp", 16.0), (1.0, "tsp", 5.3)],
    "Chocolate, semisweet, chips": [(1.0, "cup", 170.0), (1.0, "tbsp", 10.6)],
    "Cocoa, dry powder, unsweetened": [(1.0, "cup", 86.0), (1.0, "tbsp", 5.4)],
    "Cornstarch": [(1.0, "cup", 128.0), (1.0, "tbsp", 8.0)],
    "Bread crumbs, dry, grated, plain": [(1.0, "cup", 108.0), (1.0, "tbsp", 6.8)],
    "Cheese, parmesan, grated": [(1.0, "cup", 100.0), (1.0, "tbsp", 5.0)],
    "Nuts, almonds, raw": [(1.0, "cup whole", 143.0), (1.0, "tbsp", 8.9)],
    "Nuts, walnuts, english, raw": [(1.0, "cup chopped", 117.0), (1.0, "tbsp", 7.3)],
    "Seeds, sesame seeds, whole, dried": [(1.0, "tbsp", 9.0), (1.0, "tsp", 3.0), (1.0, "cup", 144.0)],
    "Onions, raw": [(1.0, "medium", 110.0), (1.0, "small", 70.0), (1.0, "large", 150.0), (1.0, "cup chopped", 160.0)],
    "Apples, raw, with skin": [(1.0, "medium", 182.0), (1.0, "small", 149.0), (1.0, "large", 223.0), (1.0, "cup sliced", 109.0)],
    "Apples, raw, without skin": [(1.0, "medium", 161.0), (1.0, "cup sliced", 110.0)],
    "Tomatoes, red, ripe, raw, year round average": [(1.0, "medium", 123.0), (1.0, "small", 91.0), (1.0, "large", 182.0), (1.0, "cup chopped", 180.0)],
    "Carrots, raw": [(1.0, "medium", 61.0), (1.0, "small", 50.0), (1.0, "large", 72.0), (1.0, "cup chopped", 128.0)],
    "Potatoes, flesh and skin, raw": [(1.0, "medium", 213.0), (1.0, "small", 170.0), (1.0, "large", 369.0), (1.0, "cup diced", 150.0)],
    "Bananas, raw": [(1.0, "medium", 118.0), (1.0, "small", 101.0), (1.0, "large", 136.0), (1.0, "cup sliced", 150.0)],
    "Lemons, raw, without peel": [(1.0, "medium", 58.0), (1.0, "cup sections", 212.0)],
    "Limes, raw": [(1.0, "medium", 67.0)],
    "Oranges, raw, all commercial varieties": [(1.0, "medium", 131.0), (1.0, "cup sections", 180.0)],
    "Peppers, sweet, green, raw": [(1.0, "medium", 119.0), (1.0, "cup chopped", 149.0)],
    "Peppers, sweet, red, raw": [(1.0, "medium", 119.0), (1.0, "cup chopped", 149.0)],
    "Peppers, jalapeno, raw": [(1.0, "medium", 14.0), (1.0, "cup sliced", 90.0)],
    "Garlic, raw": [(1.0, "clove", 3.0), (1.0, "tsp", 2.8), (1.0, "tbsp", 8.5)],
    "Rice, white, long-grain, regular, raw, unenriched": [(1.0, "cup", 185.0)],
    "Rice, brown, long-grain, raw": [(1.0, "cup", 190.0)],
    "Pasta, dry, unenriched": [(1.0, "cup", 100.0), (2.0, "oz", 57.0)],
    "Cereals, oats, regular and quick, not fortified, dry": [(1.0, "cup", 81.0), (1.0, "tbsp", 5.1)],
}

#: category → [(amount, unit, grams)] defaults for foods without overrides.
_CATEGORY_DEFAULTS: dict[str, list[tuple[float, str, float]]] = {
    F.FAT_SOLID: [(1.0, "pat", 5.0), (1.0, "tbsp", 14.2), (1.0, "cup", 227.0), (1.0, "stick", 113.0)],
    F.OIL: [(1.0, "tbsp", 13.6), (1.0, "cup", 218.0)],
    F.LIQUID: [(1.0, "cup", 244.0), (1.0, "tbsp", 15.2), (1.0, "fl oz", 30.5)],
    F.POWDER: [(1.0, "cup", 120.0), (1.0, "tbsp", 7.5)],
    F.SPICE: [(1.0, "tsp", 2.0), (1.0, "tbsp", 6.0)],
    F.HERB: [(1.0, "tbsp chopped", 3.8), (1.0, "tsp", 1.3), (1.0, "sprigs", 2.0), (1.0, "bunch", 60.0), (1.0, "cup", 40.0)],
    F.PRODUCE: [(1.0, "medium", 100.0), (1.0, "small", 70.0), (1.0, "large", 140.0), (1.0, "cup", 130.0)],
    F.LEGUME: [(1.0, "cup", 192.0), (1.0, "can", 400.0)],
    F.MEAT: [(1.0, "cup", 140.0), (1.0, "oz", 28.35)],
    F.FISH: [(1.0, "cup", 140.0), (1.0, "can", 165.0)],
    F.EGG: [(1.0, "large", 50.0), (1.0, "cup", 243.0)],
    F.DAIRY_SOLID: [(1.0, "cup shredded", 113.0), (1.0, "slice", 28.0), (1.0, "oz", 28.35)],
    F.DAIRY_CREAM: [(1.0, "cup", 230.0), (1.0, "tbsp", 14.4)],
    F.GRAIN: [(1.0, "cup", 185.0)],
    F.BREAD: [(1.0, "slice", 25.0), (1.0, "cup cubes", 35.0)],
    F.CANNED: [(1.0, "can", 305.0), (1.0, "cup", 248.0), (1.0, "tbsp", 15.5)],
    F.CONDIMENT: [(1.0, "tbsp", 15.0), (1.0, "tsp", 5.0), (1.0, "cup", 240.0)],
    F.GARLIC: [(1.0, "clove", 3.0), (1.0, "tsp", 2.8), (1.0, "tbsp", 8.5)],
    F.DISTRACTOR: [(1.0, "cup", 226.0)],
}


def weights_for(food: F.Food) -> list[tuple[int, float, str, float]]:
    """``(seq, amount, raw_unit, grams)`` rows for one food.

    ``raw_unit`` may be messy ('pat (1" sq, 1/3" high)', 'cup chopped',
    'fl oz') — cleaning it is the unit matcher's job, not the table's.
    """
    spec = _OVERRIDES.get(food.description, _CATEGORY_DEFAULTS[food.category])
    rows = []
    for i, (amount, unit, grams) in enumerate(spec):
        rows.append((i + 1, amount, _MESSY_UNIT.get(unit, unit), grams))
    return rows


def all_weight_rows() -> list[tuple[int, int, float, str, float]]:
    """Flattened ``(food_id, seq, amount, unit, grams)`` for every food."""
    out = []
    for food in F.all_foods():
        for seq, amount, unit, grams in weights_for(food):
            out.append((food.food_id, seq, amount, unit, grams))
    return out
