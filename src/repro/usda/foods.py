"""Synthetic USDA-SR food descriptions and per-100 g nutrient values.

``SEED_FOODS`` starts with the 19 descriptions of the paper's Table II in
the paper's order (``jobs/table2_usda_descriptions.py`` prints exactly that
prefix), followed by the foods required as gold matches / distractors for
Table III and the full recipe vocabulary. ``all_foods()`` appends
programmatic variants (frozen / canned / cooked / babyfood / fast-food
forms) so the database has USDA-like near-duplicate ambiguity at a few
hundred descriptions.

Index order is load order: canonical foods come first, which is exactly
the property heuristic (i) ("take the first match") relies on.

Nutrients are kcal / protein g / fat g / carb g per 100 g, seeded from
public figures for the seed foods; variants get a deterministic
concentration multiplier (cooking/canning changes density, which keeps
wrong-variant matches from being free of calorie error).
"""
from __future__ import annotations

import hashlib
from dataclasses import dataclass
from functools import lru_cache

# Food categories — drive both the weights table and variant expansion.
FAT_SOLID = "fat_solid"
OIL = "oil"
LIQUID = "liquid"          # milk, broth, juice, water, wine
POWDER = "powder"          # flour, sugar, cocoa, starch
SPICE = "spice"            # tsp-scale dry seasonings
HERB = "herb"              # fresh leafy seasonings
PRODUCE = "produce"        # count-based fruit/veg
LEGUME = "legume"
MEAT = "meat"
FISH = "fish"
EGG = "egg"
DAIRY_SOLID = "dairy_solid"  # cheese
DAIRY_CREAM = "dairy_cream"  # sour cream, yogurt, cream
GRAIN = "grain"            # rice, pasta, oats
BREAD = "bread"
CANNED = "canned"          # soups, canned tomato products, canned beans
CONDIMENT = "condiment"    # ketchup, mustard, mayo, soy sauce, honey
GARLIC = "garlic"
DISTRACTOR = "distractor"  # never a gold match; exists to confuse Jaccard


@dataclass(frozen=True)
class Food:
    """One USDA-SR row: 1-based index (= match priority order), the
    comma-separated description string, category, and per-100 g nutrients."""

    food_id: int
    description: str
    category: str
    kcal: float
    protein: float
    fat: float
    carb: float


# (description, category, kcal, protein, fat, carb) per 100 g.
# The first 19 rows are the paper's Table II, in the paper's order.
SEED_FOODS: list[tuple[str, str, float, float, float, float]] = [
    ("Butter, salted", FAT_SOLID, 717, 0.9, 81.1, 0.1),
    ("Butter, whipped, with salt", FAT_SOLID, 717, 0.9, 81.1, 0.1),
    ("Butter, without salt", FAT_SOLID, 717, 0.9, 81.1, 0.1),
    ("Cheese, blue", DAIRY_SOLID, 353, 21.4, 28.7, 2.3),
    ("Cheese, cottage, creamed, large or small curd", DAIRY_SOLID, 98, 11.1, 4.3, 3.4),
    ("Cheese, mozzarella, whole milk", DAIRY_SOLID, 300, 22.2, 22.4, 2.2),
    ("Milk, reduced fat, fluid, 2% milkfat, with added vitamin A and vitamin D",
     LIQUID, 50, 3.3, 2.0, 4.8),
    ("Milk, reduced fat, fluid, 2% milkfat, with added nonfat milk solids and vitamin A and vitamin D",
     LIQUID, 51, 3.5, 1.9, 4.9),
    ("Milk, reduced fat, fluid, 2% milkfat, protein fortified, with added vitamin A and vitamin D",
     LIQUID, 56, 3.9, 1.9, 5.5),
    ("Milk, indian buffalo, fluid", LIQUID, 97, 3.8, 6.9, 5.2),
    ("Milk shakes, thick chocolate", DISTRACTOR, 119, 3.1, 2.7, 21.2),
    ("Milk shakes, thick vanilla", DISTRACTOR, 112, 3.9, 3.0, 17.8),
    ("Yogurt, plain, whole milk, 8 grams protein per 8 ounce", DAIRY_CREAM, 61, 3.5, 3.3, 4.7),
    ("Yogurt, vanilla, low fat, 11 grams protein per 8 ounce", DAIRY_CREAM, 85, 4.9, 1.3, 13.8),
    ("Egg, whole, raw, fresh", EGG, 143, 12.6, 9.5, 0.7),
    ("Egg, white, raw, fresh", EGG, 52, 10.9, 0.2, 0.7),
    ("Egg, yolk, raw, fresh", EGG, 322, 15.9, 26.5, 3.6),
    ("Apples, raw, with skin", PRODUCE, 52, 0.3, 0.2, 13.8),
    ("Apples, raw, without skin", PRODUCE, 48, 0.3, 0.1, 12.8),
    # --- Table III gold matches and distractors -------------------------
    ("Lentils, pink or red, raw", LEGUME, 358, 23.9, 2.2, 63.1),
    ("Cherries, sour, red, raw", PRODUCE, 50, 1.0, 0.3, 12.2),
    ("Tomatoes, red, ripe, raw, year round average", PRODUCE, 18, 0.9, 0.2, 3.9),
    ("Soup, tomato, canned, condensed", CANNED, 62, 1.6, 0.7, 13.6),
    ("Soup, tomato beef with noodle, canned, condensed", DISTRACTOR, 112, 3.6, 3.4, 17.0),
    ("Coriander (cilantro) leaves, raw", HERB, 23, 2.1, 0.5, 3.7),
    ("Spices, coriander leaf, dried", SPICE, 279, 21.9, 4.8, 52.1),
    ("Spices, coriander seed", SPICE, 298, 12.4, 17.8, 55.0),
    ("Tomato products, canned, paste, without salt added", CANNED, 82, 4.3, 0.5, 18.9),
    ("Tomato products, canned, sauce", CANNED, 24, 1.2, 0.3, 5.3),
    ("Soup, vegetable broth, ready to serve", LIQUID, 5, 0.2, 0.1, 0.8),
    ("Soup, vegetable with beef broth, canned, condensed", DISTRACTOR, 66, 2.4, 1.5, 10.7),
    ("Broadbeans (fava beans), mature seeds, raw", LEGUME, 341, 26.1, 1.5, 58.3),
    ("Beans, fava, in pod, raw", LEGUME, 72, 5.6, 0.6, 11.7),
    ("Spices, pepper, red or cayenne", SPICE, 318, 12.0, 17.3, 56.6),
    ("Spices, pepper, black", SPICE, 251, 10.4, 3.3, 63.9),
    ("Chicken, broilers or fryers, meat and skin and giblets and neck, raw",
     MEAT, 213, 18.3, 15.1, 0.1),
    ("Fast foods, quesadilla, with chicken", DISTRACTOR, 259, 13.9, 12.6, 22.2),
    ("Seeds, sesame seeds, whole, dried", SPICE, 573, 17.7, 49.7, 23.4),
    ("Salad dressing, sesame seed dressing, regular", DISTRACTOR, 443, 3.1, 45.2, 8.6),
    # --- remaining recipe-vocabulary gold matches -----------------------
    ("Margarine, regular, 80% fat, composite, stick, with salt", FAT_SOLID, 717, 0.2, 80.5, 0.7),
    ("Oil, olive, salad or cooking", OIL, 884, 0.0, 100.0, 0.0),
    ("Oil, vegetable, soybean, refined", OIL, 884, 0.0, 100.0, 0.0),
    ("Milk, whole, 3.25% milkfat, with added vitamin D", LIQUID, 61, 3.2, 3.3, 4.8),
    ("Milk, nonfat, fluid, with added vitamin A and vitamin D (fat free or skim)",
     LIQUID, 34, 3.4, 0.1, 5.0),
    ("Milk, buttermilk, fluid, cultured, lowfat", LIQUID, 40, 3.3, 0.9, 4.8),
    ("Cream, fluid, heavy whipping", DAIRY_CREAM, 340, 2.8, 36.1, 2.8),
    ("Cream, sour, cultured", DAIRY_CREAM, 198, 2.4, 19.4, 4.6),
    ("Cream, sour, reduced fat, cultured", DAIRY_CREAM, 181, 7.0, 14.1, 7.0),
    ("Cheese, cheddar", DAIRY_SOLID, 403, 24.9, 33.1, 1.3),
    ("Cheese, parmesan, grated", DAIRY_SOLID, 420, 28.4, 27.8, 13.9),
    ("Cheese, cream", DAIRY_SOLID, 342, 5.9, 34.2, 4.1),
    ("Wheat flour, white, all-purpose, enriched, bleached", POWDER, 364, 10.3, 1.0, 76.3),
    ("Wheat flour, whole-grain", POWDER, 340, 13.2, 2.5, 72.0),
    ("Sugars, granulated", POWDER, 387, 0.0, 0.0, 100.0),
    ("Sugars, brown", POWDER, 380, 0.1, 0.0, 98.1),
    ("Sugars, powdered", POWDER, 389, 0.0, 0.0, 99.8),
    ("Honey", CONDIMENT, 304, 0.3, 0.0, 82.4),
    ("Molasses", CONDIMENT, 290, 0.0, 0.1, 74.7),
    ("Salt, table", SPICE, 0, 0.0, 0.0, 0.0),
    ("Spices, paprika", SPICE, 282, 14.1, 12.9, 54.0),
    ("Spices, cumin seed", SPICE, 375, 17.8, 22.3, 44.2),
    ("Spices, cinnamon, ground", SPICE, 247, 4.0, 1.2, 80.6),
    ("Spices, nutmeg, ground", SPICE, 525, 5.8, 36.3, 49.3),
    ("Spices, oregano, dried", SPICE, 265, 9.0, 4.3, 68.9),
    ("Spices, chili powder", SPICE, 282, 13.5, 14.3, 49.7),
    ("Spices, curry powder", SPICE, 325, 14.3, 14.0, 55.8),
    ("Spices, turmeric, ground", SPICE, 312, 9.7, 3.2, 67.1),
    ("Basil, fresh", HERB, 23, 3.2, 0.6, 2.7),
    ("Thyme, fresh", HERB, 101, 5.6, 1.7, 24.5),
    ("Rosemary, fresh", HERB, 131, 3.3, 5.9, 20.7),
    ("Parsley, fresh", HERB, 36, 3.0, 0.8, 6.3),
    ("Dill weed, fresh", HERB, 43, 3.5, 1.1, 7.0),
    ("Ginger root, raw", PRODUCE, 80, 1.8, 0.8, 17.8),
    ("Garlic, raw", GARLIC, 149, 6.4, 0.5, 33.1),
    ("Onions, raw", PRODUCE, 40, 1.1, 0.1, 9.3),
    ("Onions, spring or scallions (includes tops and bulb), raw", PRODUCE, 32, 1.8, 0.2, 7.3),
    ("Shallots, raw", PRODUCE, 72, 2.5, 0.1, 16.8),
    ("Leeks, (bulb and lower leaf-portion), raw", PRODUCE, 61, 1.5, 0.3, 14.2),
    ("Carrots, raw", PRODUCE, 41, 0.9, 0.2, 9.6),
    ("Celery, raw", PRODUCE, 16, 0.7, 0.2, 3.0),
    ("Potatoes, flesh and skin, raw", PRODUCE, 77, 2.0, 0.1, 17.5),
    ("Sweet potato, raw, unprepared", PRODUCE, 86, 1.6, 0.1, 20.1),
    ("Peppers, sweet, green, raw", PRODUCE, 20, 0.9, 0.2, 4.6),
    ("Peppers, sweet, red, raw", PRODUCE, 31, 1.0, 0.3, 6.0),
    ("Peppers, jalapeno, raw", PRODUCE, 29, 0.9, 0.4, 6.5),
    ("Mushrooms, white, raw", PRODUCE, 22, 3.1, 0.3, 3.3),
    ("Spinach, raw", PRODUCE, 23, 2.9, 0.4, 3.6),
    ("Lettuce, iceberg (includes crisphead types), raw", PRODUCE, 14, 0.9, 0.1, 3.0),
    ("Cabbage, raw", PRODUCE, 25, 1.3, 0.1, 5.8),
    ("Broccoli, raw", PRODUCE, 34, 2.8, 0.4, 6.6),
    ("Cauliflower, raw", PRODUCE, 25, 1.9, 0.3, 5.0),
    ("Cucumber, with peel, raw", PRODUCE, 15, 0.7, 0.1, 3.6),
    ("Squash, summer, zucchini, includes skin, raw", PRODUCE, 17, 1.2, 0.3, 3.1),
    ("Beans, snap, green, raw", PRODUCE, 31, 1.8, 0.2, 7.0),
    ("Peas, green, raw", PRODUCE, 81, 5.4, 0.4, 14.5),
    ("Corn, sweet, yellow, raw", PRODUCE, 86, 3.3, 1.4, 18.7),
    ("Bananas, raw", PRODUCE, 89, 1.1, 0.3, 22.8),
    ("Lemons, raw, without peel", PRODUCE, 29, 1.1, 0.3, 9.3),
    ("Lemon juice, raw", LIQUID, 22, 0.4, 0.2, 6.9),
    ("Limes, raw", PRODUCE, 30, 0.7, 0.2, 10.5),
    ("Oranges, raw, all commercial varieties", PRODUCE, 47, 0.9, 0.1, 11.8),
    ("Orange juice, raw", LIQUID, 45, 0.7, 0.2, 10.4),
    ("Raisins, seedless", PRODUCE, 299, 3.1, 0.5, 79.2),
    ("Strawberries, raw", PRODUCE, 32, 0.7, 0.3, 7.7),
    ("Blueberries, raw", PRODUCE, 57, 0.7, 0.3, 14.5),
    ("Beef, ground, 85% lean meat / 15% fat, raw", MEAT, 215, 18.6, 15.0, 0.0),
    ("Beef, chuck, arm pot roast, separable lean and fat, raw", MEAT, 246, 18.2, 18.8, 0.0),
    ("Chicken, broilers or fryers, breast, meat only, raw", MEAT, 120, 22.5, 2.6, 0.0),
    ("Chicken, broilers or fryers, meat and skin, raw", MEAT, 215, 18.6, 15.1, 0.0),
    ("Soup, chicken broth, canned, condensed", LIQUID, 31, 4.4, 1.0, 0.8),
    ("Soup, beef broth, bouillon, canned, ready to serve", LIQUID, 7, 1.1, 0.2, 0.0),
    ("Pork, fresh, loin, whole, separable lean and fat, raw", MEAT, 198, 19.7, 12.6, 0.0),
    ("Pork, cured, bacon, raw", MEAT, 393, 13.3, 37.1, 1.3),
    ("Ham, sliced, regular (approximately 11% fat)", MEAT, 163, 16.6, 8.6, 3.8),
    ("Turkey, whole, meat and skin, raw", MEAT, 144, 19.7, 7.0, 0.1),
    ("Fish, salmon, Atlantic, farmed, raw", FISH, 208, 20.4, 13.4, 0.0),
    ("Fish, tuna, light, canned in water, drained solids", FISH, 86, 19.4, 1.0, 0.0),
    ("Crustaceans, shrimp, mixed species, raw", FISH, 85, 20.1, 0.5, 0.0),
    ("Rice, white, long-grain, regular, raw, unenriched", GRAIN, 365, 7.1, 0.7, 80.0),
    ("Rice, brown, long-grain, raw", GRAIN, 370, 7.9, 2.9, 77.2),
    ("Pasta, dry, unenriched", GRAIN, 371, 13.0, 1.5, 74.7),
    ("Bread, white, commercially prepared", BREAD, 266, 8.9, 3.3, 49.2),
    ("Bread crumbs, dry, grated, plain", POWDER, 395, 13.4, 5.3, 71.9),
    ("Cereals, oats, regular and quick, not fortified, dry", GRAIN, 389, 16.9, 6.9, 66.3),
    ("Cornstarch", POWDER, 381, 0.3, 0.1, 91.3),
    ("Leavening agents, baking powder, double-acting", SPICE, 53, 0.0, 0.0, 27.7),
    ("Leavening agents, baking soda", SPICE, 0, 0.0, 0.0, 0.0),
    ("Leavening agents, yeast, baker's, active dry", SPICE, 325, 40.4, 7.6, 41.2),
    ("Vanilla extract", CONDIMENT, 288, 0.1, 0.1, 12.7),
    ("Chocolate, semisweet, chips", CONDIMENT, 480, 4.2, 30.0, 63.9),
    ("Cocoa, dry powder, unsweetened", POWDER, 228, 19.6, 13.7, 57.9),
    ("Peanut butter, smooth style, with salt", CONDIMENT, 588, 25.1, 50.4, 19.6),
    ("Nuts, almonds, raw", SPICE, 579, 21.2, 49.9, 21.6),
    ("Nuts, walnuts, english, raw", SPICE, 654, 15.2, 65.2, 13.7),
    ("Lentils, raw", LEGUME, 353, 24.6, 1.1, 63.4),
    ("Chickpeas (garbanzo beans, bengal gram), mature seeds, raw", LEGUME, 378, 20.5, 6.0, 63.0),
    ("Beans, black, mature seeds, raw", LEGUME, 341, 21.6, 1.4, 62.4),
    ("Beans, kidney, red, mature seeds, raw", LEGUME, 337, 22.5, 1.1, 61.3),
    ("Tofu, raw, firm, prepared with calcium sulfate", LEGUME, 144, 17.3, 8.7, 2.8),
    ("Soy sauce made from soy and wheat (shoyu)", CONDIMENT, 53, 8.1, 0.6, 4.9),
    ("Vinegar, distilled", CONDIMENT, 18, 0.0, 0.0, 0.0),
    ("Vinegar, cider", CONDIMENT, 21, 0.0, 0.0, 0.9),
    ("Ketchup", CONDIMENT, 101, 1.0, 0.1, 27.4),
    ("Mustard, prepared, yellow", CONDIMENT, 60, 3.7, 3.3, 5.8),
    ("Salad dressing, mayonnaise, regular", CONDIMENT, 680, 1.0, 74.8, 0.6),
    ("Water, bottled, generic", LIQUID, 0, 0.0, 0.0, 0.0),
    ("Alcoholic beverage, wine, table, red", LIQUID, 85, 0.1, 0.0, 2.6),
    ("Alcoholic beverage, wine, table, white", LIQUID, 82, 0.1, 0.0, 2.6),
]


def _variant_multiplier(description: str) -> float:
    """Deterministic nutrient concentration factor for a variant row in
    [0.80, 1.30] — cooked/canned variants are not nutritionally identical
    to the base food, so a wrong-variant match costs calorie accuracy."""
    h = int(hashlib.md5(description.encode()).hexdigest()[:8], 16)
    return 0.80 + (h % 1000) / 1000.0 * 0.50


#: Variant suffix templates per category (applied to the first term of the
#: base description); they create USDA-like near-duplicates.
_VARIANTS: dict[str, list[str]] = {
    PRODUCE: [
        "frozen, unprepared",
        "canned, drained solids",
        "cooked, boiled, drained, without salt",
        "frozen, chopped, boiled, drained, without salt",
    ],
    LEGUME: [
        "mature seeds, cooked, boiled, without salt",
        "mature seeds, canned",
        "mature seeds, canned, drained solids",
    ],
    MEAT: ["cooked, roasted", "cooked, braised", "cooked, diced"],
    FISH: ["cooked, dry heat"],
    GRAIN: ["cooked", "cooked, with salt"],
    DAIRY_SOLID: ["low fat", "shredded"],
    HERB: ["dried"],
}

#: Extra distractor rows appended after all variants — the babyfood /
#: fast-food families that heuristic (h) must out-rank via term priority.
_EXTRA_DISTRACTORS: list[tuple[str, float, float, float, float]] = [
    ("Babyfood, apples, dices, toddler", 51, 0.2, 0.2, 13.0),
    ("Babyfood, bananas, dices, toddler", 79, 1.0, 0.2, 20.2),
    ("Babyfood, carrots, dices, toddler", 30, 0.8, 0.1, 6.4),
    ("Babyfood, green beans, dices, toddler", 29, 1.5, 0.2, 6.0),
    ("Fast foods, cheeseburger, single patty, with condiments", 263, 12.9, 11.8, 27.0),
    ("Fast foods, taco with beef, cheese and lettuce", 226, 8.9, 12.7, 20.0),
    ("Fast foods, english muffin, with egg, cheese, and canadian bacon", 235, 15.3, 9.8, 22.3),
    ("Fast foods, potato, french fried in vegetable oil", 312, 3.4, 15.0, 41.0),
    ("Fast foods, salad, vegetable, tossed, without dressing, with chicken", 50, 8.2, 1.0, 1.8),
    ("Soup, cream of mushroom, canned, condensed", 79, 1.3, 5.3, 6.5),
    ("Soup, cream of chicken, canned, condensed", 90, 2.4, 5.8, 7.1),
    ("Soup, onion, canned, condensed", 45, 3.0, 1.4, 6.5),
    ("Soup, beef noodle, canned, condensed", 67, 3.8, 2.5, 7.2),
    ("Candies, milk chocolate", 535, 7.7, 29.7, 59.4),
    ("Snacks, potato chips, plain, salted", 536, 7.0, 34.6, 52.9),
    ("Pie, apple, commercially prepared, enriched flour", 237, 1.9, 11.0, 34.0),
    ("Pancakes, plain, dry mix, complete, prepared", 194, 5.2, 2.5, 36.7),
    ("Gravy, beef, canned, ready-to-serve", 53, 3.8, 2.4, 4.8),
]


@lru_cache(maxsize=1)
def _all_foods_cached() -> tuple[Food, ...]:
    return tuple(_build_foods())


def all_foods() -> list[Food]:
    """The full synthetic USDA-SR food list, index order = match priority.

    Seeds first (canonical), then per-category variants, then extra
    distractors — mirroring USDA-SR where canonical raw foods carry lower
    NDB numbers than processed/babyfood entries. Cached: callers treat the
    result as immutable.
    """
    return list(_all_foods_cached())


def _build_foods() -> list[Food]:
    rows: list[Food] = []
    for desc, cat, kcal, pro, fat, carb in SEED_FOODS:
        rows.append(Food(len(rows) + 1, desc, cat, kcal, pro, fat, carb))

    variant_rows: list[tuple[str, str, float, float, float, float]] = []
    for desc, cat, kcal, pro, fat, carb in SEED_FOODS:
        first_term = desc.split(",")[0]
        for suffix in _VARIANTS.get(cat, []):
            vdesc = f"{first_term}, {suffix}"
            if any(vdesc == d for d, *_ in SEED_FOODS) or any(
                vdesc == r[0] for r in variant_rows
            ):
                continue
            m = _variant_multiplier(vdesc)
            variant_rows.append(
                (vdesc, cat, kcal * m, pro * m, fat * m, carb * m)
            )
    for desc, cat, kcal, pro, fat, carb in variant_rows:
        rows.append(Food(len(rows) + 1, desc, cat, kcal, pro, fat, carb))
    for desc, kcal, pro, fat, carb in _EXTRA_DISTRACTORS:
        rows.append(Food(len(rows) + 1, desc, DISTRACTOR, kcal, pro, fat, carb))
    return rows


def food_by_description() -> dict[str, Food]:
    """Description → Food lookup (descriptions are unique by construction)."""
    return {f.description: f for f in all_foods()}
