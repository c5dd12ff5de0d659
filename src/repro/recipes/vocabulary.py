"""Ingredient vocabulary linking recipe surface names to gold USDA foods.

Each entry ties a surface ingredient name (what a cook types) to the USDA
description that a *perfect* matcher should select — the "manual match"
the paper's authors produced for their 5,000-ingredient audit. A handful
of region-centric ingredients (garam masala, paneer, ghee, …) have **no**
USDA counterpart, reproducing the paper's observation that its US-centric
composition table leaves ~5.5 % of unique ingredients unmapped.

States are drawn per category; states like ``cooked``/``drained``/
``dried`` deliberately overlap tokens of USDA *variant* descriptions
("Onions, cooked, boiled, drained, without salt"), which is the mechanism
behind imperfect audit accuracy — the matcher picks a plausible variant
whose description fits the state better than the gold raw food, exactly
the "better match available" failure class of §III.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.usda import foods as F
from repro.usda.foods import food_by_description

#: category → (unit choices with sampling weights; None = count/size unit)
UNIT_CHOICES: dict[str, list[tuple[str | None, float]]] = {
    # no count unit: "4 butters" has no per-piece weight on either side
    F.FAT_SOLID: [("cup", 0.3), ("tablespoon", 0.4), ("teaspoon", 0.2), ("stick", 0.1)],
    F.OIL: [("tablespoon", 0.5), ("cup", 0.3), ("teaspoon", 0.2)],
    F.LIQUID: [("cup", 0.6), ("tablespoon", 0.2), ("teaspoon", 0.1), ("milliliter", 0.1)],
    F.POWDER: [("cup", 0.6), ("tablespoon", 0.25), ("teaspoon", 0.15)],
    F.SPICE: [("teaspoon", 0.6), ("tablespoon", 0.25), ("pinch", 0.1), ("dash", 0.05)],
    F.HERB: [("tablespoon", 0.4), ("teaspoon", 0.3), ("sprig", 0.15), ("bunch", 0.1), ("cup", 0.05)],
    F.PRODUCE: [(None, 0.55), ("cup", 0.3), ("pound", 0.1), ("gram", 0.05)],
    F.LEGUME: [("cup", 0.5), ("can", 0.4), ("pound", 0.1)],
    F.MEAT: [("pound", 0.6), ("ounce", 0.2), ("gram", 0.1), ("cup", 0.1)],
    F.FISH: [("pound", 0.4), ("ounce", 0.3), ("can", 0.2), ("cup", 0.1)],
    F.EGG: [(None, 0.9), ("cup", 0.1)],
    F.DAIRY_SOLID: [("cup", 0.5), ("ounce", 0.3), ("slice", 0.2)],
    F.DAIRY_CREAM: [("cup", 0.6), ("tablespoon", 0.4)],
    F.GRAIN: [("cup", 0.8), ("gram", 0.1), ("ounce", 0.1)],
    F.BREAD: [("slice", 0.8), ("cup", 0.2)],
    F.CANNED: [("can", 0.5), ("cup", 0.3), ("tablespoon", 0.2)],
    F.CONDIMENT: [("tablespoon", 0.5), ("teaspoon", 0.3), ("cup", 0.2)],
    F.GARLIC: [("clove", 0.7), ("teaspoon", 0.2), ("tablespoon", 0.1)],
}

#: unit → inclusive quantity range and granularity of plausible amounts.
QTY_CHOICES: dict[str | None, list[float]] = {
    "teaspoon": [0.125, 0.25, 0.5, 0.75, 1, 1.5, 2, 3],
    "tablespoon": [0.5, 1, 1.5, 2, 3, 4],
    "cup": [0.25, 0.33, 0.5, 0.67, 0.75, 1, 1.5, 2, 2.5, 3, 4],
    "stick": [0.5, 1, 1.5, 2],
    "pound": [0.25, 0.5, 0.75, 1, 1.5, 2, 3],
    "ounce": [1, 2, 4, 6, 8, 12, 16],
    "gram": [50, 100, 150, 200, 250, 300, 400, 500],
    "milliliter": [50, 100, 125, 200, 250, 400, 500],
    "can": [1, 2],
    "clove": [1, 2, 3, 4, 5, 6],
    "slice": [1, 2, 3, 4, 6, 8],
    "sprig": [1, 2, 3, 4],
    "bunch": [0.5, 1, 2],
    "pinch": [1, 2],
    "dash": [1, 2, 3],
    None: [1, 2, 3, 4, 5, 6],
}

#: category → plausible STATE surface forms. Entries marked in
#: ``VARIANT_ATTRACTING`` overlap USDA variant descriptions.
STATE_CHOICES: dict[str, list[str]] = {
    F.FAT_SOLID: ["softened", "melted"],
    F.OIL: [],
    F.LIQUID: ["warmed"],
    F.POWDER: ["sifted"],
    F.SPICE: ["ground", "crushed", "toasted"],
    F.HERB: ["chopped", "minced"],
    F.PRODUCE: ["chopped", "diced", "sliced", "minced", "quartered", "halved",
                "peeled", "grated", "shredded", "cooked", "frozen"],
    F.LEGUME: ["drained", "rinsed", "soaked", "cooked"],
    F.MEAT: ["cubed", "diced", "sliced", "shredded", "cooked", "trimmed"],
    F.FISH: ["cooked", "drained", "flaked"],
    F.EGG: ["beaten", "hard-cooked"],
    F.DAIRY_SOLID: ["shredded", "grated", "cubed", "sliced"],
    F.DAIRY_CREAM: ["chilled"],
    F.GRAIN: ["cooked", "rinsed"],
    F.BREAD: ["toasted", "cubed"],
    F.CANNED: ["drained"],
    F.CONDIMENT: [],
    F.GARLIC: ["minced", "crushed", "chopped", "peeled"],
}

#: probability an instance of the category carries a state at all.
STATE_PROB: dict[str, float] = {
    F.PRODUCE: 0.55, F.GARLIC: 0.6, F.MEAT: 0.35, F.HERB: 0.4,
    F.DAIRY_SOLID: 0.45, F.LEGUME: 0.35, F.EGG: 0.25, F.FAT_SOLID: 0.4,
    F.SPICE: 0.3, F.FISH: 0.3, F.CANNED: 0.3, F.BREAD: 0.25,
    F.GRAIN: 0.2, F.POWDER: 0.1, F.DAIRY_CREAM: 0.1, F.LIQUID: 0.05,
    F.OIL: 0.0, F.CONDIMENT: 0.0,
}

#: categories whose count-based instances may carry a SIZE term.
SIZE_CATEGORIES = frozenset({F.PRODUCE, F.EGG})
SIZES = ["small", "medium", "large"]

#: ingredients that may carry a TEMP term.
TEMP_NAMES = frozenset({"water", "milk", "butter", "heavy cream"})
TEMPS = ["cold", "warm", "hot"]


@dataclass(frozen=True)
class Ingredient:
    """One vocabulary entry: surface name → gold USDA food (or None)."""

    name: str
    gold_description: str | None
    category: str
    gold_food_id: int | None
    #: kcal/100 g used for *gold label* accounting when the ingredient has
    #: no USDA food (region-centric items still add real calories).
    offtable_kcal: float = 0.0
    fresh_ok: bool = False
    aliases: tuple[str, ...] = field(default=())


# (surface name, gold USDA description). Category inherited from the food.
_MAPPED: list[tuple[str, str]] = [
    ("butter", "Butter, salted"),
    ("unsalted butter", "Butter, without salt"),
    ("whipped butter", "Butter, whipped, with salt"),
    ("margarine", "Margarine, regular, 80% fat, composite, stick, with salt"),
    ("olive oil", "Oil, olive, salad or cooking"),
    ("vegetable oil", "Oil, vegetable, soybean, refined"),
    ("egg", "Egg, whole, raw, fresh"),
    ("egg white", "Egg, white, raw, fresh"),
    ("egg yolk", "Egg, yolk, raw, fresh"),
    ("milk", "Milk, reduced fat, fluid, 2% milkfat, with added vitamin A and vitamin D"),
    ("whole milk", "Milk, whole, 3.25% milkfat, with added vitamin D"),
    ("skim milk", "Milk, nonfat, fluid, with added vitamin A and vitamin D (fat free or skim)"),
    ("buttermilk", "Milk, buttermilk, fluid, cultured, lowfat"),
    ("buffalo milk", "Milk, indian buffalo, fluid"),
    ("heavy cream", "Cream, fluid, heavy whipping"),
    ("sour cream", "Cream, sour, cultured"),
    ("low-fat sour cream", "Cream, sour, reduced fat, cultured"),
    ("yogurt", "Yogurt, plain, whole milk, 8 grams protein per 8 ounce"),
    ("vanilla yogurt", "Yogurt, vanilla, low fat, 11 grams protein per 8 ounce"),
    ("cheddar cheese", "Cheese, cheddar"),
    ("mozzarella cheese", "Cheese, mozzarella, whole milk"),
    ("blue cheese", "Cheese, blue"),
    ("cottage cheese", "Cheese, cottage, creamed, large or small curd"),
    ("parmesan cheese", "Cheese, parmesan, grated"),
    ("cream cheese", "Cheese, cream"),
    ("all-purpose flour", "Wheat flour, white, all-purpose, enriched, bleached"),
    ("whole wheat flour", "Wheat flour, whole-grain"),
    ("sugar", "Sugars, granulated"),
    ("brown sugar", "Sugars, brown"),
    ("powdered sugar", "Sugars, powdered"),
    ("honey", "Honey"),
    ("molasses", "Molasses"),
    ("salt", "Salt, table"),
    ("black pepper", "Spices, pepper, black"),
    ("cayenne pepper", "Spices, pepper, red or cayenne"),
    ("paprika", "Spices, paprika"),
    ("cumin", "Spices, cumin seed"),
    ("coriander", "Coriander (cilantro) leaves, raw"),
    ("cinnamon", "Spices, cinnamon, ground"),
    ("nutmeg", "Spices, nutmeg, ground"),
    ("oregano", "Spices, oregano, dried"),
    ("chili powder", "Spices, chili powder"),
    ("curry powder", "Spices, curry powder"),
    ("turmeric", "Spices, turmeric, ground"),
    ("basil", "Basil, fresh"),
    ("thyme", "Thyme, fresh"),
    ("rosemary", "Rosemary, fresh"),
    ("parsley", "Parsley, fresh"),
    ("dill weed", "Dill weed, fresh"),
    ("ginger", "Ginger root, raw"),
    ("garlic", "Garlic, raw"),
    ("onion", "Onions, raw"),
    ("green onion", "Onions, spring or scallions (includes tops and bulb), raw"),
    ("shallot", "Shallots, raw"),
    ("leek", "Leeks, (bulb and lower leaf-portion), raw"),
    ("carrot", "Carrots, raw"),
    ("celery", "Celery, raw"),
    ("potato", "Potatoes, flesh and skin, raw"),
    ("sweet potato", "Sweet potato, raw, unprepared"),
    ("tomato", "Tomatoes, red, ripe, raw, year round average"),
    ("roma tomato", "Tomatoes, red, ripe, raw, year round average"),
    ("tomato paste", "Tomato products, canned, paste, without salt added"),
    ("tomato sauce", "Tomato products, canned, sauce"),
    ("tomato soup", "Soup, tomato, canned, condensed"),
    ("bell pepper", "Peppers, sweet, green, raw"),
    ("red bell pepper", "Peppers, sweet, red, raw"),
    ("jalapeno pepper", "Peppers, jalapeno, raw"),
    ("mushroom", "Mushrooms, white, raw"),
    ("spinach", "Spinach, raw"),
    ("lettuce", "Lettuce, iceberg (includes crisphead types), raw"),
    ("cabbage", "Cabbage, raw"),
    ("broccoli", "Broccoli, raw"),
    ("cauliflower", "Cauliflower, raw"),
    ("cucumber", "Cucumber, with peel, raw"),
    ("zucchini", "Squash, summer, zucchini, includes skin, raw"),
    ("green beans", "Beans, snap, green, raw"),
    ("green peas", "Peas, green, raw"),
    ("corn", "Corn, sweet, yellow, raw"),
    ("apple", "Apples, raw, with skin"),
    ("banana", "Bananas, raw"),
    ("lemon", "Lemons, raw, without peel"),
    ("lemon juice", "Lemon juice, raw"),
    ("lime", "Limes, raw"),
    ("orange", "Oranges, raw, all commercial varieties"),
    ("orange juice", "Orange juice, raw"),
    ("raisins", "Raisins, seedless"),
    ("cherries", "Cherries, sour, red, raw"),
    ("strawberries", "Strawberries, raw"),
    ("blueberries", "Blueberries, raw"),
    ("lean ground beef", "Beef, ground, 85% lean meat / 15% fat, raw"),
    ("beef chuck roast", "Beef, chuck, arm pot roast, separable lean and fat, raw"),
    ("chicken breast", "Chicken, broilers or fryers, breast, meat only, raw"),
    ("chicken", "Chicken, broilers or fryers, meat and skin, raw"),
    ("chicken with giblets", "Chicken, broilers or fryers, meat and skin and giblets and neck, raw"),
    ("chicken broth", "Soup, chicken broth, canned, condensed"),
    ("beef broth", "Soup, beef broth, bouillon, canned, ready to serve"),
    ("vegetable broth", "Soup, vegetable broth, ready to serve"),
    ("pork loin", "Pork, fresh, loin, whole, separable lean and fat, raw"),
    ("bacon", "Pork, cured, bacon, raw"),
    ("ham", "Ham, sliced, regular (approximately 11% fat)"),
    ("turkey", "Turkey, whole, meat and skin, raw"),
    ("salmon", "Fish, salmon, Atlantic, farmed, raw"),
    ("tuna", "Fish, tuna, light, canned in water, drained solids"),
    ("shrimp", "Crustaceans, shrimp, mixed species, raw"),
    ("white rice", "Rice, white, long-grain, regular, raw, unenriched"),
    ("brown rice", "Rice, brown, long-grain, raw"),
    ("pasta", "Pasta, dry, unenriched"),
    ("bread", "Bread, white, commercially prepared"),
    ("bread crumbs", "Bread crumbs, dry, grated, plain"),
    ("oats", "Cereals, oats, regular and quick, not fortified, dry"),
    ("cornstarch", "Cornstarch"),
    ("baking powder", "Leavening agents, baking powder, double-acting"),
    ("baking soda", "Leavening agents, baking soda"),
    ("active dry yeast", "Leavening agents, yeast, baker's, active dry"),
    ("vanilla extract", "Vanilla extract"),
    ("chocolate chips", "Chocolate, semisweet, chips"),
    ("cocoa powder", "Cocoa, dry powder, unsweetened"),
    ("peanut butter", "Peanut butter, smooth style, with salt"),
    ("almonds", "Nuts, almonds, raw"),
    ("walnuts", "Nuts, walnuts, english, raw"),
    ("sesame seeds", "Seeds, sesame seeds, whole, dried"),
    ("red lentils", "Lentils, pink or red, raw"),
    ("lentils", "Lentils, raw"),
    ("chickpeas", "Chickpeas (garbanzo beans, bengal gram), mature seeds, raw"),
    ("black beans", "Beans, black, mature seeds, raw"),
    ("kidney beans", "Beans, kidney, red, mature seeds, raw"),
    ("fava beans", "Broadbeans (fava beans), mature seeds, raw"),
    ("tofu", "Tofu, raw, firm, prepared with calcium sulfate"),
    ("soy sauce", "Soy sauce made from soy and wheat (shoyu)"),
    ("white vinegar", "Vinegar, distilled"),
    ("cider vinegar", "Vinegar, cider"),
    ("ketchup", "Ketchup"),
    ("mustard", "Mustard, prepared, yellow"),
    ("mayonnaise", "Salad dressing, mayonnaise, regular"),
    ("water", "Water, bottled, generic"),
    ("red wine", "Alcoholic beverage, wine, table, red"),
    ("white wine", "Alcoholic beverage, wine, table, white"),
]

#: Region-centric ingredients with NO USDA counterpart (zero token overlap
#: with any description) — these stay unmapped, as in the paper (§III).
#: kcal/100 g is used only for gold-label accounting.
_UNMAPPED: list[tuple[str, str, float]] = [
    ("garam masala", F.SPICE, 379.0),
    ("paneer", F.DAIRY_SOLID, 296.0),
    ("ghee", F.FAT_SOLID, 900.0),
    ("asafoetida", F.SPICE, 297.0),
    ("jaggery", F.POWDER, 383.0),
    ("kokum", F.SPICE, 60.0),
]

#: names whose count-unit phrases may say "fresh"/"dried" (DF tag).
_FRESH_OK = frozenset(
    {"basil", "thyme", "rosemary", "parsley", "dill weed", "coriander",
     "ginger", "spinach", "cherries", "strawberries", "blueberries",
     "green beans", "green peas", "mushroom"}
)


def vocabulary() -> list[Ingredient]:
    """Full ingredient vocabulary; deterministic order (sampling relies on it)."""
    by_desc = food_by_description()
    out: list[Ingredient] = []
    for name, desc in _MAPPED:
        food = by_desc[desc]
        out.append(
            Ingredient(
                name=name,
                gold_description=desc,
                category=food.category if food.category != F.DISTRACTOR else F.CANNED,
                gold_food_id=food.food_id,
                offtable_kcal=0.0,
                fresh_ok=name in _FRESH_OK,
            )
        )
    for name, cat, kcal in _UNMAPPED:
        out.append(
            Ingredient(
                name=name,
                gold_description=None,
                category=cat,
                gold_food_id=None,
                offtable_kcal=kcal,
            )
        )
    return out


def unmapped_fraction() -> float:
    """Fraction of vocabulary entries with no USDA food (paper: ~5.5 %)."""
    vocab = vocabulary()
    return sum(1 for v in vocab if v.gold_food_id is None) / len(vocab)
