"""Render structured ingredient ground truth into noisy surface phrases.

The renderer is the synthetic stand-in for both RecipeDB's scraped phrase
strings *and* the paper's manual annotation effort: every phrase comes
with token-level gold tags (NAME/STATE/QUANTITY/UNIT/TEMP/DF/SIZE/O) that
align with :func:`ner_tokenize` of the rendered string.

Noise families rendered (each one named in the paper):

- unit aliases: "tbsp"/"tablespoon", "lb"/"pound", bare "g";
- fraction/mixed/range quantities: "1/2", "2 1/2", "2-4";
- "or" ingredient alternatives: "3/4 cup butter or 3/4 cup margarine";
- dual-unit statements: "500 g or 1 cup";
- adverbs and glued commas: ", finely chopped", ",minced";
- unit-less counts ("2 eggs", "1 small onion") and "to taste" phrases.
"""
from __future__ import annotations

import random
from dataclasses import dataclass

from repro.recipes import vocabulary as V

TAG_NAME = "NAME"
TAG_STATE = "STATE"
TAG_QTY = "QUANTITY"
TAG_UNIT = "UNIT"
TAG_TEMP = "TEMP"
TAG_DF = "DF"
TAG_SIZE = "SIZE"
TAG_O = "O"

ALL_TAGS = (TAG_NAME, TAG_STATE, TAG_QTY, TAG_UNIT, TAG_TEMP, TAG_DF, TAG_SIZE, TAG_O)

#: canonical unit → surface alias choices (singular, plural).
_UNIT_SURFACES: dict[str, list[tuple[str, str]]] = {
    "teaspoon": [("teaspoon", "teaspoons"), ("tsp", "tsp")],
    "tablespoon": [("tablespoon", "tablespoons"), ("tbsp", "tbsp")],
    "cup": [("cup", "cups")],
    "pound": [("pound", "pounds"), ("lb", "lbs")],
    "ounce": [("ounce", "ounces"), ("oz", "oz")],
    "gram": [("g", "g"), ("gram", "grams")],
    "milliliter": [("ml", "ml")],
    "stick": [("stick", "sticks")],
    "can": [("can", "cans")],
    "clove": [("clove", "cloves")],
    "slice": [("slice", "slices")],
    "sprig": [("sprig", "sprigs")],
    "bunch": [("bunch", "bunches")],
    "pinch": [("pinch", "pinches")],
    "dash": [("dash", "dashes")],
}

_FRACTION_SURFACE = {
    0.125: "1/8", 0.25: "1/4", 0.33: "1/3", 0.5: "1/2",
    0.67: "2/3", 0.75: "3/4",
}

_ADVERBS = ["finely", "freshly", "coarsely", "thinly", "roughly"]

#: O-tagged prefix modifiers — words an annotator leaves out of NAME but
#: that sit right where NAME starts, the main source of NER confusion.
_PREFIX_MODIFIERS = [
    ["organic"], ["homemade"], ["light"], ["good", "quality"],
    ["low", "sodium"], ["reduced", "fat"], ["store-bought"],
]

#: O-tagged trailing notes ("divided", "optional", "at room temperature").
_TRAILING_NOTES = [
    [",", "divided"],
    [",", "plus", "more", "for", "garnish"],
    ["(", "optional", ")"],
    [",", "at", "room", "temperature"],
    [",", "to", "serve"],
    [",", "or", "to", "taste"],
]


def pluralize(word: str) -> str:
    """Inverse of the lemmatizer for rendering counts ("2 eggs")."""
    if word.endswith("y") and len(word) > 2 and word[-2] not in "aeiou":
        return word[:-1] + "ies"
    if word.endswith(("ch", "sh", "s", "x", "z", "o")):
        return word + "es"
    return word + "s"


def ner_tokenize(phrase: str) -> list[str]:
    """Whitespace tokenization with punctuation split off token edges.

    Commas split wherever they occur ("pepper,minced" → 3 tokens); inner
    hyphens survive ("hard-cooked" is one token); other punctuation comes
    off token edges — so gold tags align however the renderer spaced its
    punctuation.
    """
    out: list[str] = []
    for chunk in phrase.replace(",", " , ").split():
        while chunk and chunk[0] in ",.;:()":
            out.append(chunk[0])
            chunk = chunk[1:]
        trail: list[str] = []
        while chunk and chunk[-1] in ",.;:()":
            trail.append(chunk[-1])
            chunk = chunk[:-1]
        if chunk:
            out.append(chunk)
        out.extend(reversed(trail))
    return out


@dataclass
class RenderedIngredient:
    """One phrase plus its complete ground truth."""

    phrase: str
    tokens: list[str]
    tags: list[str]
    name: str
    state: str | None
    qty: float | None
    unit: str | None          # canonical unit name, None for counts
    size: str | None
    temp: str | None
    df: str | None
    gold_food_id: int | None
    gold_grams: float | None
    gold_kcal: float


def _qty_tokens(qty: float, rng: random.Random) -> tuple[list[str], float]:
    """Surface tokens for a quantity; returns (tokens, effective value).

    Integers occasionally render as ranges ("2-4"), whose effective gold
    value is the paper's average.
    """
    if qty in _FRACTION_SURFACE:
        return [_FRACTION_SURFACE[qty]], qty
    if qty == int(qty):
        q = int(qty)
        if q >= 1 and rng.random() < 0.05:
            return [f"{q}-{q + 2}"], float(q + 1)
        return [str(q)], float(qty)
    whole = int(qty)
    frac = round(qty - whole, 3)
    if frac in _FRACTION_SURFACE:
        if rng.random() < 0.3:
            return [str(qty)], qty
        return [str(whole), _FRACTION_SURFACE[frac]], qty
    return [str(qty)], qty


def _unit_tokens(unit: str, qty: float, rng: random.Random) -> list[str]:
    sing, plur = rng.choice(_UNIT_SURFACES[unit])
    return [plur if qty > 1 else sing]


def _weight_rows(ing: V.Ingredient):
    """Weight rows for gold gram resolution — the food's own rows, or the
    category defaults for unmapped (region-centric) ingredients."""
    from repro.usda.foods import all_foods
    from repro.usda.weights import _CATEGORY_DEFAULTS, weights_for

    if ing.gold_food_id is not None:
        food = all_foods()[ing.gold_food_id - 1]
        return weights_for(food)
    spec = _CATEGORY_DEFAULTS[ing.category]
    return [(i + 1, a, u, g) for i, (a, u, g) in enumerate(spec)]


def _kcal_per_100g(ing: V.Ingredient) -> float:
    from repro.usda.foods import all_foods

    if ing.gold_food_id is not None:
        return all_foods()[ing.gold_food_id - 1].kcal
    return ing.offtable_kcal


def render_ingredient(
    ing: V.Ingredient, rng: random.Random, vocab: list[V.Ingredient]
) -> RenderedIngredient:
    """Sample a ground-truth instance of ``ing`` and render its phrase."""
    from repro.core.units import grams_per_unit_py

    cat = ing.category
    units = V.UNIT_CHOICES.get(cat, [("teaspoon", 1.0)])
    unit = rng.choices([u for u, _ in units], weights=[w for _, w in units])[0]
    to_taste = (
        cat in (V.F.SPICE,) and unit in ("teaspoon", "pinch", "dash")
        and rng.random() < 0.03
    )
    qty = None if to_taste else float(rng.choice(V.QTY_CHOICES[unit]))

    states = V.STATE_CHOICES.get(cat, [])
    state = (
        rng.choice(states)
        if states and rng.random() < V.STATE_PROB.get(cat, 0.2)
        else None
    )
    size = (
        rng.choice(V.SIZES)
        if unit is None and cat in V.SIZE_CATEGORIES and rng.random() < 0.5
        else None
    )
    temp = (
        rng.choice(V.TEMPS)
        if ing.name in V.TEMP_NAMES and rng.random() < 0.25
        else None
    )
    df = (
        rng.choice(["fresh", "dried"]) if ing.fresh_ok and rng.random() < 0.35
        else None
    )

    pairs: list[tuple[str, str]] = []  # (token, tag)
    eff_qty = qty
    if qty is not None:
        qtoks, eff_qty = _qty_tokens(qty, rng)
        pairs += [(t, TAG_QTY) for t in qtoks]
        if unit is not None:
            pairs += [(t, TAG_UNIT) for t in _unit_tokens(unit, eff_qty, rng)]
            # dual-unit noise: "500 g or 1 cup"
            if unit == "gram" and rng.random() < 0.3:
                pairs += [("or", TAG_O), ("1", TAG_O), ("cup", TAG_O)]
    if size is not None:
        pairs.append((size, TAG_SIZE))
    if temp is not None:
        pairs.append((temp, TAG_TEMP))
    if df is not None:
        pairs.append((df, TAG_DF))

    # pre-name state variant: "1 cup finely chopped onion" (no comma)
    state_pre = state is not None and rng.random() < 0.35
    if rng.random() < 0.12:
        pairs += [(t, TAG_O) for t in rng.choice(_PREFIX_MODIFIERS)]
    if state_pre:
        if rng.random() < 0.3:
            pairs.append((rng.choice(_ADVERBS), TAG_O))
        pairs += [(t, TAG_STATE) for t in state.split(" ")]

    name_surface = ing.name
    if unit is None and eff_qty is not None and eff_qty > 1 and not name_surface.endswith("s"):
        parts = name_surface.split(" ")
        parts[-1] = pluralize(parts[-1])
        name_surface = " ".join(parts)
    pairs += [(t, TAG_NAME) for t in name_surface.split(" ")]

    # "or" alternative ingredient branch (whole branch is O — the paper's
    # NER keeps only the first alternative).
    if cat in (V.F.FAT_SOLID, V.F.DAIRY_CREAM, V.F.OIL) and rng.random() < 0.06:
        alts = [v for v in vocab if v.category == cat and v.name != ing.name]
        if alts:
            alt = rng.choice(alts)
            pairs.append(("or", TAG_O))
            if qty is not None:
                qtoks, _ = _qty_tokens(qty, rng)
                pairs += [(t, TAG_O) for t in qtoks]
                if unit is not None:
                    pairs += [(t, TAG_O) for t in _unit_tokens(unit, eff_qty or 1, rng)]
            pairs += [(t, TAG_O) for t in alt.name.split(" ")]

    if state is not None and not state_pre:
        pairs.append((",", TAG_O))
        if rng.random() < 0.4:
            pairs.append((rng.choice(_ADVERBS), TAG_O))
        pairs += [(t, TAG_STATE) for t in state.split(" ")]
    if to_taste:
        pairs += [("to", TAG_O), ("taste", TAG_O)]
    elif rng.random() < 0.12:
        pairs += [(t, TAG_O) for t in rng.choice(_TRAILING_NOTES)]

    phrase = _render_with_spacing(pairs, rng)
    tokens = ner_tokenize(phrase)
    tags = [tag for _, tag in pairs]
    assert len(tokens) == len(tags), (phrase, tokens, [p for p in pairs])

    rows = _weight_rows(ing)
    gpu = grams_per_unit_py(unit, size, rows) if eff_qty is not None else None
    if to_taste:
        gpu = None
    grams = eff_qty * gpu if (eff_qty is not None and gpu is not None) else None
    kcal = (grams or 0.0) * _kcal_per_100g(ing) / 100.0

    return RenderedIngredient(
        phrase=phrase,
        tokens=tokens,
        tags=tags,
        name=ing.name,
        state=state,
        qty=eff_qty,
        unit=unit,
        size=size,
        temp=temp,
        df=df,
        gold_food_id=ing.gold_food_id,
        gold_grams=grams,
        gold_kcal=kcal,
    )


def _render_with_spacing(pairs: list[tuple[str, str]], rng: random.Random) -> str:
    """Join tokens, occasionally gluing a comma to ONE neighbour
    (",minced" or "salt ,") — never both, so :func:`ner_tokenize` can
    always split the punctuation back off a token edge."""
    out = ""
    force_space = False
    for i, (tok, _) in enumerate(pairs):
        if i == 0:
            out = tok
        elif tok == ",":
            if rng.random() < 0.25:
                out += ","  # glued to previous: "salt,"
                force_space = True
            else:
                out += " ,"
                force_space = False
        elif out.endswith(",") and not force_space and rng.random() < 0.5:
            out += tok  # glued to comma: " ,minced"
            force_space = False
        else:
            out += " " + tok
            force_space = False
    return out
