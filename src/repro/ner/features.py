"""Feature extraction for the perceptron NER.

Feature classes mirror what a CRF NER of the Stanford family consumes:
token identity, orthographic shape (digits, fractions, hyphenation,
suffixes), a *unit gazetteer* (measure words are a closed class), and a
context window of neighbouring tokens plus the previously predicted tag
(which gives the greedy decoder its structured component).

Deliberately NOT included: gazetteers of ingredient names or states —
the model must learn those from data, or the paper's F1 would be
meaningless here.
"""
from __future__ import annotations

import re

_NUM_RE = re.compile(r"^\d+([/.\-]\d+)*$")
_HAS_DIGIT_RE = re.compile(r"\d")

#: measure-word gazetteer (closed class; includes aliases and plurals).
UNIT_GAZETTEER = frozenset(
    {
        "cup", "cups", "teaspoon", "teaspoons", "tsp", "tablespoon",
        "tablespoons", "tbsp", "pound", "pounds", "lb", "lbs", "ounce",
        "ounces", "oz", "gram", "grams", "g", "kg", "ml", "l", "liter",
        "litre", "pint", "pints", "quart", "quarts", "gallon", "gallons",
        "pinch", "pinches", "dash", "dashes", "clove", "cloves", "slice",
        "slices", "can", "cans", "package", "packages", "pkg", "stick",
        "sticks", "bunch", "bunches", "sprig", "sprigs", "stalk", "stalks",
        "head", "heads", "pat", "pats",
    }
)

_SIZE_WORDS = frozenset({"small", "medium", "large"})
_TEMP_WORDS = frozenset({"cold", "warm", "hot", "chilled", "frozen"})
_DF_WORDS = frozenset({"fresh", "dried", "dry"})


def token_features(tokens: list[str], i: int, prev_tag: str) -> list[str]:
    """Feature strings for position ``i`` given the previous predicted tag."""
    tok = tokens[i]
    low = tok.lower()
    prev = tokens[i - 1].lower() if i > 0 else "<s>"
    nxt = tokens[i + 1].lower() if i + 1 < len(tokens) else "</s>"
    feats = [
        f"w={low}",
        f"prev_w={prev}",
        f"next_w={nxt}",
        f"prev_tag={prev_tag}",
        f"prev_tag+w={prev_tag}|{low}",
        f"suf3={low[-3:]}",
        f"pos={'first' if i == 0 else 'last' if i == len(tokens) - 1 else 'mid'}",
    ]
    if _NUM_RE.match(tok):
        feats.append("shape=number")
    elif _HAS_DIGIT_RE.search(tok):
        feats.append("shape=hasdigit")
    if "-" in tok:
        feats.append("shape=hyphen")
    if not any(c.isalnum() for c in tok):
        feats.append("shape=punct")
    if low in UNIT_GAZETTEER:
        feats.append("gaz=unit")
    if low in _SIZE_WORDS:
        feats.append("gaz=size")
    if low in _TEMP_WORDS:
        feats.append("gaz=temp")
    if low in _DF_WORDS:
        feats.append("gaz=df")
    if low.endswith("ed"):
        feats.append("shape=participle")
    if low.endswith("ly"):
        feats.append("shape=adverb")
    return feats
