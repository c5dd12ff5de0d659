"""Coarse POS tagger for ingredient phrases.

The paper (§II-A) builds a *POS-tag frequency vector* per ingredient
phrase and clusters those vectors to pick a diverse train/test corpus for
the NER model. Only the coarse distribution matters for clustering, so a
lexicon + suffix-heuristic tagger is sufficient (and deterministic, which
the corpus selection needs).

Tag set: ``NUM`` (quantities, fractions), ``UNIT`` (measure nouns),
``ADJ`` (sizes, freshness, colors), ``VBN`` (participial states:
chopped, softened), ``ADV`` (-ly manner), ``CC``/``IN``/``DT`` closed
classes, ``PUNCT``, ``NOUN`` (default — food words).
"""
from __future__ import annotations

import re

_NUM_RE = re.compile(r"^\d+([/.-]\d+)*$")

_UNIT_LEXICON = frozenset(
    {
        "cup", "cups", "teaspoon", "teaspoons", "tsp", "tablespoon",
        "tablespoons", "tbsp", "pound", "pounds", "lb", "lbs", "ounce",
        "ounces", "oz", "gram", "grams", "g", "kg", "kilogram", "ml",
        "milliliter", "liter", "litre", "l", "pint", "pints", "quart",
        "quarts", "gallon", "gallons", "pinch", "dash", "clove", "cloves",
        "slice", "slices", "can", "cans", "package", "packages", "pkg",
        "stick", "sticks", "bunch", "sprig", "sprigs", "stalk", "stalks",
        "head", "heads", "pat",
    }
)

_ADJ_LEXICON = frozenset(
    {
        "small", "medium", "large", "big", "fresh", "dry", "dried",
        "cold", "hot", "warm", "lean", "fat", "low", "whole", "black",
        "white", "red", "green", "sour", "sweet", "raw", "ripe", "thick",
        "thin", "fine", "coarse", "extra", "light", "dark", "plain",
    }
)

_CC = frozenset({"or", "and", "plus"})
_IN = frozenset({"of", "with", "without", "in", "into", "for", "from", "at", "per", "to"})
_DT = frozenset({"a", "an", "the"})


def pos_tag(tokens: list[str]) -> list[str]:
    """Tag each token with a coarse POS category.

    >>> pos_tag(["1", "small", "onion", ",", "finely", "chopped"])
    ['NUM', 'ADJ', 'NOUN', 'PUNCT', 'ADV', 'VBN']
    """
    tags: list[str] = []
    for tok in tokens:
        t = tok.lower()
        if _NUM_RE.match(t):
            tags.append("NUM")
        elif not any(c.isalnum() for c in t):
            tags.append("PUNCT")
        elif t in _UNIT_LEXICON:
            tags.append("UNIT")
        elif t in _CC:
            tags.append("CC")
        elif t in _IN:
            tags.append("IN")
        elif t in _DT:
            tags.append("DT")
        elif t in _ADJ_LEXICON:
            tags.append("ADJ")
        elif t.endswith("ly"):
            tags.append("ADV")
        elif t.endswith(("ed", "en")) and len(t) > 4:
            tags.append("VBN")
        else:
            tags.append("NOUN")
    return tags


#: Fixed tag order for POS-frequency vectors (clustering features).
POS_TAGS: tuple[str, ...] = (
    "NUM", "UNIT", "ADJ", "VBN", "ADV", "CC", "IN", "DT", "PUNCT", "NOUN",
)


def pos_frequency_vector(tokens: list[str]) -> list[float]:
    """Frequency of each POS tag in the phrase (paper §II-A's phrase vector)."""
    tags = pos_tag(tokens)
    return [float(sum(1 for t in tags if t == name)) for name in POS_TAGS]
