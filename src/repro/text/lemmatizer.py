"""Rule-based English noun lemmatizer.

Stands in for NLTK's WordNet lemmatizer (paper heuristic (b)): USDA
descriptions mix singular and plural food nouns ("Apples, raw" vs
"1 apple"), so both sides of the match are normalized to singular before
set comparison. The paper rejects stemmers as too aggressive; this
lemmatizer is conservative the same way — an ordered irregular table first,
then suffix rules that only fire on safe patterns, and an exception list
for lemma-looking words ("molasses", "couscous") that a naive ``-s`` rule
would mangle.

The same function is applied to the synthetic-data generator's surface
forms and to the matcher, so generator and pipeline can never drift apart
on inflection.
"""
from __future__ import annotations

from functools import lru_cache

#: Irregular plural → singular, food-domain heavy.
_IRREGULAR: dict[str, str] = {
    "leaves": "leaf",
    "halves": "half",
    "loaves": "loaf",
    "knives": "knife",
    "wives": "wife",
    "calves": "calf",
    "shelves": "shelf",
    "children": "child",
    "geese": "goose",
    "feet": "foot",
    "teeth": "tooth",
    "mice": "mouse",
    "men": "man",
    "women": "woman",
}

#: Words that end in ``s`` (or other plural-looking suffixes) but are
#: already lemmas — the suffix rules must not touch them.
_NO_STRIP: frozenset[str] = frozenset(
    {
        "molasses", "couscous", "hummus", "asparagus", "citrus",
        "swiss", "brussels", "grits", "watercress", "cress",
        "gas", "bass", "is", "as", "less", "seedless", "boneless",
        "skinless", "lemongrass",
    }
)

_VOWELS = "aeiou"


@lru_cache(maxsize=65536)
def lemmatize(word: str) -> str:
    """Return the singular noun lemma of a lower-case ``word``.

    >>> [lemmatize(w) for w in ("apples", "tomatoes", "berries", "leaves")]
    ['apple', 'tomato', 'berry', 'leaf']
    >>> [lemmatize(w) for w in ("molasses", "swiss", "butter")]
    ['molasses', 'swiss', 'butter']
    """
    w = word.lower()
    if w in _IRREGULAR:
        return _IRREGULAR[w]
    if w in _NO_STRIP or len(w) <= 3:
        return w
    if w.endswith("ies") and len(w) > 4:
        return w[:-3] + "y"  # berries -> berry
    if w.endswith("oes") and len(w) > 4:
        return w[:-2]  # tomatoes -> tomato
    if w.endswith(("ches", "shes", "xes", "zes", "sses")):
        return w[:-2]  # peaches -> peach, radishes -> radish
    if w.endswith("ss") or w.endswith("us") or w.endswith("is"):
        return w  # cress, hummus, debris-like
    if w.endswith("s") and w[-2] not in "s'":
        # apples -> apple, lentils -> lentil, eggs -> egg
        return w[:-1]
    return w


def lemmatize_words(words: list[str]) -> list[str]:
    """Vectorized convenience wrapper over :func:`lemmatize`."""
    return [lemmatize(w) for w in words]
