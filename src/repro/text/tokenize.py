"""Tokenization and stop-word filtering for ingredient phrases and
USDA-SR food descriptions.

The matcher (paper §II-B) compares *sets of words* built by "lemmatization,
stop-word removal and uniform casing"; this module provides the word
extraction and the stop-word list. Tokens are lower-cased alphabetic runs —
the description side's punctuation (commas, parentheses, ``%``) and the
phrase side's quantities are deliberately dropped, matching the paper's
preprocessing where only content words participate in the Jaccard sets.
"""
from __future__ import annotations

import re

_WORD_RE = re.compile(r"[a-z]+")

#: Stop words seen in USDA descriptions and ingredient phrases. Kept small
#: and domain-specific on purpose: words like "with"/"added"/"or" carry no
#: matching signal, but food words ("milk", "fat") must never be dropped.
#: "not" is intentionally absent — negation normalization rewrites
#: "without"/"un-" to "not" and the matcher must keep it (heuristic (f)).
STOPWORDS: frozenset[str] = frozenset(
    {
        "a", "an", "and", "as", "at", "by", "for", "from", "in", "into",
        "of", "on", "or", "per", "the", "to", "with", "added",
    }
)


def tokenize(text: str) -> list[str]:
    """Lower-case ``text`` and return its alphabetic word tokens.

    >>> tokenize("Milk, reduced fat, fluid, 2% milkfat")
    ['milk', 'reduced', 'fat', 'fluid', 'milkfat']
    """
    return _WORD_RE.findall(text.lower())


def content_words(text: str) -> list[str]:
    """Tokenize and drop stop words (order preserved, duplicates kept)."""
    return [w for w in tokenize(text) if w not in STOPWORDS]
