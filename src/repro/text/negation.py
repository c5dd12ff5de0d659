"""Negation normalization — paper heuristic (f).

"unsalted butter" must match "Butter, without salt". Both sides are
rewritten so every negation surface form becomes the literal token
``not`` followed by the negated base word:

- standalone negators: ``without`` / ``no`` / ``non`` / ``free`` → ``not``
- ``un``-prefixed adjectives: ``unsalted`` → ``not salt`` (prefix stripped,
  participle suffix removed, base lemmatized)
- hyphen-fused forms arrive already split by the tokenizer
  (``fat-free`` → ``fat free`` → ``fat not``; order is irrelevant because
  the matcher compares *sets*).

The rewrite runs *before* stop-word removal and lemmatization of the
remaining tokens, and identically on ingredient phrases and USDA
descriptions, so "not salt butter" vs "butter not salt" become equal sets.
"""
from __future__ import annotations

from repro.text.lemmatizer import lemmatize

#: Tokens that negate the following (or preceding, for "free") term.
NEGATION_TOKENS: frozenset[str] = frozenset({"without", "no", "non", "free"})

#: ``un``-prefixed words that are genuine negations in the food domain.
#: A blanket ``un-`` rule would corrupt words like "under" or "union";
#: the paper's replacement is likewise targeted at negation prefixes.
_UN_WHITELIST: frozenset[str] = frozenset(
    {
        "unsalted", "unsweetened", "uncooked", "unbleached", "unflavored",
        "unflavoured", "unseasoned", "unpeeled", "unripe", "unenriched",
        "undrained", "unfortified",
    }
)

_PARTICIPLE_SUFFIXES = ("ened", "ed")


def _strip_un(word: str) -> str:
    """``unsalted`` → ``salt``; ``unsweetened`` → ``sweet``."""
    base = word[2:]
    for suf in _PARTICIPLE_SUFFIXES:
        if base.endswith(suf) and len(base) > len(suf) + 2:
            return base[: -len(suf)]
    return base


def normalize_negations(tokens: list[str]) -> list[str]:
    """Rewrite negation surface forms in a token list to ``not`` + base.

    >>> normalize_negations(["unsalted", "butter"])
    ['not', 'salt', 'butter']
    >>> normalize_negations(["butter", "without", "salt"])
    ['butter', 'not', 'salt']
    """
    out: list[str] = []
    for tok in tokens:
        if tok in NEGATION_TOKENS:
            out.append("not")
        elif tok in _UN_WHITELIST:
            out.append("not")
            out.append(lemmatize(_strip_un(tok)))
        else:
            out.append(tok)
    return out
