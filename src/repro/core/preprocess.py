"""Word-set construction for the string matcher — heuristics (b), (d), (f).

Both sides of the match become *sets of lemmatized, stop-word-free,
lower-case words* with negations normalized to ``not`` + base:

- the ingredient side A: NAME plus the STATE / TEMP / DF entities the NER
  extracted (heuristic (d): later description terms tend to match state/
  temperature/freshness, so those entities join the match string);
- the description side B: every comma-separated term, each word keeping
  the 1-based index of its term — the "sequence number (priority)" of
  heuristic (h). B also records whether it contains ``raw`` (heuristic
  (g): ``raw`` may match an implicit uncooked state).
"""
from __future__ import annotations

from repro.text.lemmatizer import lemmatize
from repro.text.negation import normalize_negations
from repro.text.tokenize import STOPWORDS, tokenize


def _normalize(words: list[str]) -> list[str]:
    return [
        lemmatize(w)
        for w in normalize_negations(words)
        if w not in STOPWORDS
    ]


def phrase_word_set(
    name: str | None,
    state: str | None = None,
    temp: str | None = None,
    df: str | None = None,
) -> tuple[frozenset[str], bool]:
    """Ingredient-side set A and whether a STATE entity was present.

    >>> phrase_word_set("unsalted butter")
    (frozenset({'not', 'salt', 'butter'}), False)
    """
    parts = [p for p in (name, state, temp, df) if p]
    words = _normalize(tokenize(" ".join(parts)))
    return frozenset(words), state is not None


def description_word_priorities(description: str) -> dict[str, int]:
    """Description-side word → best (lowest) term priority, 1-based.

    >>> description_word_priorities("Apples, raw, with skin")
    {'apple': 1, 'raw': 2, 'skin': 3}
    """
    out: dict[str, int] = {}
    for i, term in enumerate(description.split(","), start=1):
        for w in _normalize(tokenize(term)):
            if w not in out or out[w] > i:
                out[w] = i
    return out


def description_word_set(description: str) -> frozenset[str]:
    """Description-side set B (priorities dropped)."""
    return frozenset(description_word_priorities(description))


def description_has_raw(description: str) -> bool:
    """Heuristic (g): does the description carry the implicit-state 'raw'?"""
    return "raw" in description_word_set(description)
