"""Vanilla and modified Jaccard indices — heuristic (e).

The paper's key metric change: USDA descriptions can be long
("Milk, reduced fat, fluid, 2% milkfat, protein fortified, with added
vitamin A and vitamin D"), and the vanilla Jaccard denominator |A∪B|
punishes that length, biasing matches toward short, wrong descriptions
("Milk shakes, thick chocolate"). Since only covering the *ingredient's*
words matters, the modified index divides by |A| instead.
"""
from __future__ import annotations

from typing import AbstractSet


def vanilla_jaccard(a: AbstractSet[str], b: AbstractSet[str]) -> float:
    """J(A,B) = |A∩B| / |A∪B| — biased against long descriptions."""
    if not a and not b:
        return 0.0
    return len(a & b) / len(a | b)


def modified_jaccard(
    a: AbstractSet[str], b: AbstractSet[str], *, raw_bonus: bool = False
) -> float:
    """J*(A,B) = |A∩B| / |A| (+ the heuristic-(g) 'raw' bonus).

    ``raw_bonus`` adds one matched word when the description contains
    "raw" and the ingredient carries no STATE — the score may then exceed
    1.0, which is fine: it is a ranking key, not a probability.
    """
    if not a:
        return 0.0
    inter = len(a & b)
    if raw_bonus and "raw" in b:
        inter += 1
    return inter / len(a)
