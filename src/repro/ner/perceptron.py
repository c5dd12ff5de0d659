"""Averaged perceptron for multi-class token classification (Collins 2002).

Sparse feature weights live in ``dict[feature][class] -> float``. The
*averaged* variant returns the mean of all intermediate weight vectors,
which regularizes the otherwise high-variance perceptron — the standard
trick that makes perceptron taggers competitive with CRFs on supervised
sequence tasks of this size.
"""
from __future__ import annotations

import random
from collections import defaultdict


class AveragedPerceptron:
    """Sparse multi-class averaged perceptron."""

    def __init__(self, classes: list[str]) -> None:
        self.classes = list(classes)
        self.weights: dict[str, dict[str, float]] = {}
        # accumulators for averaging: total += weight * (i - last_update)
        self._totals: dict[tuple[str, str], float] = defaultdict(float)
        self._tstamps: dict[tuple[str, str], int] = defaultdict(int)
        self._i = 0

    def score(self, features: list[str]) -> dict[str, float]:
        scores = dict.fromkeys(self.classes, 0.0)
        for f in features:
            if f in self.weights:
                for cls, w in self.weights[f].items():
                    scores[cls] += w
        return scores

    def predict(self, features: list[str]) -> str:
        scores = self.score(features)
        # deterministic argmax: break ties by class order
        return max(self.classes, key=lambda c: (scores[c], -self.classes.index(c)))

    def update(self, truth: str, guess: str, features: list[str]) -> None:
        self._i += 1
        if truth == guess:
            return
        for f in features:
            w = self.weights.setdefault(f, {})
            self._upd(f, truth, w.get(truth, 0.0), +1.0)
            self._upd(f, guess, w.get(guess, 0.0), -1.0)

    def _upd(self, f: str, cls: str, cur: float, delta: float) -> None:
        key = (f, cls)
        self._totals[key] += (self._i - self._tstamps[key]) * cur
        self._tstamps[key] = self._i
        self.weights[f][cls] = cur + delta

    def average(self) -> None:
        """Replace weights by their running average (call once, after training)."""
        for f, per_cls in self.weights.items():
            for cls, w in per_cls.items():
                key = (f, cls)
                total = self._totals[key] + (self._i - self._tstamps[key]) * w
                per_cls[cls] = round(total / max(1, self._i), 6)
        self._totals.clear()
        self._tstamps.clear()

    def prune(self, epsilon: float = 1e-6) -> None:
        """Drop ~zero weights — keeps the broadcast model small."""
        for f in list(self.weights):
            kept = {c: w for c, w in self.weights[f].items() if abs(w) > epsilon}
            if kept:
                self.weights[f] = kept
            else:
                del self.weights[f]


def shuffled(items: list, rng: random.Random) -> list:
    out = list(items)
    rng.shuffle(out)
    return out
