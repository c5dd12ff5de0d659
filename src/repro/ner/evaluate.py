"""NER evaluation: token precision/recall/F1 and k-fold cross-validation.

The paper reports "an F1 score of 0.95 on the test set validated by
5-fold cross validation". We follow the same protocol: micro-averaged
token-level F1 over the seven entity tags (``O`` tokens are excluded
from both numerator and denominator, as is standard for NER — counting
the easy ``O`` class would inflate the score).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.ner.tagger import NerTagger

Corpus = list[tuple[list[str], list[str]]]


@dataclass(frozen=True)
class NerScore:
    precision: float
    recall: float
    f1: float
    per_tag_f1: dict[str, float]


def score_predictions(gold: list[list[str]], pred: list[list[str]]) -> NerScore:
    """Micro P/R/F1 over entity (non-O) tokens, plus per-tag F1."""
    tp: dict[str, int] = {}
    fp: dict[str, int] = {}
    fn: dict[str, int] = {}
    for g_seq, p_seq in zip(gold, pred):
        for g, p in zip(g_seq, p_seq):
            if p != "O":
                if g == p:
                    tp[p] = tp.get(p, 0) + 1
                else:
                    fp[p] = fp.get(p, 0) + 1
            if g != "O" and g != p:
                fn[g] = fn.get(g, 0) + 1
    tags = sorted(set(tp) | set(fp) | set(fn))
    sum_tp, sum_fp, sum_fn = sum(tp.values()), sum(fp.values()), sum(fn.values())
    precision = sum_tp / (sum_tp + sum_fp) if sum_tp + sum_fp else 0.0
    recall = sum_tp / (sum_tp + sum_fn) if sum_tp + sum_fn else 0.0
    f1 = 2 * precision * recall / (precision + recall) if precision + recall else 0.0
    per_tag = {}
    for t in tags:
        p_t = tp.get(t, 0) / max(1, tp.get(t, 0) + fp.get(t, 0))
        r_t = tp.get(t, 0) / max(1, tp.get(t, 0) + fn.get(t, 0))
        per_tag[t] = 2 * p_t * r_t / (p_t + r_t) if p_t + r_t else 0.0
    return NerScore(precision, recall, f1, per_tag)


def evaluate(tagger: NerTagger, test: Corpus) -> NerScore:
    gold = [tags for _, tags in test]
    pred = [tagger.predict(tokens) for tokens, _ in test]
    return score_predictions(gold, pred)


def cross_validate(corpus: Corpus, *, k: int = 5, epochs: int = 5) -> list[NerScore]:
    """k-fold CV: deterministic contiguous folds over the (already
    cluster-diversified) corpus; one NerScore per fold."""
    n = len(corpus)
    scores = []
    for fold in range(k):
        lo, hi = fold * n // k, (fold + 1) * n // k
        test = corpus[lo:hi]
        train = corpus[:lo] + corpus[hi:]
        tagger = NerTagger().fit(train, epochs=epochs, seed=13 + fold)
        scores.append(evaluate(tagger, test))
    return scores
