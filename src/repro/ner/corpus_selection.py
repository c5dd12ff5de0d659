"""Train/test corpus selection by clustering POS-frequency vectors.

Paper §II-A: "we utilized Parts of Speech Tagging to form vectors
representing each ingredient phrase … then proceeded to cluster the
obtained vectors. The ingredient phrases were chosen for the training
and testing set by selecting a subset of ingredient phrases from each
cluster." This module reproduces that: k-means (numpy, deterministic)
over :func:`repro.text.pos.pos_frequency_vector`, then proportional
sampling from every cluster for both splits, yielding the paper's
6,612-phrase training and 2,188-phrase test sets.
"""
from __future__ import annotations

import numpy as np

from repro.text.pos import pos_frequency_vector

Corpus = list[tuple[list[str], list[str]]]


def kmeans(x: np.ndarray, k: int, *, seed: int = 0, iters: int = 50) -> np.ndarray:
    """Plain Lloyd's k-means; returns the cluster label per row."""
    rng = np.random.default_rng(seed)
    centers = x[rng.choice(len(x), size=min(k, len(x)), replace=False)].astype(float)
    labels = np.zeros(len(x), dtype=int)
    for _ in range(iters):
        d = ((x[:, None, :] - centers[None, :, :]) ** 2).sum(axis=2)
        new_labels = d.argmin(axis=1)
        if (new_labels == labels).all():
            break
        labels = new_labels
        for c in range(len(centers)):
            members = x[labels == c]
            if len(members):
                centers[c] = members.mean(axis=0)
    return labels


def select_corpus(
    phrases: Corpus,
    *,
    n_train: int = 6612,
    n_test: int = 2188,
    k: int = 12,
    seed: int = 0,
) -> tuple[Corpus, Corpus]:
    """Cluster phrases by POS-frequency vector and draw both splits
    proportionally from every cluster (disjoint)."""
    if n_train + n_test > len(phrases):
        raise ValueError(
            f"need {n_train + n_test} phrases, got {len(phrases)}"
        )
    x = np.array([pos_frequency_vector(tokens) for tokens, _ in phrases])
    labels = kmeans(x, k, seed=seed)
    rng = np.random.default_rng(seed + 1)

    train_idx: list[int] = []
    test_idx: list[int] = []
    total = len(phrases)
    for c in sorted(set(labels)):
        members = np.flatnonzero(labels == c)
        members = rng.permutation(members)
        share_train = int(round(len(members) / total * n_train))
        share_test = int(round(len(members) / total * n_test))
        train_idx.extend(members[:share_train].tolist())
        test_idx.extend(members[share_train : share_train + share_test].tolist())

    # rounding drift: top up / trim from the leftover pool deterministically
    leftover = [
        i for i in range(total) if i not in set(train_idx) | set(test_idx)
    ]
    while len(train_idx) < n_train and leftover:
        train_idx.append(leftover.pop(0))
    while len(test_idx) < n_test and leftover:
        test_idx.append(leftover.pop(0))
    train_idx = train_idx[:n_train]
    test_idx = test_idx[:n_test]
    return [phrases[i] for i in train_idx], [phrases[i] for i in test_idx]
