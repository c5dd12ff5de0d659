"""Tests for POS-vector k-means corpus selection (§II-A)."""
import numpy as np
import pytest

from repro.ner.corpus_selection import kmeans, select_corpus
from repro.recipes.generator import tagged_corpus


class TestKmeans:
    def test_separates_obvious_clusters(self):
        x = np.array([[0.0, 0.0], [0.1, 0.0], [5.0, 5.0], [5.1, 5.0]])
        labels = kmeans(x, 2, seed=0)
        assert labels[0] == labels[1]
        assert labels[2] == labels[3]
        assert labels[0] != labels[2]

    def test_deterministic(self):
        x = np.random.default_rng(0).random((50, 4))
        assert (kmeans(x, 3, seed=1) == kmeans(x, 3, seed=1)).all()

    def test_k_larger_than_n(self):
        x = np.array([[0.0], [1.0]])
        labels = kmeans(x, 5, seed=0)
        assert len(labels) == 2


class TestSelectCorpus:
    @pytest.fixture(scope="class")
    def pool(self):
        return tagged_corpus(1200, seed=41)

    def test_sizes(self, pool):
        train, test = select_corpus(pool, n_train=800, n_test=300, k=6)
        assert len(train) == 800
        assert len(test) == 300

    def test_disjoint(self, pool):
        train, test = select_corpus(pool, n_train=800, n_test=300, k=6)
        train_ids = {id(t) for t in train}
        assert all(id(t) not in train_ids for t in test)

    def test_raises_when_pool_too_small(self, pool):
        with pytest.raises(ValueError):
            select_corpus(pool, n_train=1100, n_test=200)

    def test_deterministic(self, pool):
        a = select_corpus(pool, n_train=100, n_test=50, k=4, seed=3)
        b = select_corpus(pool, n_train=100, n_test=50, k=4, seed=3)
        assert a == b
