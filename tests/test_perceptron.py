"""Tests for the averaged perceptron learner."""
import random

from repro.ner.perceptron import AveragedPerceptron, shuffled


def _train_toy(epochs: int = 10) -> AveragedPerceptron:
    """f1 → B, f2 → A: separable, and B-for-f1 must be *learned* (the
    untrained tie-break would answer A)."""
    p = AveragedPerceptron(["A", "B"])
    data = [(["f1"], "B"), (["f2"], "A")] * 20
    for _ in range(epochs):
        for feats, truth in data:
            guess = p.predict(feats)
            p.update(truth, guess, feats)
    p.average()
    return p


class TestLearning:
    def test_learns_separable(self):
        p = _train_toy()
        assert p.predict(["f1"]) == "B"
        assert p.predict(["f2"]) == "A"

    def test_scores_shape(self):
        p = _train_toy()
        scores = p.score(["f1"])
        assert set(scores) == {"A", "B"}
        assert scores["B"] > scores["A"]

    def test_unknown_features_tie_break_deterministic(self):
        p = AveragedPerceptron(["X", "Y"])
        # no weights at all → first class by order
        assert p.predict(["nothing"]) == "X"

    def test_no_update_on_correct(self):
        p = AveragedPerceptron(["A", "B"])
        p.update("A", "A", ["f"])
        assert p.weights == {}

    def test_update_moves_weights(self):
        p = AveragedPerceptron(["A", "B"])
        p.update("A", "B", ["f"])
        assert p.weights["f"]["A"] > 0 > p.weights["f"]["B"]


class TestAveraging:
    def test_average_is_mean_of_history(self):
        p = AveragedPerceptron(["A", "B"])
        p.update("A", "B", ["f"])  # at i=1 the weight becomes +1
        p._i += 3                  # weight stays +1 through i=4
        p.average()
        # history: 0 during step 1, then +1 for steps 2–4 → mean 3/4
        assert p.weights["f"]["A"] == 0.75

    def test_prune_removes_zeros(self):
        p = AveragedPerceptron(["A", "B"])
        p.weights = {"f": {"A": 0.0, "B": 0.5}, "g": {"A": 0.0}}
        p.prune()
        assert p.weights == {"f": {"B": 0.5}}


class TestShuffled:
    def test_preserves_items(self):
        items = list(range(10))
        out = shuffled(items, random.Random(0))
        assert sorted(out) == items
        assert items == list(range(10))  # input untouched

    def test_deterministic(self):
        assert shuffled(list(range(10)), random.Random(1)) == shuffled(
            list(range(10)), random.Random(1)
        )
