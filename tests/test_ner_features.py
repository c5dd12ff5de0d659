"""Tests for NER feature extraction."""
from repro.ner.features import UNIT_GAZETTEER, token_features


class TestTokenFeatures:
    def test_word_identity(self):
        feats = token_features(["1", "cup", "flour"], 1, "QUANTITY")
        assert "w=cup" in feats

    def test_context_words(self):
        feats = token_features(["1", "cup", "flour"], 1, "QUANTITY")
        assert "prev_w=1" in feats and "next_w=flour" in feats

    def test_sentence_boundaries(self):
        first = token_features(["cup"], 0, "<start>")
        assert "prev_w=<s>" in first and "next_w=</s>" in first

    def test_prev_tag(self):
        feats = token_features(["1", "cup"], 1, "QUANTITY")
        assert "prev_tag=QUANTITY" in feats
        assert "prev_tag+w=QUANTITY|cup" in feats

    def test_number_shape(self):
        assert "shape=number" in token_features(["1/2"], 0, "<start>")
        assert "shape=number" in token_features(["2-4"], 0, "<start>")

    def test_punct_shape(self):
        assert "shape=punct" in token_features([","], 0, "O")

    def test_hyphen_shape(self):
        assert "shape=hyphen" in token_features(["hard-cooked"], 0, "O")

    def test_unit_gazetteer(self):
        for u in ("tbsp", "cups", "lb"):
            assert u in UNIT_GAZETTEER
            assert "gaz=unit" in token_features([u], 0, "<start>")

    def test_participle_shape(self):
        assert "shape=participle" in token_features(["chopped"], 0, "O")

    def test_case_insensitive(self):
        assert "w=cup" in token_features(["Cup"], 0, "<start>")
