"""Tests for the coarse POS tagger used in corpus selection."""
from repro.text.pos import POS_TAGS, pos_frequency_vector, pos_tag


class TestPosTag:
    def test_paper_like_phrase(self):
        assert pos_tag(["1", "small", "onion", ",", "finely", "chopped"]) == [
            "NUM", "ADJ", "NOUN", "PUNCT", "ADV", "VBN",
        ]

    def test_fractions_are_num(self):
        assert pos_tag(["1/2", "2-4", "2.5"]) == ["NUM", "NUM", "NUM"]

    def test_units(self):
        assert pos_tag(["tbsp", "cups", "lb"]) == ["UNIT", "UNIT", "UNIT"]

    def test_closed_classes(self):
        assert pos_tag(["or", "of", "the"]) == ["CC", "IN", "DT"]

    def test_default_noun(self):
        assert pos_tag(["butter"]) == ["NOUN"]

    def test_participle(self):
        assert pos_tag(["softened"]) == ["VBN"]


class TestFrequencyVector:
    def test_length_matches_tagset(self):
        v = pos_frequency_vector(["1", "cup", "flour"])
        assert len(v) == len(POS_TAGS)

    def test_counts(self):
        v = pos_frequency_vector(["1", "cup", "flour"])
        assert v[POS_TAGS.index("NUM")] == 1.0
        assert v[POS_TAGS.index("UNIT")] == 1.0
        assert v[POS_TAGS.index("NOUN")] == 1.0
        assert sum(v) == 3.0
