"""Lightweight NLP substrate (replaces NLTK, which is unavailable offline).

Modules:

- :mod:`repro.text.tokenize` — tokenizer + stop-word list + casing.
- :mod:`repro.text.lemmatizer` — rule-based English noun lemmatizer
  standing in for NLTK's WordNet lemmatizer (heuristic (b) of the paper).
- :mod:`repro.text.negation` — negation-term normalization (heuristic (f)).
- :mod:`repro.text.pos` — coarse POS tagger used only for train/test
  corpus selection via POS-frequency-vector clustering (paper §II-A).
"""
from repro.text.lemmatizer import lemmatize
from repro.text.negation import normalize_negations
from repro.text.tokenize import STOPWORDS, tokenize

__all__ = ["lemmatize", "normalize_negations", "tokenize", "STOPWORDS"]
