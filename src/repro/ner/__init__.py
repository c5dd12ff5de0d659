"""NER substrate — stands in for the Stanford CRF NER (Finkel et al. 2005).

The paper trains Stanford NER to tag ingredient-phrase tokens with
NAME / STATE / QUANTITY / UNIT / TEMP / DF / SIZE, reporting token F1 =
0.95 under 5-fold cross-validation (6,612 training phrases, 2,188 test
phrases selected by clustering POS-frequency vectors). The Stanford jar
is unavailable offline, so this package provides the same-family
replacement: a greedy averaged structured perceptron (Collins 2002) over
orthographic, contextual, and gazetteer features.

- :mod:`repro.ner.features` — per-token feature extraction.
- :mod:`repro.ner.perceptron` — the averaged perceptron learner.
- :mod:`repro.ner.tagger` — train/predict API + Spark batch tagging.
- :mod:`repro.ner.evaluate` — token P/R/F1 and k-fold cross-validation.
- :mod:`repro.ner.corpus_selection` — POS-vector k-means corpus selection.
"""
from repro.ner.tagger import NerTagger

__all__ = ["NerTagger"]
