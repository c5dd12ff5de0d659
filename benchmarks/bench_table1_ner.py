"""Benchmark for Table I's substrate: NER training at the paper's corpus
size and batch tagging of the SF=0.1 ingredient phrases."""
import pytest
from pyspark.sql import functions as sf

from repro.ner.tagger import NerTagger, tag_ingredients
from repro.recipes.generator import tagged_corpus


def test_bench_ner_training(benchmark):
    """Train on the paper-sized corpus (6,612 phrases, 5 epochs)."""
    corpus = tagged_corpus(6612, seed=7)

    def train():
        return NerTagger().fit(corpus, epochs=5)

    tagger = benchmark.pedantic(train, rounds=2, iterations=1)
    assert tagger.model.weights


def test_bench_ner_batch_tagging(benchmark, spark, bench_corpus, bench_tagger):
    """Tag all SF=0.1 phrases through the Spark mapInPandas path."""
    _, ingredients = bench_corpus

    def tag():
        out = tag_ingredients(bench_tagger, ingredients)
        return out.where(sf.col("ner_name").isNotNull()).count()

    n = benchmark.pedantic(tag, rounds=1, iterations=1)
    assert n > 90_000
