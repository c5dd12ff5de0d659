"""Benchmark for the §III results: the full estimation pipeline (NER →
matching → units → profiles) and the calorie-error evaluation at SF=0.1 —
the workload behind the paper's headline 36.42 kcal number."""
from repro.core.pipeline import run_pipeline
from repro.core.stats import calorie_error


def test_bench_full_pipeline(benchmark, spark, bench_corpus, bench_tagger):
    recipes, ingredients = bench_corpus

    def run():
        res = run_pipeline(
            spark, recipes, ingredients, tagger=bench_tagger
        )
        return res.profiles.count()

    n = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n == recipes.count()


def test_bench_calorie_error_evaluation(benchmark, spark, bench_corpus, bench_tagger):
    recipes, ingredients = bench_corpus
    res = run_pipeline(spark, recipes, ingredients, tagger=bench_tagger)
    profiles = res.profiles.cache()
    profiles.count()

    def evaluate():
        return calorie_error(profiles)

    r = benchmark.pedantic(evaluate, rounds=2, iterations=1)
    assert r.n_recipes > 0
