"""Benchmark: Table V pipelines — grid build + the five task heads."""
import pytest

from repro.core.config import BENCH_CONFIG
from repro.corpus import generate_reviews
from repro.downstream.category_pred import build_dataset as cat_ds, run_category_prediction
from repro.downstream.ie_reviews import run_ie
from repro.downstream.ner_titles import build_ner_dataset, run_ner
from repro.downstream.salience import run_salience
from repro.downstream.summarization import build_dataset as summ_ds, run_summarization
from repro.pretrain.model import model_grid


@pytest.fixture(scope="module")
def world(spark, kg_bench):
    reviews = generate_reviews(kg_bench.onto, kg_bench.catalog, BENCH_CONFIG)
    grid = model_grid(spark, kg_bench, reviews)
    sub = {k: grid[k] for k in ["mPLUG-base", "mPLUG-base+KG"]}
    return kg_bench, reviews, sub


def test_category_prediction(benchmark, world):
    kg, _, models = world
    ds = cat_ds(kg).head(2000)

    def run():
        return run_category_prediction(kg, models, dataset=ds, epochs=10)

    res = benchmark.pedantic(run, rounds=2, iterations=1)
    assert 0 <= res["mPLUG-base+KG"] <= 1


def test_ner(benchmark, world):
    kg, _, models = world
    ds = build_ner_dataset(kg)[:800]

    def run():
        return run_ner(kg, models, dataset=ds, epochs=2)

    benchmark.pedantic(run, rounds=2, iterations=1)


def test_summarization(benchmark, world):
    kg, _, models = world
    ds = summ_ds(kg).head(800)

    def run():
        return run_summarization(kg, models, dataset=ds, epochs=5)

    benchmark.pedantic(run, rounds=2, iterations=1)


def test_ie(benchmark, world):
    kg, reviews, models = world

    def run():
        return run_ie(kg, models, reviews.head(800), epochs=2)

    benchmark.pedantic(run, rounds=2, iterations=1)


def test_salience(benchmark, world):
    kg, _, models = world

    def run():
        return run_salience(kg, models, epochs=15)

    benchmark.pedantic(run, rounds=2, iterations=1)
