"""Benchmark: Table VII pipeline — k-shot NER for titles."""
import pytest

from repro.core.config import BENCH_CONFIG
from repro.corpus import generate_reviews
from repro.downstream.ner_titles import build_ner_dataset, run_ner
from repro.pretrain.model import model_grid


@pytest.fixture(scope="module")
def world(spark, kg_bench):
    reviews = generate_reviews(kg_bench.onto, kg_bench.catalog, BENCH_CONFIG)
    grid = model_grid(spark, kg_bench, reviews)
    return kg_bench, {k: grid[k] for k in ["mPLUG-base", "mPLUG-base+KG"]}


@pytest.mark.parametrize("k", [1, 5])
def test_k_shot_ner(benchmark, world, k):
    kg, models = world
    ds = build_ner_dataset(kg)[:800]

    def run():
        return run_ner(kg, models, dataset=ds, k_shot=k, epochs=2)

    res = benchmark.pedantic(run, rounds=2, iterations=1)
    assert 0 <= res["mPLUG-base+KG"][2] <= 1
