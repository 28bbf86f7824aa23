"""Benchmark: Table VI pipeline — k-shot category prediction."""
import pytest

from repro.core.config import BENCH_CONFIG
from repro.corpus import generate_reviews
from repro.downstream.category_pred import build_dataset, run_category_prediction
from repro.pretrain.model import model_grid


@pytest.fixture(scope="module")
def world(spark, kg_bench):
    reviews = generate_reviews(kg_bench.onto, kg_bench.catalog, BENCH_CONFIG)
    grid = model_grid(spark, kg_bench, reviews)
    return kg_bench, {k: grid[k] for k in ["mPLUG-base", "mPLUG-base+KG"]}


@pytest.mark.parametrize("k", [1, 5])
def test_k_shot_category(benchmark, world, k):
    kg, models = world
    ds = build_dataset(kg).head(2000)

    def run():
        return run_category_prediction(kg, models, dataset=ds, k_shot=k, epochs=10)

    res = benchmark.pedantic(run, rounds=2, iterations=1)
    assert 0 <= res["mPLUG-base+KG"] <= 1
