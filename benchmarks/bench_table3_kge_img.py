"""Benchmark: Table III pipeline — multimodal KGE train + filtered eval."""
import pytest

from repro.benchmark.build import build_all_benchmarks
from repro.kge.data import KGEDataset
from repro.kge.evaluate import evaluate_spark
from repro.kge.multimodal import TransAE, image_features_for_dataset
from repro.kge.trans import TransE


@pytest.fixture(scope="module")
def img_data(kg_bench):
    benches = build_all_benchmarks(kg_bench, boost=3.0)
    bench = benches["OpenBG-IMG"]
    return KGEDataset.from_benchmark(bench)


def test_transe_training_epochs(benchmark, img_data):
    def train():
        return TransE(img_data.n_ent, img_data.n_rel, seed=1).fit(
            img_data, epochs=10
        )

    m = benchmark.pedantic(train, rounds=3, iterations=1)
    assert m.params["E"].shape[0] == img_data.n_ent


def test_multimodal_training_epochs(benchmark, kg_bench, img_data):
    img = image_features_for_dataset(img_data, kg_bench, dim=16)

    def train():
        return TransAE(img_data.n_ent, img_data.n_rel, img, seed=1).fit(
            img_data, epochs=10
        )

    benchmark.pedantic(train, rounds=3, iterations=1)


def test_distributed_filtered_eval(benchmark, spark, img_data):
    model = TransE(img_data.n_ent, img_data.n_rel, seed=1).fit(img_data, epochs=5)

    def ev():
        return evaluate_spark(spark, model, img_data)

    res = benchmark.pedantic(ev, rounds=3, iterations=1)
    assert res["mr"] >= 1
