"""Benchmark: Table IV pipeline — structural KGE on the 500-analogue."""
import pytest

from repro.benchmark.build import build_all_benchmarks
from repro.kge.bilinear import DistMult
from repro.kge.data import KGEDataset, negative_sample
from repro.kge.tucker import TuckER


@pytest.fixture(scope="module")
def data500(kg_bench):
    benches = build_all_benchmarks(kg_bench, boost=3.0)
    return KGEDataset.from_benchmark(benches["OpenBG500"])


def test_distmult_training(benchmark, data500):
    def train():
        return DistMult(data500.n_ent, data500.n_rel, seed=1).fit(
            data500, epochs=10
        )

    benchmark.pedantic(train, rounds=3, iterations=1)


def test_tucker_training(benchmark, data500):
    def train():
        return TuckER(data500.n_ent, data500.n_rel, seed=1).fit(data500, epochs=5)

    benchmark.pedantic(train, rounds=3, iterations=1)


def test_negative_sampling_throughput(benchmark, data500):
    import numpy as np

    rng = np.random.default_rng(0)

    def sample():
        return negative_sample(data500.train, data500.n_ent, 4, rng, data500.known)

    neg = benchmark.pedantic(sample, rounds=5, iterations=1)
    assert len(neg) == 4 * len(data500.train)
