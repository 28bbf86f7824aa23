"""Benchmark: Table II pipeline — three-stage benchmark sampling."""
from repro.benchmark.build import (
    build_benchmark,
    business_triples,
    default_specs,
)


def test_benchmark_construction(benchmark, spark, kg_bench):
    """Relation refinement + Eq.1 + Eq.2 + split for OpenBG500."""
    pool = business_triples(kg_bench, multimodal=False).coalesce(8).cache()
    pool.count()
    spec = default_specs(kg_bench.cfg, boost=1.0)["OpenBG500"]

    def build():
        return build_benchmark(kg_bench, spec, pool=pool)

    bench = benchmark.pedantic(build, rounds=3, iterations=1)
    assert len(bench.train_pdf) > 0
