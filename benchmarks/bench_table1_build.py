"""Benchmark: Table I pipeline — full KG assembly and statistics.

``pytest benchmarks/bench_table1_build.py --benchmark-only``
"""
import pytest

from repro.construction import stats
from repro.construction.assemble import build_world
from repro.core.config import BENCH_CONFIG, ScaledConfig

#: Smaller than BENCH_CONFIG so each benchmark round stays in seconds.
BUILD_CFG = ScaledConfig(scale=3e-4, rel_scale=0.05, seed=7)


def test_build_world_roundtrip(benchmark, spark):
    """End-to-end KG assembly + count at a reduced scale."""

    def build():
        kg = build_world(spark, BUILD_CFG)
        return kg.triples.count()

    n = benchmark.pedantic(build, rounds=3, iterations=1)
    assert n > 100_000


def test_table1_stats_queries(benchmark, spark, kg_bench):
    """The Table I aggregation queries over the cached bench-scale KG."""

    def agg():
        return stats.relation_stats(kg_bench)

    rel = benchmark.pedantic(agg, rounds=3, iterations=1)
    assert rel["inMarket*"] > 0
