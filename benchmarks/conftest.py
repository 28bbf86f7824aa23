"""Benchmark fixtures: one bench-scale world shared across benchmarks."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "16")

import pytest  # noqa: E402

from repro.construction.assemble import build_world  # noqa: E402
from repro.core.config import BENCH_CONFIG  # noqa: E402


@pytest.fixture(scope="session")
def kg_bench(spark):
    """Assembled OpenBG at benchmark scale (1e-3, ~1.8M triples)."""
    kg = build_world(spark, BENCH_CONFIG)
    kg.triples.cache().count()
    return kg
