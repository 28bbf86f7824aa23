"""OpenBG benchmark construction (paper Sec. III-A, Fig. 4).

Three-stage sampling from the full (scaled) OpenBG:
relation refinement → head-entity filtering (Eq. 1) → tail-entity
sampling (Eq. 2), followed by leakage-guarded train/dev/test splits.
"""
from repro.benchmark.build import Benchmark, BenchmarkSpec, build_benchmark, default_specs
from repro.benchmark.stats import benchmark_stats

__all__ = [
    "Benchmark",
    "BenchmarkSpec",
    "build_benchmark",
    "default_specs",
    "benchmark_stats",
]
