"""Table II statistics of constructed benchmarks."""
from __future__ import annotations

from typing import Dict

import pandas as pd

from repro.benchmark.build import Benchmark


def benchmark_stats(bench: Benchmark) -> Dict[str, int]:
    """One Table II row, measured: # Ent / # Rel / # Train / # Dev / # Test
    (+ # multimodal entities for OpenBG-IMG).

    Computed on the materialized splits (the benchmark artifact itself),
    not on the Spark lineage that produced them.
    """
    a = bench.all_pdf()
    out = {
        "n_ent": bench.entity_count(),
        "n_rel": int(a["r"].nunique()),
        "n_train": len(bench.train_pdf),
        "n_dev": len(bench.dev_pdf),
        "n_test": len(bench.test_pdf),
    }
    if bench.spec.multimodal:
        out["n_ent_multimodal"] = bench.multimodal_entities
    return out


def relation_distribution(bench: Benchmark) -> pd.DataFrame:
    """Per-relation triple counts, descending (Fig. 5's histogram data)."""
    return (
        bench.all_pdf()
        .groupby("r")
        .size()
        .rename("n")
        .sort_values(ascending=False)
        .reset_index()
    )
