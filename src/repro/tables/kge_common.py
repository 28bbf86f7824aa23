"""Shared machinery for the KGE tables (III and IV)."""
from __future__ import annotations

import time
from typing import Callable, Dict, Optional

import pandas as pd
from pyspark.sql import SparkSession

from repro.benchmark.build import Benchmark
from repro.construction.assemble import OpenBG
from repro.kge.bilinear import ComplEx, DistMult
from repro.kge.data import KGEDataset
from repro.kge.evaluate import evaluate_spark
from repro.kge.multimodal import (
    MKGformerLite,
    RSME,
    TransAE,
    image_features_for_dataset,
)
from repro.kge.text import (
    GenKGCSim,
    KGBERTSim,
    StARSim,
    entity_texts_for,
    hash_text_features,
)
from repro.kge.trans import TransD, TransE, TransH
from repro.kge.tucker import TuckER

#: Training budget per benchmark family (epochs, batch, neg_k, dim).
BUDGETS = {
    "OpenBG-IMG": dict(epochs=100, batch_size=256, neg_k=6, dim=32),
    "OpenBG500": dict(epochs=60, batch_size=512, neg_k=6, dim=32),
    "OpenBG500-L": dict(epochs=12, batch_size=1024, neg_k=2, dim=32),
}


def structural_factories() -> Dict[str, Callable]:
    return {
        "TransE": lambda ne, nr, d, s: TransE(ne, nr, dim=d, seed=s),
        "TransH": lambda ne, nr, d, s: TransH(ne, nr, dim=d, seed=s),
        "TransD": lambda ne, nr, d, s: TransD(ne, nr, dim=d, seed=s),
        "DistMult": lambda ne, nr, d, s: DistMult(ne, nr, dim=d, seed=s),
        "ComplEx": lambda ne, nr, d, s: ComplEx(ne, nr, dim=d, seed=s),
        "TuckER": lambda ne, nr, d, s: TuckER(ne, nr, dim=min(d, 24), seed=s),
    }


def text_factories(data: KGEDataset, kg: OpenBG) -> Dict[str, Callable]:
    labels = kg.entity_labels().set_index("entity")["text"].to_dict()
    X = hash_text_features(entity_texts_for(data.entities, labels), dim=256)
    return {
        "KG-BERT": lambda ne, nr, d, s: KGBERTSim(ne, nr, X, dim=d, seed=s),
        "StAR": lambda ne, nr, d, s: StARSim(ne, nr, X, dim=d, seed=s),
        "GenKGC": lambda ne, nr, d, s: GenKGCSim(ne, nr, X, dim=d, seed=s),
    }


def multimodal_factories(data: KGEDataset, kg: OpenBG) -> Dict[str, Callable]:
    img = image_features_for_dataset(data, kg, dim=16)
    return {
        "TransAE": lambda ne, nr, d, s: TransAE(ne, nr, img, dim=d, seed=s),
        "RSME": lambda ne, nr, d, s: RSME(ne, nr, img, dim=d, seed=s),
        "MKGformer": lambda ne, nr, d, s: MKGformerLite(ne, nr, img, dim=d, seed=s),
    }


def run_models(
    spark: SparkSession,
    bench: Benchmark,
    kg: OpenBG,
    model_names: list,
    seed: int = 0,
    budget_overrides: Optional[dict] = None,
) -> pd.DataFrame:
    """Train + filtered-evaluate each named model on one benchmark."""
    data = KGEDataset.from_benchmark(bench)
    budget = dict(BUDGETS[bench.spec.name])
    if budget_overrides:
        budget.update(budget_overrides)
    dim = budget.pop("dim")

    factories: Dict[str, Callable] = {}
    factories.update(structural_factories())
    factories.update(text_factories(data, kg))
    factories.update(multimodal_factories(data, kg))

    rows = []
    for name in model_names:
        t0 = time.time()
        model = factories[name](data.n_ent, data.n_rel, dim, seed)
        model.fit(data, **budget)
        metrics = evaluate_spark(spark, model, data, split="test")
        rows.append(
            {
                "model": name,
                "hits1": metrics["hits1"],
                "hits3": metrics["hits3"],
                "hits10": metrics["hits10"],
                "mr": metrics["mr"],
                "mrr": metrics["mrr"],
                "seconds": round(time.time() - t0, 1),
            }
        )
    return pd.DataFrame(rows)


def merge_with_paper(measured: pd.DataFrame, paper: Dict[str, dict]) -> pd.DataFrame:
    """Interleave paper numbers with measured ones per model."""
    rows = []
    for _, r in measured.iterrows():
        p = paper.get(r["model"], {})
        rows.append(
            {
                "model": r["model"],
                "paper H@1": p.get("hits1", "-"),
                "ours H@1": round(r["hits1"], 3),
                "paper H@3": p.get("hits3", "-"),
                "ours H@3": round(r["hits3"], 3),
                "paper H@10": p.get("hits10", "-"),
                "ours H@10": round(r["hits10"], 3),
                "paper MR": p.get("mr", "-"),
                "ours MR": round(r["mr"], 1),
                "paper MRR": p.get("mrr", "-"),
                "ours MRR": round(r["mrr"], 3),
            }
        )
    return pd.DataFrame(rows)
