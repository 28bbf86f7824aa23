"""Knowledge-graph embedding models and evaluation (Tables III/IV).

Faithful numpy implementations of the paper's structural baselines
(TransE, TransH, TransD, DistMult, ComplEx, TuckER), substitutes for
the PLM-based baselines (KG-BERT, StAR, GenKGC) built on hashed
character-n-gram text encoders, multimodal substitutes (TransAE, RSME,
MKGformer) over synthetic image features, and Spark-distributed
filtered Hits@K / MR / MRR evaluation.
"""
from repro.kge.data import KGEDataset, negative_sample
from repro.kge.evaluate import evaluate, evaluate_spark

__all__ = ["KGEDataset", "negative_sample", "evaluate", "evaluate_spark"]
