"""Foundation-model substrate + KG-derived features + the model grid.

The grid mirrors the paper's baselines (Tables V–VII):

=================  ==========  ====  ===========================
variant            pretrained  dim   KG features
=================  ==========  ====  ===========================
RoBERTa-large      general     64    —
RoBERTa-base       general     32    —
RoBERTa-base+KG    general     32    yes
UIE                general     40    —
mT5                general     40    —
BERT               general     24    —
mPLUG-base         domain      32    —
mPLUG-base+KG      domain+KG   32    yes
mPLUG-large+KG     domain+KG   64    yes
=================  ==========  ====  ===========================

"domain+KG" pre-training additionally folds the X_sup prompt corpus
into the embedding fit; "yes" KG features expose gazetteers, category
log-priors (Spark aggregations over the full KG) and statement
statistics to the task heads.
"""
from __future__ import annotations

import dataclasses
import math
from typing import Dict, List, Optional, Sequence, Tuple

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import SparkSession

from repro.construction.assemble import OpenBG
from repro.construction.facets import statement_scores
from repro.corpus.vocab import build_surface_forms
from repro.pretrain.corpus import (
    general_texts,
    kg_text_corpus,
    unsupervised_texts,
)
from repro.pretrain.features import TokenEmbeddings, hashed_bow, kmeans_clusters


@dataclasses.dataclass
class KGFeatures:
    """OpenBG-derived features for "+KG" model variants.

    ``token_cat_logprior`` maps a surface token (brand surface, value
    token, concept label) to log P(category | token) — computed with
    Spark aggregations over KG triples joined to product categories.
    ``statement_stats`` maps (category, relation, concept-node) to
    (typicality, remarkability) from the facet pipeline.
    """

    value_to_attr: Dict[str, str]
    brand_tokens: frozenset
    concept_label_root: Dict[str, str]
    category_labels: frozenset
    token_cat_logprior: Dict[str, Dict[str, float]]
    statement_stats: Dict[Tuple[str, str, str], Tuple[float, float]]

    @classmethod
    def build(cls, spark: SparkSession, kg: OpenBG) -> "KGFeatures":
        forms = build_surface_forms(kg.onto)
        cat = kg.catalog
        value_to_attr = {
            v: r for r, vals in forms.attr_values.items() for v in vals
        }
        brand_tokens = frozenset(forms.brand_forms["surface"])
        concept_label_root: Dict[str, str] = {}
        concept_label_node: Dict[str, str] = {}
        for root, tax in kg.onto.concept_taxonomies.items():
            for nid, label in tax.nodes[["node_id", "label"]].itertuples(index=False):
                concept_label_root[label] = root
                concept_label_node[label] = nid
        cat_nodes = kg.onto.taxonomies["Category"].nodes
        category_labels = frozenset(cat_nodes["label"])
        cat_label = cat_nodes.set_index("node_id")["label"]

        # ---- Spark: token → category log-priors over the full KG ---------
        prod_cat = spark.createDataFrame(
            cat.products[["product_id", "category"]]
        )
        sources = []
        brands = cat.products.dropna(subset=["brand_surface"])[
            ["product_id", "brand_surface"]
        ].rename(columns={"brand_surface": "token"})
        if len(brands):
            sources.append(spark.createDataFrame(brands))
        values = cat.attributes[["product_id", "value"]].rename(
            columns={"value": "token"}
        )
        sources.append(spark.createDataFrame(values))
        label_of = pd.Series(concept_label_node).reset_index()
        label_of.columns = ["token", "t"]
        concepts = cat.concept_links.merge(label_of, on="t")[
            ["product_id", "token"]
        ]
        if len(concepts):
            sources.append(spark.createDataFrame(concepts))

        token_cat: Dict[str, Dict[str, float]] = {}
        for src in sources:
            counts = (
                src.join(prod_cat, on="product_id")
                .groupBy("token", "category")
                .agg(F.count("*").alias("n"))
                .toPandas()
            )
            for token, grp in counts.groupby("token"):
                tot = grp["n"].sum()
                d = token_cat.setdefault(token, {})
                for c, n in grp[["category", "n"]].itertuples(index=False):
                    d[c] = math.log((n + 0.1) / (tot + 1.0))

        # ---- Spark: facet statistics for salience ------------------------
        links = spark.createDataFrame(cat.concept_links)
        scored = statement_scores(spark, links, prod_cat, kg.onto).toPandas()
        statement_stats = {
            (row.category, row.r, row.t): (row.typicality, row.remarkability)
            for row in scored.itertuples()
        }
        return cls(
            value_to_attr=value_to_attr,
            brand_tokens=brand_tokens,
            concept_label_root=concept_label_root,
            category_labels=category_labels,
            token_cat_logprior=token_cat,
            statement_stats=statement_stats,
        )

    def category_prior(self, tokens: Sequence[str], categories: List[str]) -> np.ndarray:
        """Σ_token log P(category | token) over known tokens, as a vector
        aligned with ``categories`` (0 where no evidence)."""
        out = np.zeros(len(categories))
        idx = {c: i for i, c in enumerate(categories)}
        for t in tokens:
            d = self.token_cat_logprior.get(t)
            if not d:
                continue
            floor = math.log(0.1 / (sum(math.exp(v) for v in d.values()) * 10 + 1))
            for i, c in enumerate(categories):
                out[i] += d.get(c, floor)
        return out


@dataclasses.dataclass
class FoundationModel:
    """One pre-trained model variant: embeddings + optional KG features."""

    name: str
    emb: TokenEmbeddings
    kg: Optional[KGFeatures] = None
    bow_dim: int = 32
    n_clusters: int = 16
    _clusters: Optional[Dict[str, int]] = None

    @property
    def feature_dim(self) -> int:
        return self.emb.dim + 1 + self.bow_dim

    def encode(self, tokens: Sequence[str]) -> np.ndarray:
        """Dense features: mean embedding ⊕ OOV rate ⊕ hashed BoW."""
        return np.concatenate(
            [self.emb.encode(tokens), hashed_bow(tokens, self.bow_dim)]
        )

    def clusters(self) -> Dict[str, int]:
        """Token → cluster id (discrete features for the perceptron)."""
        if self._clusters is None:
            self._clusters = kmeans_clusters(self.emb, self.n_clusters, seed=7)
        return self._clusters


def model_grid(
    spark: SparkSession, kg: OpenBG, reviews: pd.DataFrame
) -> Dict[str, FoundationModel]:
    """Build all paper baselines' substitutes over one world."""
    domain = unsupervised_texts(kg, reviews)
    domain_kg = domain + kg_text_corpus(kg)
    general = general_texts()
    kgf = KGFeatures.build(spark, kg)

    def emb(corpus, dim, seed):
        return TokenEmbeddings.train(corpus, dim=dim, seed=seed)

    return {
        "RoBERTa-large": FoundationModel("RoBERTa-large", emb(general, 64, 1), n_clusters=32),
        "RoBERTa-base": FoundationModel("RoBERTa-base", emb(general, 32, 2)),
        "RoBERTa-base+KG": FoundationModel("RoBERTa-base+KG", emb(general, 32, 2), kg=kgf),
        "UIE": FoundationModel("UIE", emb(general, 40, 3)),
        "mT5": FoundationModel("mT5", emb(general, 40, 4)),
        "BERT": FoundationModel("BERT", emb(general, 24, 5)),
        "mPLUG-base": FoundationModel("mPLUG-base", emb(domain, 32, 6)),
        "mPLUG-base+KG": FoundationModel("mPLUG-base+KG", emb(domain_kg, 32, 6), kg=kgf),
        "mPLUG-large+KG": FoundationModel(
            "mPLUG-large+KG", emb(domain_kg, 64, 6), kg=kgf, n_clusters=32
        ),
    }
