"""NER for item titles (paper Sec. IV-C; Tables V and VII).

Task: recognize property–value pairs in titles.  Tags are the owning
property: a value token ``val01234`` must be tagged ``B-attr:0007`` —
the token surface does *not* encode the property (opaque vocabulary),
so the tagger needs memorization, embedding clusters, or the KG
value→attribute gazetteer (the "+KG" edge, decisive in k-shot).

Model variants differ only in the feature extractor handed to the
shared structured perceptron: all get lexical features; pretrained
variants add embedding-cluster features; "+KG" adds gazetteer features.
"""
from __future__ import annotations

from typing import Dict, List, Optional, Sequence, Tuple

import numpy as np

from repro.construction.assemble import OpenBG
from repro.construction.tagger import PerceptronTagger, span_prf, token_features
from repro.corpus.vocab import build_surface_forms
from repro.pretrain.model import FoundationModel

Sentence = Tuple[List[str], List[str]]  # tokens, BIO tags


def build_ner_dataset(kg: OpenBG) -> List[Sentence]:
    """Titles + fine-grained BIO tags from the generator's lookups."""
    forms = build_surface_forms(kg.onto)
    value_attr = {v: r for r, vals in forms.attr_values.items() for v in vals}
    brand_tokens = set(forms.brand_forms["surface"])
    concept_root = {}
    for root, tax in kg.onto.concept_taxonomies.items():
        for label in tax.nodes["label"]:
            concept_root[label] = root
    cat_labels = set(kg.onto.taxonomies["Category"].nodes["label"])

    out: List[Sentence] = []
    for title in kg.catalog.products["title"]:
        toks = title.split()
        tags = []
        for t in toks:
            if t in value_attr:
                tags.append(f"B-{value_attr[t]}")
            elif t in brand_tokens:
                tags.append("B-brand")
            elif t in cat_labels:
                tags.append("B-category")
            elif t in concept_root:
                tags.append(f"B-{concept_root[t]}")
            else:
                tags.append("O")
        out.append((toks, tags))
    return out


class VariantFeatures:
    """Picklable feature extractor for one model variant."""

    def __init__(self, model: FoundationModel):
        self.clusters = model.clusters()
        if model.kg is not None:
            self.value_attr = model.kg.value_to_attr
            self.brand = model.kg.brand_tokens
            self.concept_root = model.kg.concept_label_root
            self.cat_labels = model.kg.category_labels
        else:
            self.value_attr = {}
            self.brand = frozenset()
            self.concept_root = {}
            self.cat_labels = frozenset()

    def __call__(self, tokens: Sequence[str], i: int) -> List[str]:
        feats = token_features(tokens, i)
        w = tokens[i]
        cl = self.clusters.get(w)
        if cl is not None:
            feats.append(f"cl={cl}")
            if i > 0:
                feats.append(f"pcl={self.clusters.get(tokens[i - 1], -1)}")
        if self.value_attr:
            if w in self.value_attr:
                feats.append(f"gaz_attr={self.value_attr[w]}")
            if w in self.brand:
                feats.append("gaz_brand")
            if w in self.concept_root:
                feats.append(f"gaz_concept={self.concept_root[w]}")
            if w in self.cat_labels:
                feats.append("gaz_cat")
        return feats


def _split(data: List[Sentence], seed: int = 1):
    g = np.random.default_rng(seed)
    mask = g.random(len(data)) < 0.8
    train = [s for s, m in zip(data, mask) if m]
    valid = [s for s, m in zip(data, mask) if not m]
    return train, valid


def k_shot_subsample(
    train: List[Sentence], k: int, seed: int = 3
) -> List[Sentence]:
    """≤k sentences per entity type (Table VII's protocol): scan a
    deterministic shuffle, keeping a sentence while it covers a type
    still under quota."""
    g = np.random.default_rng(seed)
    order = g.permutation(len(train))
    quota: Dict[str, int] = {}
    picked = []
    for j in order:
        toks, tags = train[j]
        types = {t[2:] for t in tags if t.startswith("B-")}
        if any(quota.get(tp, 0) < k for tp in types):
            picked.append(train[j])
            for tp in types:
                quota[tp] = quota.get(tp, 0) + 1
    return picked


def run_ner(
    kg: OpenBG,
    models: Dict[str, FoundationModel],
    dataset: Optional[List[Sentence]] = None,
    k_shot: Optional[int] = None,
    epochs: int = 5,
) -> Dict[str, Tuple[float, float, float]]:
    """(P, R, F) per model variant."""
    if dataset is None:
        dataset = build_ner_dataset(kg)
    train, valid = _split(dataset)
    if k_shot is not None:
        train = k_shot_subsample(train, k_shot)
    tag_set = sorted({t for _, tags in dataset for t in tags})

    out = {}
    for name, model in models.items():
        tagger = PerceptronTagger(tag_set, feature_fn=VariantFeatures(model))
        tagger.fit([s for s, _ in train], [t for _, t in train], epochs=epochs)
        pred = [tagger.predict(s) for s, _ in valid]
        out[name] = span_prf([t for _, t in valid], pred)
    return out
