"""Deterministic surface-form vocabularies for the synthetic corpus.

Raw business data does not arrive as node ids: products mention brands
and places by *surface strings* — canonical names, aliases, and
misspellings — which is exactly why the paper needs trie precise
matching + fuzzy synonym matching (Sec. II-B).  This module fabricates
those surface forms deterministically:

- every Brand/Place leaf gets a canonical name, an alias ("...-co"
  style), and a misspelled variant (adjacent-character swap);
- every attribute relation type gets a closed value vocabulary;
- noise/marketing tokens pad titles; a disjoint general-domain token
  pool feeds the "general corpus" pre-training substitute.
"""
from __future__ import annotations

import dataclasses
from typing import Dict, List

import pandas as pd

from repro.core import schema as S
from repro.core.config import ScaledConfig
from repro.ontology.model import Ontology

#: Values per attribute type; small closed vocab so value entities repeat
#: across products (needed for link prediction to be learnable).
N_VALUES_PER_ATTR = 20

#: Marketing / filler tokens that make titles noisy and summaries useful.
NOISE_TOKENS = [f"noise_{w}" for w in (
    "hot", "sale", "new", "2022", "free", "ship", "promo", "deal", "best",
    "top", "lux", "chic", "trend", "vip", "gift", "plus", "pro", "max",
    "mini", "ultra", "eco", "soft", "cool", "fine", "pure", "easy", "fast",
    "safe", "fresh", "smart",
)]

#: General-domain tokens (disjoint from e-commerce vocab) — the corpus the
#: RoBERTa/mT5/BERT substitutes are "pre-trained" on.
GENERAL_TOKENS = [f"gen_{i:03d}" for i in range(300)]


def _misspell(word: str) -> str:
    """Deterministic adjacent-character swap misspelling."""
    if len(word) < 4:
        return word + "x"
    mid = len(word) // 2
    return word[: mid - 1] + word[mid] + word[mid - 1] + word[mid + 1 :]


@dataclasses.dataclass
class SurfaceForms:
    """Surface-form tables for one ontology.

    ``brand_forms`` / ``place_forms`` columns: node_id, surface, form
    (canonical|alias|misspelled).  ``attr_values[rel]`` is the ordered
    value vocabulary of one attribute relation.
    """

    brand_forms: pd.DataFrame
    place_forms: pd.DataFrame
    attr_values: Dict[str, List[str]]

    def canonical(self, which: str) -> pd.DataFrame:
        df = self.brand_forms if which == "Brand" else self.place_forms
        return df[df["form"] == "canonical"].reset_index(drop=True)

    def synonym_table(self, which: str) -> pd.DataFrame:
        """All (surface → node) pairs — the matcher's dictionary input."""
        df = self.brand_forms if which == "Brand" else self.place_forms
        return df[["surface", "node_id", "form"]].reset_index(drop=True)


def _forms_for(nodes: pd.DataFrame, stem: str) -> pd.DataFrame:
    rows = []
    for nid in nodes["node_id"]:
        canon = f"{stem}_{nid.split(':')[1].lower()}"
        rows.append({"node_id": nid, "surface": canon, "form": "canonical"})
        rows.append({"node_id": nid, "surface": canon + "co", "form": "alias"})
        rows.append({"node_id": nid, "surface": _misspell(canon), "form": "misspelled"})
    return pd.DataFrame(rows)


def build_surface_forms(onto: Ontology) -> SurfaceForms:
    """Build all surface forms for one (scaled) ontology.

    Attribute-value tokens are *opaque*: a deterministic shuffled global
    index (``val01234``) that does not encode the owning attribute type,
    so the NER downstream task cannot read the answer off the token
    surface — only memorization, embeddings, or a KG gazetteer reveal
    which attribute a value belongs to.
    """
    import numpy as np

    brand_leaves = onto.taxonomies["Brand"].leaves()
    place_leaves = onto.taxonomies["Place"].leaves()
    cfg: ScaledConfig = onto.cfg
    n_attr = cfg.n_attribute_rel_types
    perm = np.random.default_rng(911).permutation(n_attr * N_VALUES_PER_ATTR)
    attr_values = {
        S.attr_rel(i): [
            f"val{perm[i * N_VALUES_PER_ATTR + j]:05d}"
            for j in range(N_VALUES_PER_ATTR)
        ]
        for i in range(n_attr)
    }
    return SurfaceForms(
        brand_forms=_forms_for(brand_leaves, "brand"),
        place_forms=_forms_for(place_leaves, "place"),
        attr_values=attr_values,
    )
