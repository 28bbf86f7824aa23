"""The OpenBG core ontology object (Jena ontology-API substitute).

An :class:`Ontology` holds the eight taxonomies (3 classes + 5
concepts), the property vocabulary with domain/range constraints, and
emits its own axiom triples (rdfs:subClassOf, skos:broader,
owl:equivalentClass on nodes; rdfs:subPropertyOf /
owl:equivalentPropertyOf on properties) exactly as Sec. II-A describes.
"""
from __future__ import annotations

import dataclasses
from typing import Dict, List, Optional

import numpy as np
import pandas as pd

from repro.core import schema as S
from repro.core.config import (
    CLASS_TYPES,
    CONCEPT_TYPES,
    PAPER_META_PROPERTY_COUNTS,
    PAPER_N_CORE_CLASSES,
    PAPER_N_CORE_CONCEPTS,
    PAPER_N_RELATION_TYPES,
    ScaledConfig,
)
from repro.ontology.taxonomy import Taxonomy, build_taxonomy


@dataclasses.dataclass(frozen=True)
class PropertySpec:
    """One relation type with its kind and (optional) domain/range.

    ``domain``/``range_`` name a taxonomy root ("Category", "Brand", …),
    the literal sentinel "literal" (data properties), or None (no
    constraint — meta-properties).  Products instantiate categories, so
    a domain of "Category" admits products typed under any category.
    """

    name: str
    kind: str  # object | data | meta
    domain: Optional[str] = None
    range_: Optional[str] = None


class Ontology:
    """Classes, concepts and relations of one (scaled) OpenBG."""

    def __init__(
        self,
        taxonomies: Dict[str, Taxonomy],
        properties: List[PropertySpec],
        cfg: ScaledConfig,
    ):
        self.taxonomies = taxonomies
        self.properties = {p.name: p for p in properties}
        self.cfg = cfg

    # ---- accessors --------------------------------------------------------
    @property
    def class_taxonomies(self) -> Dict[str, Taxonomy]:
        return {k: v for k, v in self.taxonomies.items() if k in CLASS_TYPES}

    @property
    def concept_taxonomies(self) -> Dict[str, Taxonomy]:
        return {k: v for k, v in self.taxonomies.items() if k in CONCEPT_TYPES}

    @property
    def n_core_classes(self) -> int:
        return sum(t.n_nodes for t in self.class_taxonomies.values())

    @property
    def n_core_concepts(self) -> int:
        return sum(t.n_nodes for t in self.concept_taxonomies.values())

    @property
    def n_relation_types(self) -> int:
        return len(self.properties)

    def property_names(self, kind: Optional[str] = None) -> List[str]:
        return [
            p.name
            for p in self.properties.values()
            if kind is None or p.kind == kind
        ]

    def nodes(self, root: str) -> pd.DataFrame:
        return self.taxonomies[root].nodes

    def all_nodes(self) -> pd.DataFrame:
        """Every taxonomy node across the eight forests, one frame."""
        return pd.concat(
            [t.nodes for t in self.taxonomies.values()], ignore_index=True
        )

    # ---- axiom emission ---------------------------------------------------
    def axiom_triples(self) -> pd.DataFrame:
        """Meta-property triples the ontology itself contributes.

        - every class node: ⟨node, rdfs:subClassOf, parent⟩ (+ the three
          class anchors under owl:Thing);
        - every concept node: ⟨node, skos:broader, parent⟩ (+ the five
          concept anchors under skos:Concept);
        - owl:equivalentClass links to exogenous objects at the paper's
          per-node rate (~0.44);
        - rdfs:subPropertyOf / owl:equivalentPropertyOf links from
          attribute data-properties to a synthetic cnSchema namespace at
          the paper's per-relation-type rates.
        """
        rows: List[tuple] = []
        for root in CLASS_TYPES:
            rows.append((root, S.RDFS_SUBCLASSOF, S.OWL_THING))
            for child, parent in self.taxonomies[root].edges().itertuples(index=False):
                rows.append((child, S.RDFS_SUBCLASSOF, parent))
        for root in CONCEPT_TYPES:
            rows.append((root, S.SKOS_BROADER, S.SKOS_CONCEPT))
            for child, parent in self.taxonomies[root].edges().itertuples(index=False):
                rows.append((child, S.SKOS_BROADER, parent))

        g = np.random.default_rng(self.cfg.derived_seed("ontology-axioms"))
        # owl:equivalentClass — per class/concept node, paper rate.
        eq_rate = PAPER_META_PROPERTY_COUNTS["owl:equivalentClass"] / (
            PAPER_N_CORE_CLASSES + PAPER_N_CORE_CONCEPTS
        )
        all_ids = self.all_nodes()["node_id"].to_numpy()
        picked = all_ids[g.random(len(all_ids)) < eq_rate]
        rows.extend((nid, S.OWL_EQUIVALENTCLASS, f"ext:{i:06d}") for i, nid in enumerate(picked))

        # property-of-property axioms on data/attribute properties.
        sub_rate = PAPER_META_PROPERTY_COUNTS["rdfs:subPropertyOf"] / PAPER_N_RELATION_TYPES
        eqp_rate = PAPER_META_PROPERTY_COUNTS["owl:equivalentPropertyOf"] / PAPER_N_RELATION_TYPES
        props = np.array(sorted(self.properties))
        for name in props[g.random(len(props)) < sub_rate]:
            rows.append((name, S.RDFS_SUBPROPERTYOF, f"cnschema:{name}"))
        for name in props[g.random(len(props)) < eqp_rate]:
            rows.append((name, S.OWL_EQUIVALENTPROPERTY, f"cnschema:{name}"))

        out = pd.DataFrame(rows, columns=["h", "r", "t"])
        out["rel_kind"] = S.KIND_META
        return out


def build_core_ontology(cfg: ScaledConfig) -> Ontology:
    """Build the scaled OpenBG core ontology (Fig. 2 at scale).

    Taxonomies for the eight roots, plus the full relation vocabulary:
    6 named object properties, the inMarket* family, 6 named data
    properties, the attr:* family, and the 6 W3C meta-properties.
    """
    taxonomies = {
        root: build_taxonomy(
            root, cfg.taxonomy_levels(root), cfg.derived_seed(f"tax-{root}")
        )
        for root in list(CLASS_TYPES) + list(CONCEPT_TYPES)
    }

    props: List[PropertySpec] = []
    for name in S.NAMED_OBJECT_PROPERTIES:
        props.append(
            PropertySpec(
                name,
                S.KIND_OBJECT,
                domain="Category",
                range_=S.OBJECT_PROPERTY_RANGE[name],
            )
        )
    for i in range(cfg.n_inmarket_rel_types):
        props.append(
            PropertySpec(
                S.inmarket_rel(i),
                S.KIND_OBJECT,
                domain="Category",
                range_="MarketSegment",
            )
        )
    for name in S.NAMED_DATA_PROPERTIES:
        props.append(PropertySpec(name, S.KIND_DATA, domain=None, range_="literal"))
    for i in range(cfg.n_attribute_rel_types):
        props.append(
            PropertySpec(S.attr_rel(i), S.KIND_DATA, domain="Category", range_="literal")
        )
    for name in S.META_PROPERTIES:
        props.append(PropertySpec(name, S.KIND_META))

    return Ontology(taxonomies, props, cfg)
