"""Tests for the core ontology object and its axiom emission."""
import pytest

from repro.core import schema as S
from repro.core.config import CLASS_TYPES, CONCEPT_TYPES, ScaledConfig, TEST_CONFIG
from repro.ontology import build_core_ontology


@pytest.fixture(scope="module")
def onto():
    return build_core_ontology(TEST_CONFIG)


def test_all_eight_taxonomies_present(onto):
    assert set(onto.taxonomies) == set(CLASS_TYPES) | set(CONCEPT_TYPES)


def test_class_concept_split(onto):
    assert set(onto.class_taxonomies) == set(CLASS_TYPES)
    assert set(onto.concept_taxonomies) == set(CONCEPT_TYPES)
    assert onto.n_core_classes == sum(
        t.n_nodes for t in onto.class_taxonomies.values()
    )


def test_relation_vocabulary_composition(onto):
    cfg = TEST_CONFIG
    n_obj = 6 + cfg.n_inmarket_rel_types
    n_data = 6 + cfg.n_attribute_rel_types
    n_meta = len(S.META_PROPERTIES)
    assert len(onto.property_names("object")) == n_obj
    assert len(onto.property_names("data")) == n_data
    assert len(onto.property_names("meta")) == n_meta
    assert onto.n_relation_types == n_obj + n_data + n_meta


@pytest.mark.parametrize("rel,range_", list(S.OBJECT_PROPERTY_RANGE.items()))
def test_named_object_property_domains_ranges(onto, rel, range_):
    p = onto.properties[rel]
    assert p.kind == "object"
    assert p.domain == "Category"
    assert p.range_ == range_


def test_inmarket_family_ranges(onto):
    p = onto.properties[S.inmarket_rel(0)]
    assert p.range_ == "MarketSegment"
    assert p.domain == "Category"


def test_attr_family_are_data_literals(onto):
    p = onto.properties[S.attr_rel(0)]
    assert p.kind == "data"
    assert p.range_ == "literal"


def test_axioms_subclassof_covers_every_class_node(onto):
    ax = onto.axiom_triples()
    sub = ax[ax["r"] == S.RDFS_SUBCLASSOF]
    # one edge per class node + 3 anchors under owl:Thing
    assert len(sub) == onto.n_core_classes + len(CLASS_TYPES)
    assert (sub[sub["t"] == S.OWL_THING]["h"].sort_values().tolist()) == sorted(
        CLASS_TYPES
    )


def test_axioms_broader_covers_every_concept_node(onto):
    ax = onto.axiom_triples()
    br = ax[ax["r"] == S.SKOS_BROADER]
    assert len(br) == onto.n_core_concepts + len(CONCEPT_TYPES)
    assert set(br[br["t"] == S.SKOS_CONCEPT]["h"]) == set(CONCEPT_TYPES)


def test_axioms_all_meta_kind(onto):
    ax = onto.axiom_triples()
    assert (ax["rel_kind"] == S.KIND_META).all()


def test_axioms_deterministic(onto):
    a = onto.axiom_triples()
    b = build_core_ontology(TEST_CONFIG).axiom_triples()
    assert a.equals(b)


def test_equivalentclass_rate_tracks_paper():
    """~0.44 equivalence links per class/concept node (Table I ratio)."""
    cfg = ScaledConfig(scale=3e-4, rel_scale=0.05, seed=11)
    onto = build_core_ontology(cfg)
    ax = onto.axiom_triples()
    n_eq = (ax["r"] == S.OWL_EQUIVALENTCLASS).sum()
    n_nodes = onto.n_core_classes + onto.n_core_concepts
    assert 0.3 < n_eq / n_nodes < 0.6


def test_property_axioms_point_to_cnschema(onto):
    ax = onto.axiom_triples()
    pp = ax[ax["r"].isin([S.RDFS_SUBPROPERTYOF, S.OWL_EQUIVALENTPROPERTY])]
    assert pp["t"].str.startswith("cnschema:").all()
    assert pp["h"].isin(set(onto.properties)).all()


def test_all_nodes_concat(onto):
    total = sum(t.n_nodes for t in onto.taxonomies.values())
    assert len(onto.all_nodes()) == total
    assert onto.all_nodes()["node_id"].is_unique
