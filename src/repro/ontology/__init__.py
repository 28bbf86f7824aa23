"""Ontology substrate — the reproduction's Apache Jena substitute.

The paper formalizes the OpenBG ontology with the Jena ontology API and
populates it with the RDF API (Sec. II-A, "Automation of OpenBG").  Here
the same roles are played by:

- :mod:`repro.ontology.taxonomy` — level-wise taxonomy construction
  (node tables + rdfs:subClassOf / skos:broader edges);
- :mod:`repro.ontology.model` — the ontology object (classes, concepts,
  object/data/meta properties with domain/range constraints);
- :mod:`repro.ontology.validate` — DataFrame-level validation of a
  triple store against the ontology (domain/range, typing, acyclicity).
"""
from repro.ontology.model import Ontology, PropertySpec, build_core_ontology
from repro.ontology.taxonomy import Taxonomy, build_taxonomy

__all__ = [
    "Ontology",
    "PropertySpec",
    "build_core_ontology",
    "Taxonomy",
    "build_taxonomy",
]
