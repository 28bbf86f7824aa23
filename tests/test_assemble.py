"""Integration tests: full KG assembly, Table-I stats, and validation."""
import pandas as pd
import pytest
import pyspark.sql.functions as F

from repro.core import schema as S
from repro.core.config import (
    PAPER_N_ENTITIES,
    PAPER_N_TRIPLES,
    PAPER_OBJECT_PROPERTY_COUNTS,
    TEST_CONFIG,
)
from repro.construction import stats
from repro.construction.assemble import build_world
from repro.construction.category import category_quality_report
from repro.ontology.validate import validation_report
from repro.oracle import assert_equivalent


def test_triples_schema(kg):
    assert [f.name for f in kg.triples.schema.fields] == ["h", "r", "t", "rel_kind"]


def test_triples_are_a_set(kg):
    assert kg.triples.count() == kg.triples.dropDuplicates(["h", "r", "t"]).count()


def test_entities_identity_and_scale(kg):
    """rdf:type count == #entities; entities ≈ paper × scale (±25%)."""
    o = stats.overall_stats(kg)
    n_type = kg.triples.filter(F.col("r") == S.RDF_TYPE).count()
    assert n_type == o["n_entities"]
    target = PAPER_N_ENTITIES * TEST_CONFIG.scale
    assert 0.75 * target < o["n_entities"] < 1.25 * target


def test_total_triples_within_band(kg):
    """Total triples lands in a wide band around paper × scale.

    Small-scale saturation (closed concept vocabularies) trims the
    high-rate relations, so the lower bound is loose — the exact
    paper-vs-measured diff is recorded in EXPERIMENTS.md.
    """
    n = stats.overall_stats(kg)["n_triples"]
    target = PAPER_N_TRIPLES * TEST_CONFIG.scale
    # at 1e-4 the structured inMarket pair space saturates hard (~0.29);
    # the ratio recovers toward ~0.45+ at 1e-3 and above
    assert 0.25 * target < n < 1.5 * target


def test_inmarket_dominates(kg):
    """inMarket* is the largest relation family, as in Table I."""
    rel = stats.relation_stats(kg)
    assert rel["inMarket*"] == max(rel.values())


def test_named_relation_counts_track_paper_rates(kg):
    rel = stats.relation_stats(kg)
    n = TEST_CONFIG.n_products
    for name in ("brandIs", "placeOfOrigin"):
        rate = PAPER_OBJECT_PROPERTY_COUNTS[name] / 3_062_313
        assert 0.5 * rate * n < rel[name] < 1.5 * rate * n


def test_label_comment_counts_equal_products(kg):
    rel = stats.relation_stats(kg)
    assert rel["rdfs:label"] == TEST_CONFIG.n_products
    assert rel["rdfs:comment"] == TEST_CONFIG.n_products
    assert rel["labelEn"] == TEST_CONFIG.n_products


def test_concept_label_counts_equal_concepts(kg):
    rel = stats.relation_stats(kg)
    assert rel["skos:prefLabel"] == kg.onto.n_core_concepts
    assert rel["skos:altLabel"] == kg.onto.n_core_concepts


def test_kind_partition_covers_everything(kg):
    kinds = stats.kind_stats(kg)
    assert set(kinds) == {"object", "data", "meta"}
    assert sum(kinds.values()) == stats.overall_stats(kg)["n_triples"]


def test_validation_clean(kg):
    """The assembled KG satisfies every ontology constraint."""
    rep = validation_report(kg.triples, kg.onto)
    assert rep == {
        "unknown_relation": 0, "range": 0, "domain": 0, "taxonomy_cycles": 0
    }


def test_validation_catches_injected_violations(spark, kg):
    bad = spark.createDataFrame(
        pd.DataFrame(
            {
                "h": ["prod:0000000", "prod:0000000", "prod:9999999"],
                "r": ["noSuchRel", "brandIs", "relatedScene"],
                "t": ["x", "scene:L1_00000", "scene:L1_00000"],
                "rel_kind": ["object", "object", "object"],
            }
        )
    )
    rep = validation_report(kg.triples.unionByName(bad), kg.onto)
    assert rep["unknown_relation"] == 1
    assert rep["range"] == 1      # brandIs → scene node
    assert rep["domain"] == 1     # untyped head prod:9999999


def test_relation_counts_oracle(spark, kg):
    """Oracle-check the per-relation aggregation against DuckDB."""
    pdf = kg.triples.toPandas()
    got = kg.triples.groupBy("r").agg(F.count("*").alias("n"))
    assert_equivalent(got, "SELECT r, COUNT(*) AS n FROM t GROUP BY r", t=pdf)


def test_kind_counts_oracle(spark, kg):
    pdf = kg.triples.toPandas()
    got = kg.triples.groupBy("rel_kind").agg(F.count("*").alias("n"))
    assert_equivalent(
        got, "SELECT rel_kind, COUNT(*) AS n FROM t GROUP BY rel_kind", t=pdf
    )


def test_entity_count_oracle(spark, kg):
    pdf = kg.triples.toPandas()
    got = (
        kg.triples.filter(F.col("r") == "rdf:type")
        .agg(F.countDistinct("h").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT COUNT(DISTINCT h) AS n FROM t WHERE r = 'rdf:type'",
        t=pdf,
    )


def test_relation_distribution_long_tail(kg):
    """Fig. 5's qualitative shape: top relations dwarf the median."""
    dist = stats.relation_frequency_distribution(kg)
    top = dist["n"].iloc[0]
    median = dist["n"].median()
    assert top > 10 * median
    assert len(dist) > 50


def test_taxonomy_stats_block(kg):
    t = stats.taxonomy_stats(kg)
    assert set(t["root"]) == set(kg.onto.taxonomies)
    for _, row in t.iterrows():
        assert sum(row["levels"]) == row["all"]
        assert 1 <= row["leaf"] <= row["all"]


def test_items_typed_to_products(kg):
    items = kg.triples.filter(F.col("h").startswith("item:"))
    assert items.filter(F.col("r") != "rdf:type").count() == 0
    assert items.filter(~F.col("t").startswith("prod:")).count() == 0
    n_items = items.count()
    expected = kg.catalog.products["n_items"].sum()
    assert n_items == expected


def test_multimodal_products_have_image_triples(kg):
    n_img = kg.triples.filter(F.col("r") == S.IMAGE_IS).count()
    assert n_img == int(kg.catalog.products["has_image"].sum())
    assert len(kg.multimodal_products()) == n_img


def test_entity_labels_cover_products_and_nodes(kg):
    labels = kg.entity_labels()
    assert len(labels) == kg.catalog.n_products + len(kg.onto.all_nodes())
    assert labels["entity"].is_unique


def test_category_quality_report(spark, kg):
    rep = category_quality_report(spark, kg.onto, kg.catalog.products).toPandas()
    assert len(rep) == kg.onto.taxonomies["Category"].n_nodes
    assert rep["complete"].all()
    # every product category is a leaf → non-leaves have 0 products
    non_leaf = rep[~rep["is_leaf"]]
    assert (non_leaf["n_products"] == 0).all()


def test_assembly_deterministic(spark, kg):
    kg2 = build_world(spark, TEST_CONFIG)
    assert kg2.triples.count() == kg.triples.count()
    a = stats.relation_stats(kg)
    b = stats.relation_stats(kg2)
    assert a == b
