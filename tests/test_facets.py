"""Tests for multi-faceted concept-statement scoring (Sec. II-C)."""
import pandas as pd
import pytest

from repro.construction.facets import statement_scores
from repro.core.config import TEST_CONFIG
from repro.corpus import build_surface_forms, generate_catalog
from repro.ontology import build_core_ontology
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def world():
    onto = build_core_ontology(TEST_CONFIG)
    forms = build_surface_forms(onto)
    cat = generate_catalog(onto, forms, TEST_CONFIG)
    return onto, cat


@pytest.fixture(scope="module")
def scored(spark, world):
    onto, cat = world
    links = spark.createDataFrame(cat.concept_links)
    prod_cat = spark.createDataFrame(cat.products[["product_id", "category"]])
    return statement_scores(spark, links, prod_cat, onto).cache(), onto, cat


def test_every_observed_statement_scored(scored):
    df, onto, cat = scored
    merged = cat.concept_links.merge(
        cat.products[["product_id", "category"]], on="product_id"
    )
    n_stmts = len(merged[["category", "r", "t"]].drop_duplicates())
    assert df.count() == n_stmts


def test_all_statements_plausible(scored):
    """Observed statements have support ≥ 1 by construction."""
    df, _, _ = scored
    assert df.filter(~df.plausible).count() == 0


def test_typicality_bounds(scored):
    df, _, _ = scored
    pdf = df.toPandas()
    assert (pdf["typicality"] > 0).all()
    assert (pdf["typicality"] <= 1).all()


def test_salient_implies_typical_and_remarkable(scored):
    """The paper: Typicality ∧ Remarkability ⇒ Salience."""
    pdf = scored[0].toPandas()
    sal = pdf[pdf["salient"]]
    assert sal["typical"].all() and sal["remarkable"].all()
    not_sal = pdf[~pdf["salient"]]
    assert (~(not_sal["typical"] & not_sal["remarkable"])).all()


def test_support_oracle(spark, scored, world):
    """Oracle-check the support aggregation against DuckDB."""
    onto, cat = world
    links = spark.createDataFrame(cat.concept_links)
    prod_cat = spark.createDataFrame(cat.products[["product_id", "category"]])
    got = statement_scores(spark, links, prod_cat, onto).select(
        "category", "r", "t", "support"
    )
    sql = """
        SELECT p.category AS category, l.r AS r, l.t AS t,
               COUNT(*) AS support
        FROM links l JOIN prod_cat p USING (product_id)
        GROUP BY 1, 2, 3
    """
    assert_equivalent(got, sql, links=cat.concept_links,
                      prod_cat=cat.products[["product_id", "category"]])


def test_crafted_typicality_and_remarkability(spark):
    """Hand-built example with known facet outcomes.

    Parent P has two sibling leaf categories A (2 products, both linked
    to concept c) and B (2 products, one linked).  For concept c the
    sibling mean typicality is (1.0 + 0.5)/2 = 0.75, so A's statement
    (remarkability 1.33 ≥ 1.2, typicality 1.0 ≥ 0.5) is salient while
    B's (remarkability 0.67) is not.  Concept d is linked only from A:
    single sibling statement → remarkable, typicality 0.5 → salient.
    """
    import repro.ontology.taxonomy as T
    from repro.ontology.model import Ontology
    from repro.core.config import ScaledConfig

    nodes = pd.DataFrame(
        [
            {"node_id": "cat:L1_00000", "root": "Category", "level": 1,
             "parent_id": "Category", "label": "p", "is_leaf": False},
            {"node_id": "cat:L2_00000", "root": "Category", "level": 2,
             "parent_id": "cat:L1_00000", "label": "a", "is_leaf": True},
            {"node_id": "cat:L2_00001", "root": "Category", "level": 2,
             "parent_id": "cat:L1_00000", "label": "b", "is_leaf": True},
        ]
    )
    tax = T.Taxonomy(root="Category", nodes=nodes)
    onto = Ontology({"Category": tax}, [], ScaledConfig())

    prod_cat = pd.DataFrame(
        {
            "product_id": ["p1", "p2", "p3", "p4"],
            "category": ["cat:L2_00000"] * 2 + ["cat:L2_00001"] * 2,
        }
    )
    links = pd.DataFrame(
        {
            "product_id": ["p1", "p2", "p3", "p1"],
            "r": ["relatedScene"] * 4,
            "t": ["scene:c", "scene:c", "scene:c", "scene:d"],
        }
    )
    out = statement_scores(
        spark,
        spark.createDataFrame(links),
        spark.createDataFrame(prod_cat),
        onto,
    ).toPandas().set_index(["category", "t"])

    a_c = out.loc[("cat:L2_00000", "scene:c")]
    b_c = out.loc[("cat:L2_00001", "scene:c")]
    a_d = out.loc[("cat:L2_00000", "scene:d")]
    assert a_c["typicality"] == 1.0 and a_c["typical"]
    assert b_c["typicality"] == 0.5 and b_c["typical"]
    assert abs(a_c["remarkability"] - 4 / 3) < 1e-9 and a_c["salient"]
    assert abs(b_c["remarkability"] - 2 / 3) < 1e-9 and not b_c["salient"]
    assert a_d["salient"]  # only statement among siblings + typicality 0.5


def test_statement_scores_deterministic(scored, spark, world):
    onto, cat = world
    links = spark.createDataFrame(cat.concept_links)
    prod_cat = spark.createDataFrame(cat.products[["product_id", "category"]])
    a = scored[0].toPandas().sort_values(["category", "r", "t"]).reset_index(drop=True)
    b = (
        statement_scores(spark, links, prod_cat, onto)
        .toPandas()
        .sort_values(["category", "r", "t"])
        .reset_index(drop=True)
    )
    pd.testing.assert_frame_equal(a, b)
