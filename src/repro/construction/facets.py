"""Multi-faceted quality scoring of concept statements (Sec. II-C(2)).

A *statement* is ⟨category, relation, concept⟩ — e.g. ⟨sports shoes,
forCrowd, the elderly⟩.  Following the paper's four dimensions:

- **plausibility**  — the statement has support (≥1 product of the
  category carries the link);
- **typicality**    — valid for the majority of instances: the fraction
  of the category's products carrying the link;
- **remarkability** — distinguishable from closely related categories:
  the statement's typicality relative to the mean typicality of the
  same ⟨relation, concept⟩ across *sibling* categories;
- **salience**      — typical ∧ remarkable (the paper: "a statement
  both satisfying Typicality and Remarkability implies Salience").

All scores are Spark aggregations over product→concept links joined
with the product→category table, so they scale with the catalogue.
"""
from __future__ import annotations

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession

from repro.ontology.model import Ontology

#: Default thresholds for the boolean facets.
TYPICALITY_TAU = 0.5
REMARKABILITY_TAU = 1.2


def statement_scores(
    spark: SparkSession,
    links: DataFrame,
    product_categories: DataFrame,
    onto: Ontology,
    typicality_tau: float = TYPICALITY_TAU,
    remarkability_tau: float = REMARKABILITY_TAU,
) -> DataFrame:
    """Score every observed ⟨category, r, concept⟩ statement.

    ``links``: (product_id, r, t) product→concept rows.
    ``product_categories``: (product_id, category).

    Returns (category, r, t, support, typicality, remarkability,
    plausible, typical, remarkable, salient).
    """
    cat_sizes = product_categories.groupBy("category").agg(
        F.count("*").alias("cat_size")
    )
    stmts = (
        links.join(product_categories, on="product_id")
        .groupBy("category", "r", "t")
        .agg(F.count("*").alias("support"))
        .join(cat_sizes, on="category")
        .withColumn("typicality", F.col("support") / F.col("cat_size"))
    )

    # sibling structure: categories sharing a parent node
    parents = spark.createDataFrame(
        onto.taxonomies["Category"].nodes[["node_id", "parent_id"]].rename(
            columns={"node_id": "category", "parent_id": "parent"}
        )
    )
    with_parent = stmts.join(parents, on="category")
    sib_mean = with_parent.groupBy("parent", "r", "t").agg(
        F.avg("typicality").alias("sib_typicality"),
        F.count("*").alias("n_sib_stmts"),
    )
    scored = (
        with_parent.join(sib_mean, on=["parent", "r", "t"])
        .withColumn(
            "remarkability", F.col("typicality") / F.col("sib_typicality")
        )
        .withColumn("plausible", F.col("support") >= 1)
        .withColumn("typical", F.col("typicality") >= F.lit(typicality_tau))
        .withColumn(
            "remarkable",
            (F.col("remarkability") >= F.lit(remarkability_tau))
            | (F.col("n_sib_stmts") == 1),
        )
        .withColumn("salient", F.col("typical") & F.col("remarkable"))
    )
    return scored.select(
        "category", "r", "t", "support", "typicality", "remarkability",
        "plausible", "typical", "remarkable", "salient",
    )
