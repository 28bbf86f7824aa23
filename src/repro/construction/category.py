"""Top-down Category construction and quality review (Sec. II-B).

The taxonomy itself comes from :mod:`repro.ontology.taxonomy` (the
"define Category and taxonomy" step); this module covers the remaining
two steps:

- **instantiation** — products become multimodal instances of leaf
  categories (``rdf:type`` rows), the "create multimodal instances"
  step;
- **quality review** — the paper's daily expert review (30 person/day)
  checks five factors; the mechanically checkable ones are computed
  here per category: completeness (non-leaf has children), exclusivity
  (single parent), popularity (leaf has products).
"""
from __future__ import annotations

import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession

from repro.core import schema as S
from repro.ontology.model import Ontology


def instantiate_products(
    spark: SparkSession, products: pd.DataFrame
) -> DataFrame:
    """⟨product, rdf:type, leaf-category⟩ triples for every product."""
    pdf = products[["product_id", "category"]].rename(
        columns={"product_id": "h", "category": "t"}
    )
    pdf["r"] = S.RDF_TYPE
    pdf["rel_kind"] = S.KIND_META
    return spark.createDataFrame(pdf[["h", "r", "t", "rel_kind"]])


def category_quality_report(
    spark: SparkSession, onto: Ontology, products: pd.DataFrame
) -> DataFrame:
    """Per-category review table.

    Columns: node_id, level, is_leaf, n_children, n_products,
    complete (non-leaf ⇒ has children), popular (leaf ⇒ has products).
    """
    nodes = onto.taxonomies["Category"].nodes
    child_counts = (
        nodes.groupby("parent_id").size().rename("n_children").reset_index()
    )
    rep = nodes.merge(
        child_counts, left_on="node_id", right_on="parent_id", how="left",
        suffixes=("", "_c"),
    )[["node_id", "level", "is_leaf", "n_children"]]
    rep["n_children"] = rep["n_children"].fillna(0).astype(int)

    prod_counts = (
        products.groupby("category").size().rename("n_products").reset_index()
    )
    rep = rep.merge(
        prod_counts, left_on="node_id", right_on="category", how="left"
    )[["node_id", "level", "is_leaf", "n_children", "n_products"]]
    rep["n_products"] = rep["n_products"].fillna(0).astype(int)

    sdf = spark.createDataFrame(rep)
    return sdf.withColumn(
        "complete", F.col("is_leaf") | (F.col("n_children") > 0)
    ).withColumn("popular", ~F.col("is_leaf") | (F.col("n_products") > 0))
