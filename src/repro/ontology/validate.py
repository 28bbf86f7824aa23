"""Triple-store validation against the ontology (Jena rule-engine role).

The paper's ontology "imposes constraints on the links coupled with
business logic" (Sec. II-A): object properties constrain the type of
head (domain) and tail (range).  Here those constraints are checked at
scale with DataFrame joins instead of a JVM rule engine:

- **unknown-relation**: every ``r`` must be a declared property;
- **range**: tails of ranged object properties must be taxonomy nodes of
  the declared root (e.g. ``placeOfOrigin`` tails under Place);
- **domain**: heads of Category-domained object properties must be
  products instantiating some category (``rdf:type`` to a cat: node);
- **taxonomy-acyclic**: the subClassOf/broader forests contain no cycle
  (checked in pandas — taxonomy tables are small by construction).
"""
from __future__ import annotations

from typing import Dict

import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession

from repro.core import schema as S
from repro.ontology.model import Ontology


def _node_root_df(spark: SparkSession, onto: Ontology) -> DataFrame:
    nodes = onto.all_nodes()[["node_id", "root"]]
    return spark.createDataFrame(nodes)


def _ranged_props_df(spark: SparkSession, onto: Ontology) -> DataFrame:
    rows = [
        (p.name, p.range_)
        for p in onto.properties.values()
        if p.kind == S.KIND_OBJECT and p.range_ is not None
    ]
    return spark.createDataFrame(pd.DataFrame(rows, columns=["r", "range_root"]))


def unknown_relation_violations(triples: DataFrame, onto: Ontology) -> DataFrame:
    """Triples whose relation is not declared in the ontology."""
    spark = triples.sparkSession
    known = spark.createDataFrame(
        pd.DataFrame({"r": sorted(onto.properties)})
    )
    return triples.join(known, on="r", how="left_anti")


def range_violations(triples: DataFrame, onto: Ontology) -> DataFrame:
    """Object triples whose tail is not a node of the declared range root."""
    spark = triples.sparkSession
    ranged = _ranged_props_df(spark, onto)
    node_root = _node_root_df(spark, onto).withColumnRenamed("node_id", "t")
    obj = triples.filter(F.col("rel_kind") == S.KIND_OBJECT).join(ranged, on="r")
    joined = obj.join(node_root, on="t", how="left")
    return joined.filter(
        F.col("root").isNull() | (F.col("root") != F.col("range_root"))
    ).select("h", "r", "t", "rel_kind")


def domain_violations(triples: DataFrame, onto: Ontology) -> DataFrame:
    """Category-domained object triples whose head is not a typed product.

    A head satisfies the Category domain iff it has an ``rdf:type``
    triple whose tail is a Category taxonomy node, or is itself a
    Category node (inMarket* links originate at categories).
    """
    cat_prefix = S.TAXONOMY_PREFIX["Category"]
    typed_heads = (
        triples.filter(
            (F.col("r") == S.RDF_TYPE) & F.col("t").startswith(cat_prefix)
        )
        .select(F.col("h").alias("typed_h"))
        .distinct()
    )
    cat_domained = [
        p.name
        for p in onto.properties.values()
        if p.kind == S.KIND_OBJECT and p.domain == "Category"
    ]
    obj = triples.filter(F.col("r").isin(cat_domained))
    ok_as_category = F.col("h").startswith(cat_prefix)
    joined = obj.join(typed_heads, obj.h == typed_heads.typed_h, how="left")
    return joined.filter(
        F.col("typed_h").isNull() & ~ok_as_category
    ).select("h", "r", "t", "rel_kind")


def taxonomy_is_acyclic(onto: Ontology) -> bool:
    """True iff every taxonomy forest is cycle-free (strictly level-up)."""
    for tax in onto.taxonomies.values():
        lut = tax.nodes.set_index("node_id")["level"]
        edges = tax.edges()
        child_lvl = edges["child"].map(lut)
        parent_lvl = edges["parent"].map(lut).fillna(0)  # anchors: level 0
        if not (parent_lvl < child_lvl).all():
            return False
    return True


def validation_report(triples: DataFrame, onto: Ontology) -> Dict[str, int]:
    """Counts of violations per check; all-zero for a well-formed KG."""
    return {
        "unknown_relation": unknown_relation_violations(triples, onto).count(),
        "range": range_violations(triples, onto).count(),
        "domain": domain_violations(triples, onto).count(),
        "taxonomy_cycles": 0 if taxonomy_is_acyclic(onto) else 1,
    }
