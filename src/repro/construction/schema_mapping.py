"""Brand/Place linking: trie precise matching + fuzzy synonym matching.

Sec. II-B(3): "for each product containing place and brand information,
we map the textual labels of its place and brand to standard names
defined in 'Place' and 'Brand' taxonomy, by jointly conducting trie
prefix tree precise matching and fuzzy matching of synonyms."

The matcher runs in three stages per raw surface string:

1. **precise** — exact trie hit on the canonical-name trie;
2. **synonym** — exact trie hit on the synonym trie (registered aliases);
3. **fuzzy** — bounded-edit-distance scan (k=1) over the synonym table,
   catching misspellings neither trie lists.

Distribution: the tries/table are broadcast, and matching runs inside
``mapInPandas`` so a billion-row catalogue links without collecting to
the driver.
"""
from __future__ import annotations

from typing import Iterator, List, Optional, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.types import StringType, StructField, StructType

from repro.construction.trie import Trie, bounded_levenshtein
from repro.corpus.vocab import SurfaceForms

#: Output schema of the linking stage.
LINK_SCHEMA = StructType(
    [
        StructField("product_id", StringType(), False),
        StructField("surface", StringType(), True),
        StructField("node_id", StringType(), True),
        StructField("method", StringType(), True),  # precise|synonym|fuzzy|None
    ]
)


class SurfaceMatcher:
    """Picklable matcher over one class's surface-form dictionary."""

    def __init__(self, synonym_table: pd.DataFrame):
        canon = synonym_table[synonym_table["form"] == "canonical"]
        self.precise_trie = Trie.from_pairs(
            zip(canon["surface"], canon["node_id"])
        )
        self.synonym_trie = Trie.from_pairs(
            zip(synonym_table["surface"], synonym_table["node_id"])
        )
        # fuzzy scan list: (surface, node) — small, vocabulary-sized
        self.entries: List[Tuple[str, str]] = list(
            zip(synonym_table["surface"], synonym_table["node_id"])
        )

    #: fuzzy budget: adjacent-character swaps cost 2 plain-Levenshtein
    #: edits, so k=2 is the smallest bound that absorbs them.
    FUZZY_K = 2

    def match(self, raw: Optional[str]) -> Tuple[Optional[str], Optional[str]]:
        """(node_id, method) for one raw string; (None, None) on miss.

        Fuzzy stage keeps the *minimum-distance* candidate: dictionary
        surfaces can be 1 edit apart from each other (brand_…00004 vs
        …00005), so first-hit-wins would mislink misspellings.
        """
        if raw is None or raw == "":
            return None, None
        hit = self.precise_trie.lookup(raw)
        if hit is not None:
            return hit, "precise"
        hit = self.synonym_trie.lookup(raw)
        if hit is not None:
            return hit, "synonym"
        best_d, best_node = None, None
        for surface, node in self.entries:
            d = bounded_levenshtein(raw, surface, self.FUZZY_K)
            if d is not None and (best_d is None or d < best_d):
                best_d, best_node = d, node
                if d == 1:
                    break
        if best_node is not None:
            return best_node, "fuzzy"
        return None, None


def build_matcher(forms: SurfaceForms, which: str) -> SurfaceMatcher:
    """Matcher for "Brand" or "Place" from the registered surface forms.

    The *misspelled* variants are deliberately excluded from the
    dictionary — they model out-of-dictionary noise the fuzzy stage must
    absorb, which is what distinguishes it from the synonym stage.
    """
    tbl = forms.synonym_table(which)
    return SurfaceMatcher(tbl[tbl["form"] != "misspelled"].reset_index(drop=True))


def link_surfaces(
    spark: SparkSession,
    products: DataFrame,
    matcher: SurfaceMatcher,
    surface_col: str,
) -> DataFrame:
    """Distributed linking: products(product_id, <surface_col>) → links.

    Returns one row per product with the resolved node and method (nulls
    for products with no raw string or no acceptable match).
    """
    bc = spark.sparkContext.broadcast(matcher)

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        m = bc.value
        for pdf in batches:
            out = pdf[["product_id"]].copy()
            matched = [m.match(s) for s in pdf[surface_col]]
            out["surface"] = pdf[surface_col].values
            out["node_id"] = [n for n, _ in matched]
            out["method"] = [meth for _, meth in matched]
            yield out

    return products.select("product_id", surface_col).mapInPandas(
        run, schema=LINK_SCHEMA
    )


def linking_quality(links: DataFrame, truth: pd.DataFrame, which: str) -> dict:
    """Precision/recall of linking against generator ground truth.

    ``truth`` columns: product_id, ``brand_node``/``place_node``.
    Precision over emitted links; recall over products that truly carry
    the class.  Used by tests to assert the pipeline works, mirroring
    the paper's human quality review.
    """
    col = "brand_node" if which == "Brand" else "place_node"
    got = links.toPandas().set_index("product_id")["node_id"]
    t = truth.set_index("product_id")[col]
    emitted = got.dropna()
    correct = (emitted == t.loc[emitted.index]).sum()
    has_true = t.dropna()
    recalled = (got.loc[has_true.index].dropna() == has_true).sum()
    return {
        "precision": correct / max(1, len(emitted)),
        "recall": recalled / max(1, len(has_true)),
        "n_emitted": int(len(emitted)),
        "n_true": int(len(has_true)),
    }
