"""Synthetic customer reviews with ground-truth opinion triples.

Reviews drive two parts of the reproduction: the bottom-up concept
pipeline mines them (Sec. II-C extracts concepts from "user-written
reviews, product titles, and search queries"), and the IE-for-reviews
downstream task (Sec. IV-E) extracts ⟨aspect, property, opinion⟩
triples from them.  Each review embeds 1–3 such triples in filler
tokens, mirroring the paper's example ⟨cushion, quality, nice⟩.
"""
from __future__ import annotations

from typing import List

import numpy as np
import pandas as pd

from repro.core.config import ScaledConfig
from repro.corpus.products import RawCatalog
from repro.ontology.model import Ontology

#: Property → opinion vocabulary (positive/negative surface tokens).
REVIEW_PROPERTIES = {
    "prop_quality": ["op_good", "op_bad", "op_solid", "op_flimsy"],
    "prop_size": ["op_fits", "op_small", "op_large", "op_exact"],
    "prop_price": ["op_cheap", "op_costly", "op_fair"],
    "prop_speed": ["op_quick", "op_slow"],
    "prop_look": ["op_pretty", "op_plain", "op_stylish"],
}

REVIEW_FILLER = [f"rf_{w}" for w in (
    "bought", "for", "my", "dad", "really", "like", "it", "very", "much",
    "came", "today", "will", "buy", "again", "store", "nice", "pack",
)]

#: Mean reviews per product.
REVIEWS_PER_PRODUCT = 2.0


def generate_reviews(
    onto: Ontology, catalog: RawCatalog, cfg: ScaledConfig
) -> pd.DataFrame:
    """Reviews frame: review_id, product_id, text, gold.

    ``gold`` encodes the embedded triples as
    ``aspect|property|opinion;...`` — aspects are the product's category
    label (the noun a customer uses for the item), properties/opinions
    from the closed review vocabulary.  The concept pipeline also finds
    concept labels here: each review mentions one of the product's
    linked concepts with probability 0.3.
    """
    g = np.random.default_rng(cfg.derived_seed("reviews"))
    cat_label = onto.taxonomies["Category"].nodes.set_index("node_id")["label"]
    concept_label = {}
    for tax in onto.concept_taxonomies.values():
        concept_label.update(
            dict(tax.nodes[["node_id", "label"]].itertuples(index=False))
        )
    links_by_p = catalog.concept_links.groupby("product_id")["t"].agg(list)

    props = list(REVIEW_PROPERTIES)
    rows = []
    rid = 0
    for pid, cat in catalog.products[["product_id", "category"]].itertuples(
        index=False
    ):
        for _ in range(int(g.poisson(REVIEWS_PER_PRODUCT))):
            aspect = cat_label[cat]
            k = int(g.integers(1, 4))
            chosen = g.choice(props, size=k, replace=False)
            gold: List[str] = []
            toks: List[str] = list(g.choice(REVIEW_FILLER, size=4, replace=False))
            for pr in chosen:
                op = str(g.choice(REVIEW_PROPERTIES[pr]))
                gold.append(f"{aspect}|{pr}|{op}")
                # 25% of mentions invert opinion/property order ("good
                # quality" vs "quality good") — the adjacency heuristic
                # every extractor uses then errs, an irreducible floor
                if g.random() < 0.25:
                    toks += [aspect, op, pr]
                else:
                    toks += [aspect, pr, op]
            # distractors: stray opinion/property mentions outside any
            # triple ("fast delivery though" style) give IE an error
            # floor — extraction must rely on structure, not lexicon hits
            if g.random() < 0.25:
                stray_pr = str(g.choice(props))
                toks.append(str(g.choice(REVIEW_PROPERTIES[stray_pr])))
            if g.random() < 0.15:
                unused = [p for p in props if p not in chosen]
                if unused:
                    toks.append(str(g.choice(unused)))
            if pid in links_by_p.index and g.random() < 0.3:
                toks.append(concept_label[str(g.choice(links_by_p[pid]))])
            toks += list(g.choice(REVIEW_FILLER, size=2, replace=False))
            rows.append(
                {
                    "review_id": f"rev:{rid:08d}",
                    "product_id": pid,
                    "text": " ".join(toks),
                    "gold": ";".join(gold),
                }
            )
            rid += 1
    return pd.DataFrame(rows)
