"""Table I — statistics of OpenBG (paper vs measured at scale).

Every row pairs the paper's count with its scaled target
(paper × scale) and the value measured from our assembled KG, so a
reader can diff shape: which families dominate, where small-scale
saturation trims high-rate relations.
"""
from __future__ import annotations

import pandas as pd

from repro.construction import stats
from repro.core import config as C
from repro.core.config import BENCH_CONFIG, ScaledConfig
from repro.tables.context import ExperimentContext


def run(ctx: ExperimentContext, cfg: ScaledConfig = BENCH_CONFIG) -> dict:
    """Measured stats blocks + paper constants, ready for rendering."""
    kg = ctx.world(cfg)
    overall = stats.overall_stats(kg)
    tax = stats.taxonomy_stats(kg)
    rel = stats.relation_stats(kg)
    return {"cfg": cfg, "overall": overall, "taxonomy": tax, "relations": rel}


def overall_rows(res: dict) -> pd.DataFrame:
    cfg = res["cfg"]
    paper = {
        "n_core_classes": C.PAPER_N_CORE_CLASSES,
        "n_core_concepts": C.PAPER_N_CORE_CONCEPTS,
        "n_relation_types": C.PAPER_N_RELATION_TYPES,
        "n_products": C.PAPER_N_PRODUCTS,
        "n_triples": C.PAPER_N_TRIPLES,
        "n_entities": C.PAPER_N_ENTITIES,
    }
    rows = []
    for k, p in paper.items():
        scale = cfg.rel_scale if k == "n_relation_types" else cfg.scale
        rows.append(
            {
                "stat": k,
                "paper": p,
                "paper x scale": int(round(p * scale)),
                "measured": res["overall"][k],
            }
        )
    return pd.DataFrame(rows)


def taxonomy_rows(res: dict) -> pd.DataFrame:
    cfg = res["cfg"]
    rows = []
    for _, r in res["taxonomy"].iterrows():
        paper_levels = C.PAPER_TAXONOMY_LEVELS[r["root"]]
        rows.append(
            {
                "taxonomy": r["root"],
                "paper levels": paper_levels,
                "paper all": sum(paper_levels),
                "measured levels": r["levels"],
                "measured all": r["all"],
                "measured leaf": r["leaf"],
            }
        )
    return pd.DataFrame(rows)


def relation_rows(res: dict) -> pd.DataFrame:
    cfg = res["cfg"]
    paper = {}
    paper.update(C.PAPER_OBJECT_PROPERTY_COUNTS)
    paper.update(C.PAPER_DATA_PROPERTY_COUNTS)
    paper.update(C.PAPER_META_PROPERTY_COUNTS)
    rows = []
    #: axioms on relation *types* scale with rel_scale, not volume scale
    rel_scaled = {"rdfs:subPropertyOf", "owl:equivalentPropertyOf"}
    for name, p in paper.items():
        scale = cfg.rel_scale if name in rel_scaled else cfg.scale
        rows.append(
            {
                "relation": name,
                "paper": p,
                "paper x scale": int(round(p * scale)),
                "measured": res["relations"].get(name, 0),
            }
        )
    return pd.DataFrame(rows)
