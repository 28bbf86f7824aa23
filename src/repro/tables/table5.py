"""Table V — evaluation of the five downstream tasks (full resource)."""
from __future__ import annotations

from typing import Optional

import pandas as pd

from repro.core.config import EXP_CONFIG, ScaledConfig
from repro.downstream.category_pred import build_dataset as cat_ds, run_category_prediction
from repro.downstream.ie_reviews import run_ie
from repro.downstream.ner_titles import build_ner_dataset, run_ner
from repro.downstream.salience import run_salience
from repro.downstream.summarization import build_dataset as summ_ds, run_summarization
from repro.tables.context import ExperimentContext

#: Paper Table V.  '/' in the paper = model not evaluated on that task.
PAPER = {
    "category (acc)": {
        "RoBERTa-large": 68.80, "mPLUG-base": 73.10,
        "mPLUG-base+KG": 74.48, "mPLUG-large+KG": 74.60,
    },
    "ner (F1)": {
        "RoBERTa-large": 69.10, "UIE": 65.00, "mPLUG-base": 67.78,
        "mPLUG-base+KG": 73.00, "mPLUG-large+KG": 73.79,
    },
    "summarization (ROUGE-L)": {
        "mT5": 70.12, "mPLUG-base": 71.82,
        "mPLUG-base+KG": 72.30, "mPLUG-large+KG": 78.29,
    },
    "ie (F1)": {
        "mT5": 83.32, "mPLUG-base": 82.83,
        "mPLUG-base+KG": 83.76, "mPLUG-large+KG": 84.91,
    },
    "salience (acc)": {
        "BERT": 63.34, "mPLUG-base": 66.45,
        "mPLUG-base+KG": 69.45, "mPLUG-large+KG": 69.87,
    },
}

#: Sample caps keep featurization tractable at experiment scale.
CAPS = dict(category=6000, ner=4000, summarization=4000, ie=5000)


def run(
    ctx: ExperimentContext,
    cfg: ScaledConfig = EXP_CONFIG,
    caps: Optional[dict] = None,
) -> pd.DataFrame:
    caps = {**CAPS, **(caps or {})}
    kg = ctx.world(cfg)
    grid = ctx.grid(cfg)
    reviews = ctx.reviews(cfg)

    def subgrid(names):
        return {n: grid[n] for n in names}

    results = {}
    results["category (acc)"] = {
        k: v * 100
        for k, v in run_category_prediction(
            kg,
            subgrid(["RoBERTa-large", "mPLUG-base", "mPLUG-base+KG", "mPLUG-large+KG"]),
            dataset=cat_ds(kg).head(caps["category"]),
        ).items()
    }
    results["ner (F1)"] = {
        k: v[2] * 100
        for k, v in run_ner(
            kg,
            subgrid(["RoBERTa-large", "UIE", "mPLUG-base", "mPLUG-base+KG", "mPLUG-large+KG"]),
            dataset=build_ner_dataset(kg)[: caps["ner"]],
        ).items()
    }
    results["summarization (ROUGE-L)"] = {
        k: v * 100
        for k, v in run_summarization(
            kg,
            subgrid(["mT5", "mPLUG-base", "mPLUG-base+KG", "mPLUG-large+KG"]),
            dataset=summ_ds(kg).head(caps["summarization"]),
        ).items()
    }
    results["ie (F1)"] = {
        k: v[2] * 100
        for k, v in run_ie(
            kg,
            subgrid(["mT5", "mPLUG-base", "mPLUG-base+KG", "mPLUG-large+KG"]),
            reviews.head(caps["ie"]),
        ).items()
    }
    results["salience (acc)"] = {
        k: v * 100
        for k, v in run_salience(
            kg,
            subgrid(["BERT", "mPLUG-base", "mPLUG-base+KG", "mPLUG-large+KG"]),
        ).items()
    }

    rows = []
    for task, paper_col in PAPER.items():
        ours_col = results.get(task, {})
        for model in sorted(set(paper_col) | set(ours_col)):
            rows.append(
                {
                    "task": task,
                    "model": model,
                    "paper": paper_col.get(model, "/"),
                    "ours": round(ours_col[model], 2) if model in ours_col else "/",
                }
            )
    return pd.DataFrame(rows)
