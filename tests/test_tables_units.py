"""Unit tests for the table-harness helpers (no heavy worlds)."""
import pandas as pd

from repro.tables import table3, table4, table5, table6, table7
from repro.tables.context import df_to_markdown
from repro.tables.kge_common import BUDGETS, merge_with_paper


def test_df_to_markdown_renders():
    df = pd.DataFrame({"a": [1, 2], "b": [0.51234, 0.2]})
    md = df_to_markdown(df)
    lines = md.splitlines()
    assert lines[0] == "| a | b |"
    assert lines[1] == "|---|---|"
    assert "0.512" in lines[2]


def test_merge_with_paper_aligns_models():
    measured = pd.DataFrame(
        [{"model": "TransE", "hits1": 0.1, "hits3": 0.2, "hits10": 0.3,
          "mr": 12.0, "mrr": 0.15, "seconds": 1.0}]
    )
    merged = merge_with_paper(measured, table3.PAPER)
    assert merged.iloc[0]["paper H@1"] == 0.150
    assert merged.iloc[0]["ours H@1"] == 0.1


def test_merge_with_paper_unknown_model_dash():
    measured = pd.DataFrame(
        [{"model": "Mystery", "hits1": 0.1, "hits3": 0.2, "hits10": 0.3,
          "mr": 12.0, "mrr": 0.15, "seconds": 1.0}]
    )
    merged = merge_with_paper(measured, table3.PAPER)
    assert merged.iloc[0]["paper H@1"] == "-"


def test_paper_tables_internally_consistent():
    """Published rows: Hits@1 ≤ Hits@3 ≤ Hits@10 everywhere."""
    for paper in (table3.PAPER, table4.PAPER_500, table4.PAPER_500L):
        for model, row in paper.items():
            if isinstance(row.get("hits1"), float):
                assert row["hits1"] <= row["hits3"] <= row["hits10"], model


def test_table3_model_rosters():
    assert set(table3.SINGLE_MODAL + table3.MULTI_MODAL) == set(table3.PAPER)


def test_table4_l_roster_subset():
    """-L omits the heavy baselines, as in the paper's '-' cells."""
    assert set(table4.MODELS_500L) < set(table4.MODELS_500)
    assert "TuckER" not in table4.MODELS_500L


def test_budgets_cover_all_benchmarks():
    assert set(BUDGETS) == {"OpenBG-IMG", "OpenBG500", "OpenBG500-L"}
    # -L gets the smallest epoch budget (it is the largest dataset)
    assert BUDGETS["OpenBG500-L"]["epochs"] <= BUDGETS["OpenBG500"]["epochs"]


def test_table5_paper_shape():
    """Paper Table V shape: +KG ≥ base on every task, large+KG ≥ base+KG."""
    for task, col in table5.PAPER.items():
        assert col["mPLUG-base+KG"] >= col["mPLUG-base"] - 1e-9, task
        assert col["mPLUG-large+KG"] >= col["mPLUG-base+KG"] - 1e-9, task


def test_table6_table7_paper_shape():
    """Low-resource: KG gain is larger at 1-shot than 5-shot (mPLUG)."""
    for paper in (table6.PAPER, table7.PAPER):
        gain1 = paper["mPLUG-base+KG"][1] - paper["mPLUG-base"][1]
        gain5 = paper["mPLUG-base+KG"][5] - paper["mPLUG-base"][5]
        assert gain1 > gain5 > 0
