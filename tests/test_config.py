"""Tests for the paper-constant table and the scale model."""
import math

import pytest

from repro.core import config as C
from repro.core.config import ScaledConfig, TEST_CONFIG


def test_paper_taxonomy_totals_match_table1():
    """Per-level sums reproduce Table I's '# All' column.

    Place is off by one *in the paper itself*: its per-level counts
    (208+266+333+2847+38773) sum to 42,427 but Table I prints 42,426.
    We keep the per-level numbers as ground truth and tolerate ±1.
    """
    alls = {
        "Category": 7_100,
        "Brand": 411_279,
        "Place": 42_426,
        "Scene": 5_392,
        "Crowd": 45_207,
        "Theme": 5_519,
        "Time": 58,
        "MarketSegment": 614_598,
    }
    for root, total in alls.items():
        assert abs(sum(C.PAPER_TAXONOMY_LEVELS[root]) - total) <= 1


def test_paper_class_concept_split_matches_table1():
    """±1 tolerance: inherits the paper's Place off-by-one (see above)."""
    classes = sum(sum(C.PAPER_TAXONOMY_LEVELS[r]) for r in C.CLASS_TYPES)
    concepts = sum(sum(C.PAPER_TAXONOMY_LEVELS[r]) for r in C.CONCEPT_TYPES)
    assert abs(classes - C.PAPER_N_CORE_CLASSES) <= 1
    assert concepts == C.PAPER_N_CORE_CONCEPTS


def test_paper_entities_identity():
    """rdf:type count equals the entity count (every entity typed once)."""
    assert C.PAPER_META_PROPERTY_COUNTS["rdf:type"] == C.PAPER_N_ENTITIES


def test_items_per_product_ratio_plausible():
    assert 25 < C.PAPER_ITEMS_PER_PRODUCT < 30


@pytest.mark.parametrize("scale", [1e-4, 1e-3, 1e-2, 1.0])
def test_scaled_counts_floor_and_linear(scale):
    cfg = ScaledConfig(scale=scale)
    for root in C.PAPER_TAXONOMY_LEVELS:
        levels = cfg.taxonomy_levels(root)
        assert all(n >= 1 for n in levels)
        for paper_n, n in zip(C.PAPER_TAXONOMY_LEVELS[root], levels):
            assert n == max(1, round(paper_n * scale))


def test_scale_one_recovers_paper_counts():
    cfg = ScaledConfig(scale=1.0, rel_scale=1.0)
    assert cfg.n_products == C.PAPER_N_PRODUCTS
    assert cfg.taxonomy_levels("Category") == C.PAPER_TAXONOMY_LEVELS["Category"]
    assert cfg.n_inmarket_rel_types == C.PAPER_N_INMARKET_REL_TYPES
    assert cfg.n_attribute_rel_types == C.PAPER_N_ATTRIBUTE_REL_TYPES


@pytest.mark.parametrize(
    "rel,expected",
    [("brandIs", 0.62), ("placeOfOrigin", 0.70), ("relatedScene", 9.39)],
)
def test_object_property_rates(rel, expected):
    assert math.isclose(
        TEST_CONFIG.object_property_rate(rel), expected, rel_tol=0.02
    )


def test_attribute_rate_and_image_fraction():
    assert math.isclose(TEST_CONFIG.attributes_per_product, 24.65, rel_tol=0.01)
    assert math.isclose(TEST_CONFIG.image_fraction, 0.0335, rel_tol=0.02)


def test_derived_seed_deterministic_and_distinct():
    a1 = TEST_CONFIG.derived_seed("catalog")
    a2 = TEST_CONFIG.derived_seed("catalog")
    b = TEST_CONFIG.derived_seed("reviews")
    assert a1 == a2
    assert a1 != b
    assert 0 <= a1 < 2**31 - 1


def test_derived_seed_changes_with_master_seed():
    assert ScaledConfig(seed=1).derived_seed("x") != ScaledConfig(seed=2).derived_seed("x")


@pytest.mark.parametrize("name", list(C.PAPER_BENCHMARKS))
def test_benchmark_targets_scaled(name):
    cfg = ScaledConfig(scale=0.01, rel_scale=0.1)
    t = cfg.benchmark_targets(name)
    assert t["n_train"] == max(1, round(C.PAPER_BENCHMARKS[name]["n_train"] * 0.01))
    assert cfg.benchmark_n_rel(name) == max(
        1, round(C.PAPER_BENCHMARKS[name]["n_rel"] * 0.1)
    )


def test_benchmark_paper_rows_match_table2():
    assert C.PAPER_BENCHMARKS["OpenBG500"]["n_train"] == 1_242_550
    assert C.PAPER_BENCHMARKS["OpenBG-IMG"]["n_ent_multimodal"] == 14_718
    assert C.PAPER_BENCHMARKS["OpenBG500-L"]["n_ent"] == 2_782_223


def test_total_relation_decomposition_is_consistent():
    """Named + family relation types stay within the paper total."""
    named = 6 + 6 + 6  # object + data + meta named relations
    assert (
        named + C.PAPER_N_INMARKET_REL_TYPES + C.PAPER_N_ATTRIBUTE_REL_TYPES
        <= C.PAPER_N_RELATION_TYPES
    )
