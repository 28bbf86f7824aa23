"""Tests for level-wise taxonomy construction."""
import pytest

from repro.core import schema as S
from repro.ontology.taxonomy import build_taxonomy


@pytest.mark.parametrize(
    "root,sizes",
    [("Category", [3, 10, 20]), ("Scene", [1, 4]), ("MarketSegment", [7])],
)
def test_level_counts_exact(root, sizes):
    tax = build_taxonomy(root, sizes, seed=1)
    assert tax.level_counts() == sizes
    assert tax.n_nodes == sum(sizes)


def test_level1_parents_are_anchor():
    tax = build_taxonomy("Brand", [4, 9], seed=3)
    l1 = tax.nodes[tax.nodes["level"] == 1]
    assert (l1["parent_id"] == "Brand").all()


def test_parents_come_from_previous_level():
    tax = build_taxonomy("Place", [2, 5, 11], seed=5)
    lut = tax.nodes.set_index("node_id")["level"]
    deeper = tax.nodes[tax.nodes["level"] > 1]
    assert (deeper["parent_id"].map(lut) == deeper["level"] - 1).all()


def test_leaves_have_no_children():
    tax = build_taxonomy("Crowd", [2, 3, 8], seed=7)
    parents = set(tax.nodes["parent_id"])
    for nid, leaf in tax.nodes[["node_id", "is_leaf"]].itertuples(index=False):
        assert (nid not in parents) == leaf


def test_last_level_all_leaves():
    tax = build_taxonomy("Theme", [2, 4, 6], seed=9)
    last = tax.nodes[tax.nodes["level"] == 3]
    assert last["is_leaf"].all()
    assert tax.n_leaves >= len(last)


def test_deterministic_in_seed():
    a = build_taxonomy("Time", [2, 9], seed=42).nodes
    b = build_taxonomy("Time", [2, 9], seed=42).nodes
    c = build_taxonomy("Time", [2, 9], seed=43).nodes
    assert a.equals(b)
    assert not a.equals(c)


def test_node_ids_use_schema_prefixes():
    tax = build_taxonomy("Scene", [1, 2], seed=0)
    assert tax.nodes["node_id"].str.startswith(S.TAXONOMY_PREFIX["Scene"]).all()
    assert S.node_root(tax.nodes["node_id"].iloc[0]) == "Scene"


def test_edges_frame_shape():
    tax = build_taxonomy("Scene", [2, 3], seed=0)
    e = tax.edges()
    assert list(e.columns) == ["child", "parent"]
    assert len(e) == tax.n_nodes


def test_labels_unique_within_taxonomy():
    tax = build_taxonomy("Category", [3, 10, 20], seed=1)
    assert tax.nodes["label"].is_unique


def test_single_node_levels():
    """Degenerate tiny-scale taxonomies (all level sizes 1) still build."""
    tax = build_taxonomy("Time", [1, 1, 1], seed=0)
    assert tax.n_nodes == 3
    assert tax.n_leaves == 1
