"""JoinTree structure: edges, subtrees, anchors, RIP validation."""
import pytest

from repro.core.schema import JoinTree, Relation
from repro.datasets import favorita_tree, retailer_tree, tpch_tree


@pytest.fixture(scope="module")
def fav():
    return favorita_tree()


def test_nodes_order(fav):
    assert fav.nodes[0] == "sales"  # fact table first = default anchor


@pytest.mark.parametrize(
    "a,b,expected",
    [
        ("sales", "transactions", {"date", "store"}),
        ("transactions", "stores", {"store"}),
        ("sales", "oil", {"date"}),
        ("sales", "holidays", {"date"}),
        ("sales", "items", {"item"}),
    ],
)
def test_favorita_join_attrs(fav, a, b, expected):
    assert fav.join_attrs(a, b) == frozenset(expected)


def test_neighbors(fav):
    assert fav.neighbors("sales") == {"transactions", "oil", "holidays", "items"}
    assert fav.neighbors("stores") == {"transactions"}


def test_subtree_nodes(fav):
    assert fav.subtree_nodes("transactions", "sales") == {"transactions", "stores"}
    assert fav.subtree_nodes("items", "sales") == {"items"}
    assert fav.subtree_nodes("sales", "items") == {
        "sales", "transactions", "stores", "oil", "holidays",
    }
    assert fav.subtree_nodes("sales", None) == set(fav.nodes)


def test_subtree_attrs(fav):
    assert "city" in fav.subtree_attrs("transactions", "sales")
    assert "city" not in fav.subtree_attrs("oil", "sales")
    assert fav.subtree_attrs("items", "sales") == {"item", "family", "iclass", "perishable"}


@pytest.mark.parametrize(
    "attr,anchor",
    [("date", "sales"), ("store", "sales"), ("item", "sales"), ("city", "stores"), ("txns", "transactions")],
)
def test_anchor(fav, attr, anchor):
    assert fav.anchor(attr) == anchor


def test_anchored_attrs_exclude_shared(fav):
    # date/store/item anchor at sales, so no subtree below sales owns them
    assert "date" not in fav.anchored_attrs("transactions", "sales")
    assert "txns" in fav.anchored_attrs("transactions", "sales")
    assert "city" in fav.anchored_attrs("transactions", "sales")


def test_unknown_attr_raises(fav):
    with pytest.raises(KeyError):
        fav.anchor("nope")


def test_subtree_requires_tree_edge(fav):
    with pytest.raises(ValueError):
        fav.subtree_nodes("stores", "sales")  # not adjacent


def test_retailer_tree_valid():
    t = retailer_tree()
    assert t.join_attrs("inventory", "weather") == {"locn", "dateid"}
    assert t.subtree_nodes("location", "inventory") == {"location", "census"}


def test_tpch_tree_valid():
    t = tpch_tree()
    assert t.join_attrs("lineitem", "orders") == {"l_orderkey"}
    assert t.anchor("o_custkey") == "orders"


def test_all_attrs(fav):
    assert {"units", "oilprize", "htype", "perishable", "cluster"} <= fav.all_attrs


# ------------------------------------------------------------- validation
def test_rejects_cycle():
    rels = [Relation("a", ("x", "y")), Relation("b", ("y", "z")), Relation("c", ("z", "x"))]
    with pytest.raises(ValueError, match="not a tree"):
        JoinTree(rels, [("a", "b"), ("b", "c"), ("c", "a")])


def test_rejects_disconnected():
    rels = [Relation("a", ("x",)), Relation("b", ("x",)), Relation("c", ("w",)), Relation("d", ("w",))]
    with pytest.raises(ValueError, match="not a tree|connected"):
        JoinTree(rels, [("a", "b"), ("c", "d")])


def test_rejects_rip_violation():
    # attr x in a and c, but path a-b-c has no x in b
    rels = [Relation("a", ("x", "y")), Relation("b", ("y", "z")), Relation("c", ("z", "x"))]
    with pytest.raises(ValueError, match="running-intersection"):
        JoinTree(rels, [("a", "b"), ("b", "c")])


def test_rejects_shared_nothing_edge():
    rels = [Relation("a", ("x",)), Relation("b", ("y",))]
    with pytest.raises(ValueError, match="shares no attributes"):
        JoinTree(rels, [("a", "b")])


def test_rejects_duplicate_attrs_in_relation():
    with pytest.raises(ValueError, match="duplicate"):
        Relation("a", ("x", "x"))


def test_rejects_unknown_edge_relation():
    with pytest.raises(ValueError, match="unknown relation"):
        JoinTree([Relation("a", ("x",))], [("a", "zz")])
