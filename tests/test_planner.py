"""View generation and merging: structure of the plans (paper §2)."""
import pytest

from repro.core.aggregates import Query, SumProduct
from repro.core.planner import ViewKey, child_ga, child_refs, plan_batch
from repro.datasets import favorita_tree


@pytest.fixture(scope="module")
def tree():
    return favorita_tree()


def paper_batch():
    q1 = Query.make("q1", [], v=SumProduct.of(units="units"))
    q2 = Query.make(
        "q2", ["store"], v=SumProduct.of(item="(item*0.5+1.0)", date="(date%7+1.0)")
    )
    q3 = Query.make("q3", ["iclass"], v=SumProduct.of(units="units"))
    return [q1, q2, q3]


def test_paper_example_view_merging(tree):
    """Fig. 2: one view per incoming edge of sales is shared by all three
    queries (same direction + group attrs merge), plus V_{S->I} for q3."""
    plan = plan_batch(tree, paper_batch())
    inner = {vk for vk in plan.views if vk.parent is not None}
    # All views into sales are keyed by the edge join attrs only.
    assert ViewKey("transactions", "sales", frozenset({"date", "store"})) in inner
    assert ViewKey("oil", "sales", frozenset({"date"})) in inner
    assert ViewKey("holidays", "sales", frozenset({"date"})) in inner
    assert ViewKey("items", "sales", frozenset({"item"})) in inner
    assert ViewKey("stores", "transactions", frozenset({"store"})) in inner
    # q3 rooted at items sends one view sales -> items.
    assert ViewKey("sales", "items", frozenset({"item"})) in inner
    assert len(inner) == 6


def test_paper_example_outputs(tree):
    plan = plan_batch(tree, paper_batch())
    assert plan.outputs["q1"].view == ViewKey("sales", None, frozenset())
    assert plan.outputs["q2"].view == ViewKey("sales", None, frozenset({"store"}))
    assert plan.outputs["q3"].view == ViewKey("items", None, frozenset({"iclass"}))


def test_identical_aggregates_share_columns(tree):
    """q1 and a copy of it rooted elsewhere still share subtree columns."""
    qa = Query.make("qa", [], v=SumProduct.of(units="units"))
    qb = Query.make("qb", ["family"], v=SumProduct.of(units="units"))
    plan = plan_batch(tree, [qa, qb], roots={"qa": "sales", "qb": "items"})
    # The oil->sales view serves both and has a single count column.
    vd = plan.views[ViewKey("oil", "sales", frozenset({"date"}))]
    assert len(vd.cols) == 1


def test_distinct_aggregates_get_distinct_columns(tree):
    qa = Query.make("qa", [], v=SumProduct.of(oilprize="oilprize"))
    qb = Query.make("qb", [], v=SumProduct.of(oilprize="(oilprize * oilprize)"))
    plan = plan_batch(tree, [qa, qb], roots={"qa": "sales", "qb": "sales"})
    vd = plan.views[ViewKey("oil", "sales", frozenset({"date"}))]
    assert len(vd.cols) == 2


def test_carrying_view_group_attrs(tree):
    """A group-by attribute below the root is carried up through views."""
    q = Query.make("q", ["city"], v=SumProduct.of(units="units"))
    plan = plan_batch(tree, [q], roots={"q": "sales"})
    assert ViewKey("stores", "transactions", frozenset({"store", "city"})) in plan.views
    assert ViewKey("transactions", "sales", frozenset({"date", "store", "city"})) in plan.views


def test_child_ga_formula(tree):
    ga = frozenset({"city", "date", "store"})
    assert child_ga(tree, "transactions", "sales", ga, "stores") == {"store", "city"}
    ga2 = frozenset({"iclass"})
    assert child_ga(tree, "sales", None, ga2, "items") == {"item", "iclass"}
    assert child_ga(tree, "sales", None, ga2, "oil") == {"date"}


def test_child_refs_cover_all_children(tree):
    q = Query.make("q", [], v=SumProduct.of(units="units"))
    plan = plan_batch(tree, [q], roots={"q": "sales"})
    out = plan.views[ViewKey("sales", None, frozenset())]
    (col, sp), = out.cols.items()
    refs = child_refs(tree, ViewKey("sales", None, frozenset()), sp)
    assert [vk.node for vk, _ in refs] == ["holidays", "items", "oil", "transactions"]
    for vk, c in refs:
        assert c in plan.views[vk].cols


def test_output_views_merge_same_root_and_gb(tree):
    qa = Query.make("qa", ["store"], v=SumProduct.of(units="units"))
    qb = Query.make("qb", ["store"], v=SumProduct.count())
    plan = plan_batch(tree, [qa, qb], roots={"qa": "sales", "qb": "sales"})
    assert plan.outputs["qa"].view == plan.outputs["qb"].view
    assert plan.stats()["output_views"] == 1


def test_topo_groups_order(tree):
    plan = plan_batch(tree, paper_batch())
    order = [(n, p) for n, p, _ in plan.topo_groups()]
    pos = {k: i for i, k in enumerate(order)}
    # every view comes after all views of its children
    assert pos[("stores", "transactions")] < pos[("transactions", "sales")]
    assert pos[("transactions", "sales")] < pos[("sales", None)]
    assert pos[("sales", "items")] < pos[("items", None)]


def test_stats_counts(tree):
    plan = plan_batch(tree, paper_batch())
    s = plan.stats()
    assert s["queries"] == 3
    assert s["merged_views"] == 6
    assert s["output_views"] == 3
    assert s["roots"] == 2
    assert s["aggregates"] == 3


def test_rejects_duplicate_query_names(tree):
    q = Query.make("dup", [], v=SumProduct.count())
    with pytest.raises(ValueError, match="duplicate query names"):
        plan_batch(tree, [q, q])


def test_rejects_unknown_attribute(tree):
    q = Query.make("q", ["nope"], v=SumProduct.count())
    with pytest.raises(ValueError, match="unknown attributes"):
        plan_batch(tree, [q])


def test_single_query_view_count_matches_edges(tree):
    """One query decomposes into exactly one view per edge (paper §2)."""
    q = Query.make("q", [], v=SumProduct.of(units="units"))
    plan = plan_batch(tree, [q], roots={"q": "sales"})
    inner = [vk for vk in plan.views if vk.parent is not None]
    assert len(inner) == len(tree.edges)


def test_two_roots_reuse_shared_direction_views(tree):
    """Views pointing toward both roots' common paths are not duplicated."""
    qa = Query.make("qa", [], v=SumProduct.of(units="units"))
    qb = Query.make("qb", ["family"], v=SumProduct.of(units="units"))
    plan = plan_batch(tree, [qa, qb], roots={"qa": "sales", "qb": "items"})
    inner = [vk for vk in plan.views if vk.parent is not None]
    # edges toward sales: 5 (shared), plus sales->items for qb = 6
    assert len(inner) == 6
