"""Root-assignment heuristic: the paper's example and coverage rules."""
from repro.core.aggregates import Query, SumProduct
from repro.core.root_assignment import assign_roots
from repro.datasets import favorita_tree, retailer_tree


def q(name, gb, **aggs):
    return Query.make(name, gb, **(aggs or {"v": SumProduct.count()}))


def test_paper_example_roots():
    """§2: Sales is root for Q1 and Q2, Items for Q3."""
    tree = favorita_tree()
    q1 = q("q1", [], v=SumProduct.of(units="units"))
    q2 = q("q2", ["store"], v=SumProduct.of(item="(item*0.5)", date="(date%7)"))
    q3 = q("q3", ["iclass"], v=SumProduct.of(units="units"))
    roots = assign_roots(tree, [q1, q2, q3])
    assert roots == {"q1": "sales", "q2": "sales", "q3": "items"}


def test_group_by_coverage_wins():
    tree = favorita_tree()
    roots = assign_roots(tree, [q("a", ["city", "state"])])
    assert roots["a"] == "stores"


def test_empty_group_by_prefers_fact_table():
    tree = favorita_tree()
    assert assign_roots(tree, [q("a", [])])["a"] == "sales"


def test_factor_anchor_breaks_ties():
    tree = favorita_tree()
    # no group-by; factor lives in transactions -> prefer it over sales? No:
    # sales covers 0 gb attrs too, but txns anchor scores transactions up.
    roots = assign_roots(tree, [q("a", [], v=SumProduct.of(txns="txns"))])
    assert roots["a"] == "transactions"


def test_cross_relation_group_by_picks_best_cover():
    tree = favorita_tree()
    # store (sales/transactions/stores) + family (items): sales covers store,
    # items covers family -> 1 each; tie broken toward earlier declaration.
    roots = assign_roots(tree, [q("a", ["store", "family"])])
    assert roots["a"] == "sales"


def test_retailer_roots():
    tree = retailer_tree()
    roots = assign_roots(
        tree,
        [
            q("zipq", ["zip"], v=SumProduct.of(population="population")),
            q("catq", ["category"]),
            q("tot", [], v=SumProduct.of(inventoryunits="inventoryunits")),
        ],
    )
    # census covers zip AND anchors the population factor -> beats location
    assert roots["zipq"] == "census"
    assert roots["catq"] == "item"
    assert roots["tot"] == "inventory"


def test_deterministic():
    tree = favorita_tree()
    batch = [q("a", ["store"]), q("b", ["family"]), q("c", [])]
    assert assign_roots(tree, batch) == assign_roots(tree, batch)
