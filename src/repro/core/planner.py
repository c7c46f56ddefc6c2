"""View generation and merging (the Aggregate Pushdown + Merge layers).

Each query Q, assigned a root r, is decomposed top-down into one view per
join-tree edge directed toward r (paper §2). The view at edge ``c -> p``:

* groups by ``ga = join_attrs(c, p) ∪ (Q.group_by ∩ attrs(subtree(c)))``
  (join keys for the parent's lookup, plus any group-by attributes that
  live below and must be carried up), and
* carries the partial sum-product of Q restricted to the factors
  *anchored* in ``subtree(c)``.

Views are merged when they share direction and group-by attributes
(``ViewKey = (node, parent, ga)``), and within a merged view identical
partial aggregates are deduplicated by their canonical signature — so an
aggregate shared by many queries is computed exactly once. Because the
join tree satisfies the running-intersection property, a child's group
attrs are a function of the parent's:
``ga_child = join_attrs(ch, c) ∪ (ga ∩ attrs(subtree(ch)))`` — this is
what makes merging recursive and exact (DESIGN.md §1).

A query's output is just the view at the "edge" ``(root, None)`` with
``ga = Q.group_by``; several queries with the same root and group-by
share one output view.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core.aggregates import Query, SumProduct, short_hash
from repro.core.root_assignment import assign_roots
from repro.core.schema import JoinTree


@dataclass(frozen=True)
class ViewKey:
    """Identity of a merged view: source node, direction, group attrs.

    ``parent=None`` marks a query-output view at root ``node``.
    """

    node: str
    parent: str | None
    ga: frozenset[str]


@dataclass
class ViewDef:
    """A merged view: its key plus deduplicated aggregate columns
    (generated column name -> partial sum-product restricted to the
    view's subtree)."""

    key: ViewKey
    cols: dict[str, SumProduct] = field(default_factory=dict)


@dataclass(frozen=True)
class QueryOutput:
    """Where a query reads its result: the output view, the user-facing
    group-by order, and (alias -> generated column) pairs."""

    view: ViewKey
    group_by: tuple[str, ...]
    cols: tuple[tuple[str, str], ...]  # (alias, generated column name)


def col_name(vk: ViewKey, sp: SumProduct) -> str:
    """Deterministic column name for a partial aggregate in a view.

    Deterministic so the executor can *recompute* a child reference from
    ``(child ViewKey, restricted SumProduct)`` without threading state.
    """
    return "a_" + short_hash(
        vk.node, vk.parent or "\x00", ",".join(sorted(vk.ga)), sp.signature
    )


def child_ga(tree: JoinTree, node: str, parent: str | None, ga: frozenset[str], ch: str) -> frozenset[str]:
    """Group attrs of the incoming view from child ``ch`` of ``node``."""
    return tree.join_attrs(ch, node) | (ga & tree.subtree_attrs(ch, node))


def child_refs(
    tree: JoinTree, vk: ViewKey, sp: SumProduct
) -> list[tuple[ViewKey, str]]:
    """Incoming-view column references for one aggregate of view ``vk``:
    one (child ViewKey, column name) per child of ``vk.node``."""
    refs = []
    for ch in sorted(tree.neighbors(vk.node) - ({vk.parent} if vk.parent else set())):
        vk_ch = ViewKey(ch, vk.node, child_ga(tree, vk.node, vk.parent, vk.ga, ch))
        sp_ch = sp.restrict(tree.anchored_attrs(ch, vk.node))
        refs.append((vk_ch, col_name(vk_ch, sp_ch)))
    return refs


@dataclass
class Plan:
    """The batch plan: merged views, query outputs, and the root map."""

    tree: JoinTree
    views: dict[ViewKey, ViewDef]
    outputs: dict[str, QueryOutput]
    roots: dict[str, str]

    def topo_groups(self) -> list[tuple[str, str | None, list[ViewDef]]]:
        """View groups ``(node, direction)`` in dependency order.

        A view at ``(c, p)`` depends only on views at ``(ch, c)`` whose
        subtree is strictly smaller, so ascending subtree size is a
        topological order; output views (whole tree) come last.
        """
        groups: dict[tuple[str, str | None], list[ViewDef]] = {}
        for vk, vd in self.views.items():
            groups.setdefault((vk.node, vk.parent), []).append(vd)

        def depth(k: tuple[str, str | None]) -> tuple[int, int, str, str]:
            node, parent = k
            size = len(self.tree.subtree_nodes(node, parent))
            return (size, 0 if parent else 1, node, parent or "")

        return [
            (node, parent, sorted(vds, key=lambda v: sorted(v.key.ga)))
            for (node, parent) in sorted(groups, key=depth)
            for vds in [groups[(node, parent)]]
        ]

    def stats(self) -> dict[str, int]:
        """Plan-shape statistics reported in Table T1."""
        inner = [vd for vd in self.views.values() if vd.key.parent is not None]
        out = [vd for vd in self.views.values() if vd.key.parent is None]
        return {
            "queries": len(self.outputs),
            "aggregates": sum(len(o.cols) for o in self.outputs.values()),
            "merged_views": len(inner),
            "output_views": len(out),
            "view_columns": sum(len(vd.cols) for vd in self.views.values()),
            "view_groups": len({(vk.node, vk.parent) for vk in self.views}),
            "roots": len(set(self.roots.values())),
        }


def plan_batch(
    tree: JoinTree,
    queries: list[Query],
    roots: dict[str, str] | None = None,
) -> Plan:
    """Decompose and merge a batch of queries into a view plan."""
    names = [q.name for q in queries]
    if len(set(names)) != len(names):
        raise ValueError("duplicate query names in batch")
    roots = dict(roots) if roots is not None else assign_roots(tree, queries)
    views: dict[ViewKey, ViewDef] = {}

    def require(node: str, parent: str | None, ga: frozenset[str], sp: SumProduct) -> str:
        sp_sub = sp.restrict(tree.anchored_attrs(node, parent))
        vk = ViewKey(node, parent, ga)
        col = col_name(vk, sp_sub)
        vd = views.setdefault(vk, ViewDef(vk))
        if col not in vd.cols:
            vd.cols[col] = sp_sub
            for ch in sorted(tree.neighbors(node) - ({parent} if parent else set())):
                require(ch, node, child_ga(tree, node, parent, ga, ch), sp_sub)
        return col

    outputs: dict[str, QueryOutput] = {}
    for q in queries:
        unknown = q.attrs - tree.all_attrs
        if unknown:
            raise ValueError(f"query {q.name} uses unknown attributes {sorted(unknown)}")
        r = roots[q.name]
        ga = frozenset(q.group_by)
        cols = tuple((alias, require(r, None, ga, sp)) for alias, sp in q.aggs)
        outputs[q.name] = QueryOutput(ViewKey(r, None, ga), q.group_by, cols)

    return Plan(tree, views, outputs, roots)
