"""Relations and join trees.

LMFAO evaluates batches of aggregates over the *natural join* of the
relations of a join tree. We use name-based natural-join semantics:
attributes are globally named and an edge's join attributes are the
attribute names shared by its two endpoint relations.

The tree must satisfy the running-intersection property (RIP): for every
attribute, the relations containing it form a connected subtree. RIP is
what makes the per-edge group-attribute recursion in the planner exact
(see DESIGN.md §1); ``JoinTree`` validates it at construction.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import lru_cache


@dataclass(frozen=True)
class Relation:
    """A named relation with its attribute names (order = display order).

    Non-join attributes must be globally unique across the schema; join
    attributes are exactly the names shared between relations.
    """

    name: str
    attrs: tuple[str, ...]

    def __post_init__(self) -> None:
        if len(set(self.attrs)) != len(self.attrs):
            raise ValueError(f"duplicate attribute in relation {self.name}")


class JoinTree:
    """An acyclic, connected join tree over a set of relations.

    Parameters
    ----------
    relations:
        Declaration order matters: the first relation containing an
        attribute is the attribute's *anchor* (where sum-product factors
        on it are applied, and where selections on it are pushed).
        Declare the fact table first.
    edges:
        Undirected edges as (name, name) pairs. Each edge's join
        attributes are the shared attribute names and must be non-empty.
    """

    def __init__(self, relations: list[Relation], edges: list[tuple[str, str]]):
        self.relations: dict[str, Relation] = {r.name: r for r in relations}
        if len(self.relations) != len(relations):
            raise ValueError("duplicate relation names")
        self._order = [r.name for r in relations]
        self.edges: list[tuple[str, str]] = []
        self._adj: dict[str, set[str]] = {n: set() for n in self.relations}
        for a, b in edges:
            if a not in self.relations or b not in self.relations:
                raise ValueError(f"edge ({a},{b}) references unknown relation")
            if not self.join_attrs(a, b):
                raise ValueError(f"edge ({a},{b}) shares no attributes")
            self.edges.append((a, b))
            self._adj[a].add(b)
            self._adj[b].add(a)
        self._validate_tree()
        self._validate_rip()

    # ------------------------------------------------------------------
    # structure
    # ------------------------------------------------------------------
    @property
    def nodes(self) -> list[str]:
        """Relation names in declaration order."""
        return list(self._order)

    def neighbors(self, n: str) -> frozenset[str]:
        return frozenset(self._adj[n])

    def join_attrs(self, a: str, b: str) -> frozenset[str]:
        """Shared attribute names of two relations (the edge's join key)."""
        return frozenset(self.relations[a].attrs) & frozenset(self.relations[b].attrs)

    def attrs(self, n: str) -> frozenset[str]:
        return frozenset(self.relations[n].attrs)

    @property
    def all_attrs(self) -> frozenset[str]:
        return frozenset(a for r in self.relations.values() for a in r.attrs)

    def relations_of(self, attr: str) -> list[str]:
        """Relations containing ``attr``, in declaration order."""
        return [n for n in self._order if attr in self.relations[n].attrs]

    def anchor(self, attr: str) -> str:
        """The relation where factors/filters on ``attr`` are applied."""
        rels = self.relations_of(attr)
        if not rels:
            raise KeyError(f"unknown attribute {attr!r}")
        return rels[0]

    # ------------------------------------------------------------------
    # subtree algebra (used by the planner)
    # ------------------------------------------------------------------
    @lru_cache(maxsize=None)
    def subtree_nodes(self, child: str, parent: str | None) -> frozenset[str]:
        """Nodes on the ``child`` side of the (child, parent) edge.

        With ``parent=None`` this is the whole tree (the "output edge"
        at a query's root).
        """
        if parent is not None and parent not in self._adj[child]:
            raise ValueError(f"({child},{parent}) is not a tree edge")
        seen: set[str] = {child}
        stack = [child]
        while stack:
            n = stack.pop()
            for m in self._adj[n]:
                if m != parent and m not in seen:
                    seen.add(m)
                    stack.append(m)
        return frozenset(seen)

    @lru_cache(maxsize=None)
    def subtree_attrs(self, child: str, parent: str | None) -> frozenset[str]:
        """Union of attributes of the relations in ``subtree(child, parent)``."""
        return frozenset(
            a for n in self.subtree_nodes(child, parent) for a in self.relations[n].attrs
        )

    @lru_cache(maxsize=None)
    def anchored_attrs(self, child: str, parent: str | None) -> frozenset[str]:
        """Attributes whose anchor relation lies in ``subtree(child, parent)``."""
        nodes = self.subtree_nodes(child, parent)
        return frozenset(a for a in self.all_attrs if self.anchor(a) in nodes)

    # ------------------------------------------------------------------
    # validation
    # ------------------------------------------------------------------
    def _validate_tree(self) -> None:
        n = len(self.relations)
        if len(self.edges) != n - 1:
            raise ValueError(f"{len(self.edges)} edges for {n} relations: not a tree")
        root = self._order[0]
        if len(self.subtree_nodes(root, None)) != n:
            raise ValueError("join tree is not connected")

    def _validate_rip(self) -> None:
        for attr in self.all_attrs:
            rels = set(self.relations_of(attr))
            if len(rels) == 1:
                continue
            # BFS within the induced subgraph must reach every relation of attr.
            start = next(iter(rels))
            seen = {start}
            stack = [start]
            while stack:
                cur = stack.pop()
                for m in self._adj[cur]:
                    if m in rels and m not in seen:
                        seen.add(m)
                        stack.append(m)
            if seen != rels:
                raise ValueError(
                    f"running-intersection violated for attribute {attr!r}: "
                    f"relations {sorted(rels)} are not connected in the tree"
                )

    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        return f"JoinTree(nodes={self._order}, edges={self.edges})"
