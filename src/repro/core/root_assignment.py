"""Root assignment: one join tree for the whole batch, one root per query.

The paper uses "a simple heuristic" [Schleich et al., SIGMOD'19]: pick a
root that keeps the intermediate views small, i.e. a node that already
contains the query's group-by attributes so they need not be carried up
through views. We implement that as a coverage score:

score(node) = (#group-by attrs in the node's relation,
               node is the anchor of a factor attr,
               -declaration index)

Ties resolve toward earlier-declared relations (the fact table first),
which maximizes root sharing across the batch — and shared roots mean
shared views, the whole point of the layer.
"""
from __future__ import annotations

from repro.core.aggregates import Query
from repro.core.schema import JoinTree


def assign_roots(tree: JoinTree, queries: list[Query]) -> dict[str, str]:
    """Map query name -> root relation name."""
    roots: dict[str, str] = {}
    order = {n: i for i, n in enumerate(tree.nodes)}
    for q in queries:
        gb = set(q.group_by)
        factor_anchors = {
            tree.anchor(a) for _, sp in q.aggs for a in sp.attrs
        }

        def score(node: str) -> tuple[int, int, int]:
            return (
                len(gb & tree.attrs(node)),
                1 if node in factor_anchors else 0,
                -order[node],
            )

        roots[q.name] = max(tree.nodes, key=score)
    return roots
