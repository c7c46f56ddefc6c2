"""LMFAO core engine: join trees, aggregate batches, view generation,
multi-output execution, baselines, and the flat-SQL oracle compiler."""

from repro.core.aggregates import Query, SumProduct
from repro.core.database import Database
from repro.core.executor import Engine
from repro.core.planner import Plan, plan_batch
from repro.core.root_assignment import assign_roots
from repro.core.schema import JoinTree, Relation

__all__ = [
    "Database",
    "Engine",
    "JoinTree",
    "Plan",
    "Query",
    "Relation",
    "SumProduct",
    "assign_roots",
    "plan_batch",
]
