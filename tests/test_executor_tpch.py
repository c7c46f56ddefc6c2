"""Engine vs DuckDB oracle on TPC-H-lite (schema generality check)."""
import pytest

from corpus import TPCH_CORPUS
from repro.core.sql_compile import query_to_sql
from repro.oracle import assert_equivalent

IDS = [q.name for q in TPCH_CORPUS]


@pytest.mark.parametrize("q", TPCH_CORPUS, ids=IDS)
def test_engine_matches_oracle(tpc_db, tpc_results, q):
    sql = query_to_sql(tpc_db, q)
    assert_equivalent(tpc_results[q.name], sql, rtol=1e-9, **tpc_db.oracle_tables())


def test_plan_uses_multiple_roots(tpc_db, tpc_results):
    """The corpus group-bys span all four relations, so the heuristic
    should spread roots (shape check, not correctness)."""
    from corpus import TPCH_CORPUS as batch
    from repro.core.root_assignment import assign_roots

    roots = assign_roots(tpc_db.tree, batch)
    assert len(set(roots.values())) >= 3
