"""Baselines (naive per-query, shared materialized join) vs oracle —
they must compute the same batch semantics the engine does."""
import pytest

from corpus import FAVORITA_CORPUS, RETAILER_CORPUS
from repro.core.sql_compile import query_to_sql
from repro.oracle import assert_equivalent

FAV_SUB = FAVORITA_CORPUS[:10]
RET_SUB = RETAILER_CORPUS[:8]


@pytest.mark.parametrize("q", FAV_SUB, ids=[q.name for q in FAV_SUB])
def test_naive_matches_oracle(fav_db, fav_naive, q):
    assert_equivalent(fav_naive[q.name], query_to_sql(fav_db, q), rtol=1e-9, **fav_db.oracle_tables())


@pytest.mark.parametrize("q", FAV_SUB, ids=[q.name for q in FAV_SUB])
def test_shared_join_matches_oracle(fav_db, fav_shared, q):
    assert_equivalent(fav_shared[q.name], query_to_sql(fav_db, q), rtol=1e-9, **fav_db.oracle_tables())


@pytest.mark.parametrize("q", RET_SUB, ids=[q.name for q in RET_SUB])
def test_naive_matches_oracle_retailer(ret_db, ret_naive, q):
    assert_equivalent(ret_naive[q.name], query_to_sql(ret_db, q), rtol=1e-9, **ret_db.oracle_tables())


def test_materialized_join_cardinality(fav_db):
    """|D| equals the oracle's count — the join chain is the natural join."""
    import duckdb

    con = duckdb.connect()
    try:
        for name, pdf in fav_db.oracle_tables().items():
            con.register(name, pdf)
        from repro.core.sql_compile import join_clause

        expected = con.execute(f"SELECT COUNT(*) c FROM {join_clause(fav_db)}").fetchone()[0]
    finally:
        con.close()
    assert fav_db.joined().count() == expected
