"""Flat-SQL compiler: join chains, filters, group-by rendering."""
import duckdb
import pytest

from repro.core.aggregates import Query, SumProduct
from repro.core.sql_compile import join_clause, query_to_sql


@pytest.fixture(scope="module")
def db(spark):
    from repro.datasets import favorita_db

    return favorita_db(spark, sf=0.001)


def test_join_clause_mentions_every_relation(db):
    jc = join_clause(db)
    for rel in db.tree.nodes:
        assert rel in jc


def test_join_clause_uses_edge_attrs(db):
    jc = join_clause(db)
    assert "JOIN transactions USING (date, store)" in jc
    assert "JOIN stores USING (store)" in jc


def test_query_to_sql_group_by(db):
    q = Query.make("q", ["store"], v=SumProduct.of(units="units"))
    sql = query_to_sql(db, q)
    assert sql.startswith("SELECT store, SUM(")
    assert sql.endswith("GROUP BY store")


def test_query_to_sql_no_group_by(db):
    q = Query.make("q", [], v=SumProduct.count())
    assert "GROUP BY" not in query_to_sql(db, q)


def test_query_to_sql_filters_in_where(db):
    fdb = db.with_filters([("txns", "txns <= 100"), ("family", "family = 'DAIRY'")])
    sql = query_to_sql(fdb, Query.make("q", [], v=SumProduct.count()))
    assert "WHERE (txns <= 100) AND (family = 'DAIRY')" in sql


def test_sql_is_valid_duckdb(db):
    """Every compiled query must parse and run on DuckDB."""
    q = Query.make(
        "q", ["store", "family"], v=SumProduct.of(units="units", oilprize="oilprize")
    )
    con = duckdb.connect()
    try:
        for name, pdf in db.oracle_tables().items():
            con.register(name, pdf)
        out = con.execute(query_to_sql(db, q)).fetchdf()
    finally:
        con.close()
    assert {"store", "family", "v"} == set(out.columns)


def test_sql_multi_agg_aliases(db):
    q = Query.make(
        "q", ["family"], cnt=SumProduct.count(), s=SumProduct.of(units="units")
    )
    sql = query_to_sql(db, q)
    assert " AS cnt" in sql and " AS s" in sql
