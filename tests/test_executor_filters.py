"""Pushed-down selections (CART path conditions) evaluated by the engine
match the oracle's WHERE-clause evaluation over unfiltered tables."""
import pytest

from repro.core.aggregates import Query, SumProduct
from repro.core.executor import Engine
from repro.core.sql_compile import query_to_sql
from repro.oracle import assert_equivalent

FILTER_SETS = [
    [("txns", "txns <= 2000")],
    [("family", "family = 'GROCERY'")],
    [("promo", "promo = 1")],
    [("units", "units > 5.0")],
    [("htype", "htype <> 'work'")],
    [("txns", "txns <= 2000"), ("family", "family <> 'DAIRY'")],
    [("date", "date <= 20")],  # join attribute: pushed to its anchor (sales)
    [("store", "store <= 27"), ("perishable", "perishable = 0")],
]

QUERIES = [
    Query.make("tot", [], cnt=SumProduct.count(), s=SumProduct.of(units="units")),
    Query.make("byfam", ["family"], v=SumProduct.of(units="units")),
    Query.make("bystore", ["store"], v=SumProduct.of(txns="txns")),
]


@pytest.fixture(scope="module")
def filtered_results(fav_db):
    out = {}
    for i, fs in enumerate(FILTER_SETS):
        fdb = fav_db.with_filters(fs)
        eng = Engine(fdb)
        out[i] = (fdb, eng.run(QUERIES))
    return out


@pytest.mark.parametrize("i", range(len(FILTER_SETS)))
@pytest.mark.parametrize("q", QUERIES, ids=[q.name for q in QUERIES])
def test_filtered_engine_matches_oracle(filtered_results, i, q):
    fdb, results = filtered_results[i]
    sql = query_to_sql(fdb, q)
    assert_equivalent(results[q.name], sql, rtol=1e-9, **fdb.oracle_tables())


def test_filters_compose(fav_db):
    a = fav_db.with_filters([("promo", "promo = 1")])
    b = a.with_filters([("family", "family = 'GROCERY'")])
    assert len(b.filters) == 2
    assert b.filters_on("sales") == ["promo = 1"]
    assert b.filters_on("items") == ["family = 'GROCERY'"]


def test_filter_on_unknown_attr_raises(fav_db):
    with pytest.raises(KeyError):
        fav_db.with_filters([("nope", "nope = 1")])


def test_filter_reduces_counts(fav_db):
    full = fav_db.joined().count()
    half = fav_db.with_filters([("store", "store <= 27")]).joined().count()
    assert 0 < half < full
