"""Fan-out Favorita (several holiday rows per date): bag semantics of the
natural join — multiplicities must be carried by the views' count
columns, and every strategy must still match the oracle."""
import pytest

from corpus import FAVORITA_CORPUS
from repro.core.baseline import run_shared_join
from repro.core.executor import Engine
from repro.core.sql_compile import query_to_sql
from repro.datasets import favorita_db
from repro.oracle import assert_equivalent

SUB = [q for q in FAVORITA_CORPUS if q.name in {
    "q1_total_units", "q2_store_gh", "q3_class_rev", "count_star",
    "by_htype", "by_locale", "by_date_store", "by_store_family",
    "cart_family",
}]


@pytest.fixture(scope="module")
def fan_db(spark):
    return favorita_db(spark, sf=0.002, holiday_fanout=3)


@pytest.fixture(scope="module")
def fan_results(fan_db):
    return Engine(fan_db).run(SUB)


def test_fanout_inflates_d(spark, fav_db, fan_db):
    assert fan_db.joined().count() == 3 * fav_db.joined().count()


@pytest.mark.parametrize("q", SUB, ids=[q.name for q in SUB])
def test_fanout_engine_matches_oracle(fan_db, fan_results, q):
    sql = query_to_sql(fan_db, q)
    assert_equivalent(fan_results[q.name], sql, rtol=1e-9, **fan_db.oracle_tables())


@pytest.mark.parametrize("q", SUB[:4], ids=[q.name for q in SUB[:4]])
def test_fanout_shared_join_matches_oracle(fan_db, q):
    res = run_shared_join(fan_db, SUB[:4])
    sql = query_to_sql(fan_db, q)
    assert_equivalent(res[q.name], sql, rtol=1e-9, **fan_db.oracle_tables())
