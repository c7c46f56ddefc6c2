"""Engine vs DuckDB oracle on the Retailer corpus (both modes)."""
import pytest

from corpus import RETAILER_CORPUS
from repro.core.sql_compile import query_to_sql
from repro.oracle import assert_equivalent

IDS = [q.name for q in RETAILER_CORPUS]


@pytest.mark.parametrize("q", RETAILER_CORPUS, ids=IDS)
def test_engine_matches_oracle(ret_db, ret_results, q):
    sql = query_to_sql(ret_db, q)
    assert_equivalent(ret_results[q.name], sql, rtol=1e-9, **ret_db.oracle_tables())


@pytest.mark.parametrize("q", RETAILER_CORPUS, ids=IDS)
def test_engine_nomoo_matches_oracle(ret_db, ret_results_nomoo, q):
    sql = query_to_sql(ret_db, q)
    assert_equivalent(
        ret_results_nomoo[q.name], sql, rtol=1e-9, **ret_db.oracle_tables()
    )
