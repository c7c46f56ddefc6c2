"""T2b — the join-expensive regime (the paper's asymptotics at laptop
scale), as a |D| sweep.

Multiple holiday rows per date (as in the real Favorita) inflate |D|
multiplicatively. The materialized-join strategy scales with the
fan-out; LMFAO's views are pre-aggregated per date and do not grow, so
its runtime is flat in |D| — the "never materialize the join" claim.
"""
import pytest
from bench_util import BENCH_SF, one_round, warm_inputs
from jobs_features import favorita_std

from repro.core.baseline import run_shared_join
from repro.core.executor import Engine
from repro.datasets import favorita_db
from repro.ml.linreg import sigma_batch

BATCH = sigma_batch(favorita_std(), "units")
FANOUTS = (6, 30)


@pytest.fixture(scope="session")
def fan_dbs(spark):
    dbs = {}
    for f in FANOUTS:
        dbs[f] = favorita_db(spark, sf=BENCH_SF, holiday_fanout=f)
        warm_inputs(dbs[f])
    return dbs


@pytest.fixture(autouse=True)
def _clear_cache(spark, fan_dbs):
    yield
    spark.catalog.clearCache()
    for db in fan_dbs.values():
        warm_inputs(db)


def _force(results):
    return sum(df.count() for df in results.values())


@pytest.mark.parametrize("fanout", FANOUTS)
def test_t2b_fanout_shared_join(benchmark, fan_dbs, fanout):
    n = one_round(benchmark, lambda: _force(run_shared_join(fan_dbs[fanout], BATCH)))
    assert n > 0


@pytest.mark.parametrize("fanout", FANOUTS)
def test_t2b_fanout_lmfao(benchmark, fan_dbs, fanout):
    n = one_round(benchmark, lambda: _force(Engine(fan_dbs[fanout]).run(BATCH)))
    assert n > 0
