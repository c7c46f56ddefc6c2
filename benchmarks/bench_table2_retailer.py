"""T2 — LR sigma-batch runtime on Retailer: the four strategies."""
import pytest
from bench_util import one_round, warm_inputs
from jobs_features import retailer_std

from repro.core.baseline import run_naive, run_shared_join
from repro.core.executor import Engine
from repro.ml.linreg import sigma_batch

BATCH = sigma_batch(retailer_std(), "inventoryunits")


def _force(results):
    return sum(df.count() for df in results.values())


@pytest.fixture(autouse=True)
def _clear_cache(spark, bench_ret):
    """Reset all caches between strategies, then re-warm the inputs so
    every strategy is measured from the same warm-input state."""
    yield
    spark.catalog.clearCache()
    warm_inputs(bench_ret)


def test_t2_retailer_naive(benchmark, bench_ret):
    n = one_round(benchmark, lambda: _force(run_naive(bench_ret, BATCH)))
    assert n > 0


def test_t2_retailer_shared_join(benchmark, bench_ret):
    n = one_round(benchmark, lambda: _force(run_shared_join(bench_ret, BATCH)))
    assert n > 0


def test_t2_retailer_lmfao_nomoo(benchmark, bench_ret):
    n = one_round(
        benchmark, lambda: _force(Engine(bench_ret, multi_output=False).run(BATCH))
    )
    assert n > 0


def test_t2_retailer_lmfao(benchmark, bench_ret):
    n = one_round(benchmark, lambda: _force(Engine(bench_ret).run(BATCH)))
    assert n > 0
