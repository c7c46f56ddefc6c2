"""T2 — LR sigma-batch runtime on Favorita: the four strategies.

Expected shape (paper §1/§4): lmfao << shared_join << naive, with the
multi-output pass (lmfao vs lmfao_nomoo) contributing a further cut.
"""
import pytest
from bench_util import one_round, warm_inputs
from jobs_features import favorita_std

from repro.core.baseline import run_naive, run_shared_join
from repro.core.executor import Engine
from repro.ml.linreg import sigma_batch

BATCH = sigma_batch(favorita_std(), "units")


def _force(results):
    return sum(df.count() for df in results.values())


@pytest.fixture(autouse=True)
def _clear_cache(spark, bench_fav):
    """Reset all caches between strategies, then re-warm the inputs so
    every strategy is measured from the same warm-input state."""
    yield
    spark.catalog.clearCache()
    warm_inputs(bench_fav)


def test_t2_favorita_naive(benchmark, bench_fav):
    n = one_round(benchmark, lambda: _force(run_naive(bench_fav, BATCH)))
    assert n > 0


def test_t2_favorita_shared_join(benchmark, bench_fav):
    n = one_round(benchmark, lambda: _force(run_shared_join(bench_fav, BATCH)))
    assert n > 0


def test_t2_favorita_lmfao_nomoo(benchmark, bench_fav):
    n = one_round(
        benchmark, lambda: _force(Engine(bench_fav, multi_output=False).run(BATCH))
    )
    assert n > 0


def test_t2_favorita_lmfao(benchmark, bench_fav):
    n = one_round(benchmark, lambda: _force(Engine(bench_fav).run(BATCH)))
    assert n > 0
