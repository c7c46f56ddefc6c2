"""T4 — Rk-means via LMFAO vs conventional Lloyd's on materialized D.

The paper's point: the relational pipeline clusters without ever
materializing D per iteration — Lloyd's on the full join is the
comparator both for cost (here) and approximation quality (T4 job).
"""
import pytest
from bench_util import one_round, warm_inputs

from repro.ml.kmeans import weighted_lloyd
from repro.ml.rkmeans import rkmeans

ATTRS = ["units", "txns", "oilprize"]
K = 5


@pytest.fixture(autouse=True)
def _clear_cache(spark, bench_fav):
    """Reset all caches between strategies, then re-warm the inputs so
    every strategy is measured from the same warm-input state."""
    yield
    spark.catalog.clearCache()
    warm_inputs(bench_fav)


def test_t4_rkmeans_lmfao(benchmark, bench_fav):
    rk = one_round(benchmark, lambda: rkmeans(bench_fav, ATTRS, K, k_dim=10, seed=1))
    assert rk.grid_size < rk.d_size


def test_t4_lloyds_on_materialized_join(benchmark, bench_fav):
    d = bench_fav.joined().select(*ATTRS).toPandas()

    def run():
        pts = d[ATTRS].to_numpy(float)
        return weighted_lloyd(pts, None, K, seed=1).cost

    cost = one_round(benchmark, run)
    assert cost > 0
