"""T3 — end-to-end learning benchmarks.

LR: the full pipeline (engine batch -> Σ -> 300 BGD iterations); the
aggregate batch dominates, BGD itself is data-free NumPy. DT: one node's
aggregate batch via the engine vs the naive per-query strategy.
"""
import pytest
from bench_util import one_round, warm_inputs
from jobs_features import favorita_std

from repro.core.baseline import run_naive
from repro.core.executor import Engine
from repro.ml.decision_tree import node_batch
from repro.ml.linreg import train_linreg


@pytest.fixture(autouse=True)
def _clear_cache(spark, bench_fav):
    """Reset all caches between strategies, then re-warm the inputs so
    every strategy is measured from the same warm-input state."""
    yield
    spark.catalog.clearCache()
    warm_inputs(bench_fav)


def test_t3_lr_end_to_end_lmfao(benchmark, bench_fav):
    def run():
        theta, losses, sm = train_linreg(
            Engine(bench_fav), favorita_std(), "units", epochs=300
        )
        return losses[-1]

    final = one_round(benchmark, run)
    assert final >= 0


def test_t3_dt_node_lmfao(benchmark, bench_fav):
    feats = [f for f in favorita_std() if f.attr != "units"]
    batch = node_batch(feats, "units")
    n = one_round(
        benchmark,
        lambda: sum(df.count() for df in Engine(bench_fav).run(batch).values()),
    )
    assert n > 0


def test_t3_dt_node_naive(benchmark, bench_fav):
    feats = [f for f in favorita_std() if f.attr != "units"]
    batch = node_batch(feats, "units")
    n = one_round(
        benchmark,
        lambda: sum(df.count() for df in run_naive(bench_fav, batch).values()),
    )
    assert n > 0
