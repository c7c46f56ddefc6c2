"""T1 — planner throughput and plan shape on the full-width LR batches.

Pure planning (no Spark jobs): view generation + merging for the
several-hundred-query sigma batches must be milliseconds — LMFAO's
optimization layers are cheap relative to execution.
"""
from bench_util import one_round

from repro.core.planner import plan_batch
from repro.core.root_assignment import assign_roots
from repro.datasets import favorita_tree, retailer_tree
from repro.ml.linreg import favorita_features, retailer_features, sigma_batch


def test_plan_lr_favorita_fullwidth(benchmark):
    tree = favorita_tree()
    batch = sigma_batch(favorita_features(), "units")
    plan = one_round(benchmark, lambda: plan_batch(tree, batch, assign_roots(tree, batch)))
    s = plan.stats()
    assert s["queries"] == len(batch)
    assert s["merged_views"] < s["queries"]


def test_plan_lr_retailer_fullwidth(benchmark):
    tree = retailer_tree()
    batch = sigma_batch(retailer_features(), "inventoryunits")
    plan = one_round(benchmark, lambda: plan_batch(tree, batch, assign_roots(tree, batch)))
    assert plan.stats()["queries"] == len(batch)
