"""Table T1 — batch characteristics per application x dataset.

Paper anchors (§3): 814 aggregates for LR over Retailer; 3,141 aggregate
queries per decision-tree node over Retailer; n+1 queries for Rk-means.
We report, for our synthetic twins: #queries in the batch, #effective
aggregates (DT: thresholds x 3 derived from the group-by results), and
the plan-shape numbers that quantify LMFAO's sharing (#merged views,
#view groups, #aggregate columns, #distinct roots).

Run: ``spark-submit jobs/table1_batch_stats.py [sf]``
"""
from __future__ import annotations

import sys

from repro.core.executor import Engine
from repro.core.planner import plan_batch
from repro.core.root_assignment import assign_roots
from repro.datasets import favorita_db, retailer_db
from repro.ml.decision_tree import node_batch
from repro.ml.linreg import favorita_features, retailer_features, sigma_batch
from repro.ml.rkmeans import projection_batch


def _plan_row(db, batch, app, dataset, effective=None):
    plan = plan_batch(db.tree, batch, assign_roots(db.tree, batch))
    s = plan.stats()
    return {
        "app": app,
        "dataset": dataset,
        "queries": s["queries"],
        "effective_aggregates": effective if effective is not None else s["aggregates"],
        "merged_views": s["merged_views"],
        "view_groups": s["view_groups"],
        "view_columns": s["view_columns"],
        "roots": s["roots"],
    }


def main(spark, sf: float = 0.01) -> list[dict]:
    rows = []
    fav = favorita_db(spark, sf=sf)
    ret = retailer_db(spark, sf=sf)
    datasets = {
        "favorita": (fav, favorita_features(), "units"),
        "retailer": (ret, retailer_features(), "inventoryunits"),
    }
    for name, (db, feats, label) in datasets.items():
        rows.append(_plan_row(db, sigma_batch(feats, label), "linreg (sigma)", name))

        dt_feats = [f for f in feats if f.attr != label]
        batch = node_batch(dt_feats, label)
        eng = Engine(db)
        results = eng.run(batch)
        # effective aggregates = (#candidate thresholds per feature) x 3,
        # the counting behind the paper's "3,141 aggregates per node".
        eff = 3 + sum(3 * results[q.name].count() for q in batch if q.group_by)
        eng.unpersist_all()
        rows.append(_plan_row(db, batch, "decision tree (per node)", name, effective=eff))

        attrs = [f.attr for f in feats if not f.categorical]
        rows.append(
            _plan_row(db, projection_batch(attrs), f"rk-means (n={len(attrs)}, n+1 queries)", name)
        )
    return rows


if __name__ == "__main__":
    from _common import get_spark, print_table

    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.01
    spark = get_spark("table1")
    spark.sparkContext.setLogLevel("ERROR")
    print_table(f"T1 batch characteristics (SF={sf})", main(spark, sf))
    spark.stop()
