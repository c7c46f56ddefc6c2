"""Table T2 — batch runtime: LMFAO vs the mainstream strategies.

The paper's core performance claim (§1, §4): evaluating the whole batch
with shared views is far faster than evaluating each aggregate on its
own, and the multi-output pass adds further sharing. Strategies:

* ``naive``       — one independent join+aggregate per query
* ``shared_join`` — materialize D once (cached), aggregate per query
* ``lmfao_nomoo`` — LMFAO views, but one groupBy per view (ablation)
* ``lmfao``       — full engine (merged views + grouping-sets passes)

Run: ``spark-submit jobs/table2_runtime.py [sf]``
"""
from __future__ import annotations

import sys

from repro.core.baseline import run_naive, run_shared_join
from repro.core.executor import Engine
from repro.ml.linreg import sigma_batch


def strategies(db):
    return {
        "naive": lambda batch: run_naive(db, batch),
        "shared_join": lambda batch: run_shared_join(db, batch),
        "lmfao_nomoo": lambda batch: Engine(db, multi_output=False).run(batch),
        "lmfao": lambda batch: Engine(db).run(batch),
    }


def run_dataset(db, batch, dataset: str, include: tuple[str, ...] | None = None) -> list[dict]:
    from _common import force, timed

    spark = db.frames[db.tree.nodes[0]].sparkSession

    def warm() -> None:
        # identical warm-input state for every strategy (generation and
        # parallelize costs excluded from the measurement)
        for name in db.tree.nodes:
            if not db.frames[name].is_cached:
                db.frames[name] = db.frames[name].cache()
            db.frames[name].count()

    rows = []
    warm()
    force({"warmup": db.joined()})  # JVM/codegen warmup
    spark.catalog.clearCache()
    warm()
    base = None
    strats = strategies(db)
    for name in include or tuple(strats):
        secs, out_rows = timed(lambda: force(strats[name](batch)))
        if base is None:
            base = secs
        rows.append(
            {
                "dataset": dataset,
                "strategy": name,
                "queries": len(batch),
                "output_rows": out_rows,
                "seconds": secs,
                "speedup_vs_first": base / secs,
            }
        )
        spark.catalog.clearCache()
        warm()
    return rows


def main(spark, sf: float = 0.1) -> list[dict]:
    from jobs_features import favorita_std, retailer_std

    from repro.datasets import favorita_db, retailer_db

    rows = []
    fav = favorita_db(spark, sf=sf)
    rows += run_dataset(fav, sigma_batch(favorita_std(), "units"), "favorita")
    ret = retailer_db(spark, sf=sf)
    rows += run_dataset(ret, sigma_batch(retailer_std(), "inventoryunits"), "retailer")
    # T2b: the join-expensive regime, as a |D| sweep. Multiple holiday
    # rows per date (like the real dataset) inflate |D| multiplicatively;
    # strategies that materialize D scale with the fan-out while LMFAO's
    # views (pre-aggregated per date) do not grow at all. naive is
    # excluded (strictly dominated and fanout-times slower).
    for fanout in (6, 30):
        fan = favorita_db(spark, sf=sf, holiday_fanout=fanout)
        rows += run_dataset(
            fan,
            sigma_batch(favorita_std(), "units"),
            f"favorita_fanout{fanout}",
            include=("shared_join", "lmfao"),
        )
    return rows


if __name__ == "__main__":
    from _common import get_spark, print_table

    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.1
    spark = get_spark("table2")
    spark.sparkContext.setLogLevel("ERROR")
    print_table(f"T2 batch runtime (SF={sf})", main(spark, sf))
    spark.stop()
