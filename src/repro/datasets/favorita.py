"""Favorita database: the paper's running example (Fig. 2).

Join tree::

    stores -- transactions -- sales -- items
                               |  \\
                              oil  holidays

Edges: sales-transactions (date, store), transactions-stores (store),
sales-oil (date), sales-holidays (date), sales-items (item). The fact
table ``sales`` is declared first so it anchors the shared ``date``,
``store`` and ``item`` attributes.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro import synth_data
from repro.core.database import Database
from repro.core.schema import JoinTree, Relation


def favorita_tree() -> JoinTree:
    """The Favorita join tree (schema only, no data)."""
    return JoinTree(
        relations=[
            Relation("sales", ("date", "store", "item", "units", "promo")),
            Relation("transactions", ("date", "store", "txns")),
            Relation("stores", ("store", "city", "state", "stype", "cluster")),
            Relation("oil", ("date", "oilprize")),
            Relation("holidays", ("date", "htype", "locale", "transferred")),
            Relation("items", ("item", "family", "iclass", "perishable")),
        ],
        edges=[
            ("sales", "transactions"),
            ("transactions", "stores"),
            ("sales", "oil"),
            ("sales", "holidays"),
            ("sales", "items"),
        ],
    )


def favorita_db(
    spark: SparkSession, *, sf: float = 0.01, seed: int = 7, holiday_fanout: int = 1
) -> Database:
    """Synthetic Favorita at scale factor ``sf`` as an engine Database.

    ``holiday_fanout`` > 1 inflates |D| multiplicatively (several holiday
    rows per date, as in the real dataset) without growing any view —
    the join-expensive regime of EXPERIMENTS.md T2b.
    """
    return Database(
        favorita_tree(),
        synth_data.favorita(spark, sf=sf, seed=seed, holiday_fanout=holiday_fanout),
    )
