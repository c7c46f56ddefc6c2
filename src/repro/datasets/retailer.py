"""Retailer database (the paper's commercial dataset, synthesized).

Join tree::

    item -- inventory -- weather
              |
           location -- census

Edges: inventory-item (ksn), inventory-weather (locn, dateid),
inventory-location (locn), location-census (zip).
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro import synth_data
from repro.core.database import Database
from repro.core.schema import JoinTree, Relation


def retailer_tree() -> JoinTree:
    """The Retailer join tree (schema only, no data)."""
    return JoinTree(
        relations=[
            Relation("inventory", ("locn", "dateid", "ksn", "inventoryunits")),
            Relation("location", ("locn", "zip", "rgn_cd", "clim_zn_nbr")),
            Relation(
                "census",
                ("zip", "population", "white", "asian", "pacific", "black", "medianage"),
            ),
            Relation("item", ("ksn", "subcategory", "category", "categorycluster", "prize")),
            Relation(
                "weather",
                ("locn", "dateid", "rain", "snow", "maxtemp", "mintemp", "meanwind", "thunder"),
            ),
        ],
        edges=[
            ("inventory", "item"),
            ("inventory", "weather"),
            ("inventory", "location"),
            ("location", "census"),
        ],
    )


def retailer_db(spark: SparkSession, *, sf: float = 0.01, seed: int = 11) -> Database:
    """Synthetic Retailer at scale factor ``sf`` as an engine Database."""
    return Database(retailer_tree(), synth_data.retailer(spark, sf=sf, seed=seed))
