"""Database builders: join trees + synthetic frames for the paper's
datasets (Favorita, Retailer) and the provided TPC-H-lite tables."""

from repro.datasets.favorita import favorita_db, favorita_tree
from repro.datasets.retailer import retailer_db, retailer_tree
from repro.datasets.tpch import tpch_db, tpch_tree

__all__ = [
    "favorita_db",
    "favorita_tree",
    "retailer_db",
    "retailer_tree",
    "tpch_db",
    "tpch_tree",
]
