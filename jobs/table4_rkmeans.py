"""Table T4 — Rk-means quality and coreset size (paper §4 UI metrics).

For each dataset: the per-step times, the grid-coreset size relative to
|D|, and the relative intra-cluster-distance difference between the
Rk-means centroids and conventional Lloyd's on the full materialized D,
averaged over 10 seeded Lloyd's runs (exactly the paper's metric). We
sweep the per-dimension cluster count k_dim to show the coreset
converging toward Lloyd's quality as the grid refines.

Run: ``spark-submit jobs/table4_rkmeans.py [sf]``
"""
from __future__ import annotations

import sys

from repro.datasets import favorita_db, retailer_db
from repro.ml.rkmeans import lloyd_on_full_data, relative_approximation, rkmeans

K = 5
KDIMS = (5, 10, 20)
ATTRS = {
    "favorita": ["units", "txns", "oilprize"],
    "retailer": ["inventoryunits", "prize", "maxtemp"],
}


def run_dataset(db, attrs, dataset: str, n_lloyd: int = 10) -> list[dict]:
    d_pdf = db.joined().select(*attrs).toPandas()
    lloyds = lloyd_on_full_data(d_pdf, attrs, K, seeds=list(range(n_lloyd)))
    rows = []
    for k_dim in KDIMS:
        rk = rkmeans(db, attrs, K, k_dim=k_dim, seed=1)
        rows.append(
            {
                "dataset": dataset,
                "n_dims": len(attrs),
                "k": K,
                "k_dim": k_dim,
                "d_size": int(rk.d_size),
                "coreset_size": rk.grid_size,
                "rel_coreset_size": rk.rel_coreset_size,
                "rel_approx_vs_lloyds": relative_approximation(d_pdf, attrs, rk, lloyds),
                "step1_s": rk.timings["step1_projections"],
                "step3_s": rk.timings["step3_grid"],
                "kmeans_s": rk.timings["step2_dim_kmeans"] + rk.timings["step4_kmeans"],
            }
        )
    return rows


def main(spark, sf: float = 0.1, n_lloyd: int = 10) -> list[dict]:
    rows = []
    rows += run_dataset(favorita_db(spark, sf=sf), ATTRS["favorita"], "favorita", n_lloyd)
    rows += run_dataset(retailer_db(spark, sf=sf), ATTRS["retailer"], "retailer", n_lloyd)
    return rows


if __name__ == "__main__":
    from _common import get_spark, print_table

    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.1
    spark = get_spark("table4")
    spark.sparkContext.setLogLevel("ERROR")
    print_table(f"T4 rk-means quality (SF={sf})", main(spark, sf))
    spark.stop()
