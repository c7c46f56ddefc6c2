"""DuckDB correctness oracle.

``assert_equivalent(spark_df, sql, **tables)`` runs ``sql`` in DuckDB
over ``tables`` and asserts the sorted rows match ``spark_df`` (the
Spark result). This catches wrong results from a rewritten plan or a
custom operator — "it ran" is not "it is correct".

``tables`` may be Spark or pandas DataFrames; Spark inputs are
collected via ``.toPandas()``. Alias every output column identically
on both sides (Spark names ``count(*)`` as ``count(1)``, DuckDB as
``count_star()``) and project to scalar columns — array/map/struct
columns are not orderable so cannot be compared here.
"""
import duckdb
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame


def _canon(pdf: pd.DataFrame) -> pd.DataFrame:
    # Canonical column order first, then row order by those columns, so
    # two results that differ only in projection order compare equal.
    pdf = pdf[sorted(pdf.columns)].reset_index(drop=True).copy()
    for c in pdf.select_dtypes(include=["float", "float64"]).columns:
        pdf[c] = pdf[c].round(6)
    return pdf.sort_values(list(pdf.columns)).reset_index(drop=True)


def assert_equivalent(spark_df: DataFrame, sql: str, rtol: float | None = None, **tables) -> None:
    """Assert the Spark result equals ``sql`` evaluated on DuckDB.

    ``rtol`` (optional extension): large floating-point SUMs are not
    associative, so two correct engines can disagree past 6 decimal
    places on values like SUM(price*price) ~ 1e14. When set, group-by
    key columns are still matched exactly, but float aggregate columns
    are compared with relative tolerance ``rtol`` instead of absolute
    6-dp rounding. Default (None) keeps the original strict behavior.
    """
    con = duckdb.connect()
    try:
        for name, t in tables.items():
            con.register(name, t.toPandas() if isinstance(t, DataFrame) else t)
        expected = con.execute(sql).fetchdf()
    finally:
        con.close()
    got = spark_df.toPandas()
    assert set(expected.columns) == set(got.columns), (
        f"column mismatch: {sorted(got.columns)} vs {sorted(expected.columns)} "
        "— alias every output column identically on both sides"
    )
    if rtol is None:
        pd.testing.assert_frame_equal(
            _canon(got), _canon(expected), check_dtype=False
        )
        return
    # Tolerant path: sort both sides by the non-float columns (group-by
    # keys), require identical shape/keys, then np.isclose on floats.
    def split(pdf: pd.DataFrame):
        pdf = pdf[sorted(pdf.columns)].reset_index(drop=True)
        floats = sorted(pdf.select_dtypes(include=["float", "float64"]).columns)
        keys = [c for c in pdf.columns if c not in floats]
        pdf = pdf.sort_values(keys or list(pdf.columns)).reset_index(drop=True)
        return pdf, keys, floats

    g, gk, gf = split(got)
    e, ek, ef = split(expected)
    assert len(g) == len(e), f"row count mismatch: {len(g)} vs {len(e)}"
    assert gk == ek and gf == ef, f"column typing mismatch: {gk}/{gf} vs {ek}/{ef}"
    if gk:
        pd.testing.assert_frame_equal(g[gk], e[ek], check_dtype=False)
    for c in gf:
        a, b = g[c].to_numpy(float), e[c].to_numpy(float)
        ok = np.isclose(a, b, rtol=rtol, atol=1e-9, equal_nan=True)
        assert ok.all(), (
            f"column {c}: {int((~ok).sum())} of {len(a)} values differ beyond "
            f"rtol={rtol}; first diff got={a[~ok][:3]} expected={b[~ok][:3]}"
        )
