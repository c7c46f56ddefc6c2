"""Shared helpers for the spark-submit job entrypoints.

Each job is also importable (``main(spark) -> list[dict]``) so tests can
run it at a tiny scale factor and the benchmark harness can reuse the
session-scoped fixture session.
"""
from __future__ import annotations

import os
import time

# Driver memory must be fixed before the JVM launches (i.e. before any
# pyspark import anywhere). 16g is enough for SF=0.1 caches while leaving
# headroom for a concurrently running test session.
os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '16g')} "
    "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false "
    "pyspark-shell",
)

from pyspark.sql import DataFrame, SparkSession


def get_spark(app: str) -> SparkSession:
    """Session for standalone (spark-submit / python) execution, mirroring
    the test fixture's config (broadcast joins off, Arrow on)."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "32"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def bench_sf() -> float:
    """Benchmark scale factor (REPRO_BENCH_SF env, default 0.1 ~ 100MB)."""
    return float(os.environ.get("REPRO_BENCH_SF", "0.1"))


def force(results: dict[str, DataFrame]) -> int:
    """Force execution of every result frame; returns total output rows."""
    return sum(df.count() for df in results.values())


def timed(fn) -> tuple[float, object]:
    """(wall seconds, fn()) — the measurement primitive for the jobs."""
    t0 = time.perf_counter()
    out = fn()
    return time.perf_counter() - t0, out


def print_table(title: str, rows: list[dict]) -> None:
    """Render rows as a GitHub-markdown table on stdout.

    Columns are the union of keys over all rows (first-appearance order),
    so heterogeneous rows (e.g. LR vs DT metrics) render completely.
    """
    print(f"\n## {title}\n")
    if not rows:
        print("(no rows)")
        return
    cols: list[str] = []
    for r in rows:
        cols += [c for c in r if c not in cols]
    print("| " + " | ".join(cols) + " |")
    print("|" + "|".join(["---"] * len(cols)) + "|")
    for r in rows:
        print("| " + " | ".join(_fmt(r.get(c, "")) for c in cols) + " |")


def _fmt(v) -> str:
    if isinstance(v, float):
        return f"{v:.4g}"
    return str(v)
