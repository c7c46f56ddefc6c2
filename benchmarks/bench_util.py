"""Benchmark helpers (kept out of conftest to avoid module-name clashes
with the root conftest)."""
import os

BENCH_SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))



def one_round(benchmark, fn):
    """Run ``fn`` once under pytest-benchmark.

    Spark jobs at SF=0.1 run seconds-to-minutes; statistical rounds would
    multiply wall time for no insight — the comparison of interest is
    *between strategies*, not run-to-run variance.
    """
    return benchmark.pedantic(fn, rounds=1, iterations=1, warmup_rounds=0)


def warm_inputs(db) -> None:
    """(Re-)cache and materialize the input frames so strategies are
    measured with identical warm inputs (generation cost excluded)."""
    for name in db.tree.nodes:
        if not db.frames[name].is_cached:
            db.frames[name] = db.frames[name].cache()
        db.frames[name].count()
