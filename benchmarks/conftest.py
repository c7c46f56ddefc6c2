"""Benchmark fixtures: bench-scale databases (REPRO_BENCH_SF, default 0.1).

Each strategy benchmark is a single measured round (Spark jobs at SF=0.1
run seconds-to-minutes; statistical rounds would multiply wall time for
no insight — the comparison of interest is *between strategies*).
"""
import os
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).parent.parent / "jobs"))

sys.path.insert(0, str(Path(__file__).parent))

from repro.datasets import favorita_db, retailer_db  # noqa: E402



from bench_util import BENCH_SF, warm_inputs  # noqa: E402, F401


@pytest.fixture(scope="session")
def bench_fav(spark):
    db = favorita_db(spark, sf=BENCH_SF)
    warm_inputs(db)
    return db


@pytest.fixture(scope="session")
def bench_ret(spark):
    db = retailer_db(spark, sf=BENCH_SF)
    warm_inputs(db)
    return db


