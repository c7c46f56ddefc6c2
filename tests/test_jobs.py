"""Every spark-submit job runs end-to-end at a tiny scale factor."""
import sys
from pathlib import Path

import pytest

sys.path.insert(0, str(Path(__file__).parent.parent / "jobs"))

import table1_batch_stats  # noqa: E402
import table2_runtime  # noqa: E402
import table3_apps  # noqa: E402
import table4_rkmeans  # noqa: E402


@pytest.fixture(scope="module")
def t1(spark):
    return table1_batch_stats.main(spark, sf=0.002)


def test_table1_rows(t1):
    assert len(t1) == 6  # 3 apps x 2 datasets
    assert {r["app"] for r in t1} == {
        "linreg (sigma)", "decision tree (per node)",
        "rk-means (n=6, n+1 queries)", "rk-means (n=11, n+1 queries)",
    }


def test_table1_lr_batch_in_paper_regime(t1):
    lr = {r["dataset"]: r for r in t1 if r["app"] == "linreg (sigma)"}
    assert lr["retailer"]["queries"] >= 100  # paper: 814-aggregate regime
    assert lr["favorita"]["queries"] >= 100


def test_table1_dt_effective_aggregates(t1):
    dt = {r["dataset"]: r for r in t1 if "decision tree" in r["app"]}
    # thresholds x 3 >> #queries: the paper's 3,141-per-node counting
    for r in dt.values():
        assert r["effective_aggregates"] > 10 * r["queries"]


def test_table1_views_fewer_than_naive(t1):
    """Sharing: merged views << queries x edges for the big LR batches."""
    for r in t1:
        if r["app"] == "linreg (sigma)":
            assert r["merged_views"] < r["queries"]


def test_table2_runs_and_strategies_agree_on_shape(spark):
    rows = table2_runtime.main(spark, sf=0.002)
    assert len(rows) == 12  # 4 strategies x 2 datasets + 2x2 fan-out sweep (T2b)
    by_ds = {}
    for r in rows:
        by_ds.setdefault(r["dataset"], set()).add(r["output_rows"])
    # every strategy produced the same total number of result rows
    for ds, counts in by_ds.items():
        assert len(counts) == 1, (ds, counts)


def test_table3_runs(spark):
    rows = table3_apps.main(spark, sf=0.002)
    assert len(rows) == 4
    lr = [r for r in rows if r["app"] == "linreg"]
    assert all(r["loss_end"] <= r["loss_start"] for r in lr)
    assert all(r["obj_gap_vs_closed_form"] < 0.05 for r in lr)
    dt = [r for r in rows if r["app"] == "decision tree"]
    assert all(r["agrees_with_exhaustive"] for r in dt)
    assert all(r["mse_tree"] < r["mse_mean_baseline"] for r in dt)


def test_table4_runs(spark):
    rows = table4_rkmeans.main(spark, sf=0.002, n_lloyd=3)
    assert len(rows) == 6  # 3 k_dim x 2 datasets
    for r in rows:
        assert 0 < r["coreset_size"] <= r["d_size"]
        assert r["rel_approx_vs_lloyds"] < 2.0
    # finer grids shrink the approximation gap (allowing small noise)
    for ds in ("favorita", "retailer"):
        sweep = [r for r in rows if r["dataset"] == ds]
        assert sweep[-1]["rel_approx_vs_lloyds"] <= sweep[0]["rel_approx_vs_lloyds"] + 0.1
