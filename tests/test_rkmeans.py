"""Rk-means: projection weights vs oracle, the extended-tree grid query,
coreset size, and the approximation metric."""
import numpy as np
import pandas as pd
import pytest

from repro.core.executor import Engine
from repro.core.sql_compile import query_to_sql
from repro.ml.rkmeans import (
    extend_with_assignments,
    grid_query,
    lloyd_on_full_data,
    projection_batch,
    relative_approximation,
    rkmeans,
)
from repro.oracle import assert_equivalent

ATTRS = ["units", "txns", "oilprize"]


def test_projection_batch_is_n_queries():
    batch = projection_batch(ATTRS)
    assert len(batch) == len(ATTRS)
    assert all(q.group_by == (a,) for q, a in zip(batch, ATTRS))


@pytest.fixture(scope="module")
def proj_results(fav_db):
    return Engine(fav_db).run(projection_batch(ATTRS))


@pytest.mark.parametrize("a", ATTRS)
def test_projection_matches_oracle(fav_db, proj_results, a):
    batch = {q.name: q for q in projection_batch(ATTRS)}
    sql = query_to_sql(fav_db, batch[f"proj_{a}"])
    assert_equivalent(proj_results[f"proj_{a}"], sql, rtol=1e-9, **fav_db.oracle_tables())


def test_projection_weights_sum_to_d(fav_db, fav_d, proj_results):
    for a in ATTRS:
        w = proj_results[f"proj_{a}"].toPandas()["w"].sum()
        assert w == len(fav_d)


def test_extended_tree_valid(fav_db):
    assigns = {
        a: pd.DataFrame({a: sorted(fav_db.joined().toPandas()[a].unique())[:5], f"c_{a}": [0, 0, 1, 1, 1]})
        for a in ["units"]
    }
    ext = extend_with_assignments(fav_db, assigns)
    assert "assign_units" in ext.tree.relations
    assert ("assign_units", "sales") in ext.tree.edges


@pytest.fixture(scope="module")
def rk(fav_db):
    return rkmeans(fav_db, ATTRS, k=4, seed=1)


def test_rkmeans_n_plus_1_queries(rk):
    """Paper §3: LMFAO computes steps 1 and 3 with n+1 queries total."""
    assert len(projection_batch(ATTRS)) + 1 == len(ATTRS) + 1


def test_grid_smaller_than_d(rk):
    assert rk.grid_size < rk.d_size
    assert 0 < rk.rel_coreset_size < 0.5


def test_grid_weights_sum_to_d(rk):
    assert np.isclose(rk.grid_weights.sum(), rk.d_size)


def test_centers_shape(rk):
    assert rk.centers.shape == (4, len(ATTRS))


def test_grid_points_lie_on_dim_centroids(rk):
    for j, a in enumerate(ATTRS):
        assert set(np.round(rk.grid_points[:, j], 9)) <= set(
            np.round(rk.dim_centroids[a], 9)
        )


def test_grid_query_matches_oracle(fav_db, rk):
    """Step 3 evaluated by the engine over the extended tree equals the
    flat SQL over base tables + assignment relations on DuckDB."""
    proj = {
        name: df.toPandas()
        for name, df in Engine(fav_db).run(projection_batch(ATTRS)).items()
    }
    from repro.ml.kmeans import weighted_lloyd

    assigns = {}
    for a in ATTRS:
        p = proj[f"proj_{a}"]
        res = weighted_lloyd(p[a].to_numpy(float), p["w"].to_numpy(float), 4, seed=1)
        assigns[a] = pd.DataFrame({a: p[a].to_numpy(), f"c_{a}": res.assign.astype("int64")})
    ext = extend_with_assignments(fav_db, assigns)
    out = Engine(ext).run([grid_query(ATTRS)])["grid"]
    sql = query_to_sql(ext, grid_query(ATTRS))
    assert_equivalent(out, sql, rtol=1e-9, **ext.oracle_tables())


def test_relative_approximation_bounded(fav_db, fav_d, rk):
    lloyds = lloyd_on_full_data(fav_d, ATTRS, 4, seeds=[0, 1, 2])
    rel = relative_approximation(fav_d, ATTRS, rk, lloyds)
    # constant-factor approximation regime; can be negative when the
    # multi-restart coreset clustering beats single-init Lloyd's runs
    assert -0.9 < rel < 1.0


def test_finer_grid_improves_approximation(fav_db, fav_d):
    """More per-dimension centroids -> coreset closer to Lloyd's."""
    lloyds = lloyd_on_full_data(fav_d, ATTRS, 4, seeds=[0, 1, 2])
    coarse = rkmeans(fav_db, ATTRS, k=4, k_dim=2, seed=1)
    fine = rkmeans(fav_db, ATTRS, k=4, k_dim=16, seed=1)
    rel_c = relative_approximation(fav_d, ATTRS, coarse, lloyds)
    rel_f = relative_approximation(fav_d, ATTRS, fine, lloyds)
    assert rel_f <= rel_c + 0.05


def test_timings_recorded(rk):
    assert set(rk.timings) == {
        "step1_projections", "step2_dim_kmeans", "step3_grid", "step4_kmeans",
    }
    assert all(t >= 0 for t in rk.timings.values())
