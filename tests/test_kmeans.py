"""Weighted Lloyd's: exactness on separable data, weights, determinism."""
import numpy as np
import pytest

from repro.ml.kmeans import cost_of, kmeanspp_init, weighted_lloyd


def test_k_ge_distinct_is_exact():
    pts = np.array([0.0, 0.0, 5.0, 9.0])
    res = weighted_lloyd(pts, None, k=5)
    assert res.cost == 0.0
    assert sorted(res.centers.ravel().tolist()) == [0.0, 5.0, 9.0]


def test_separated_clusters_found():
    rng = np.random.default_rng(0)
    pts = np.concatenate([rng.normal(0, 0.1, 200), rng.normal(10, 0.1, 200)])
    res = weighted_lloyd(pts, None, k=2, seed=1)
    centers = sorted(res.centers.ravel().tolist())
    assert abs(centers[0] - 0) < 0.5 and abs(centers[1] - 10) < 0.5


def test_weights_equal_replication():
    """Weighted points must behave like replicated points."""
    pts = np.array([0.0, 1.0, 10.0, 11.0])
    w = np.array([3.0, 1.0, 1.0, 3.0])
    rep = np.array([0.0] * 3 + [1.0] + [10.0] + [11.0] * 3)
    a = weighted_lloyd(pts, w, k=2, seed=0)
    b = weighted_lloyd(rep, None, k=2, seed=0)
    assert np.allclose(sorted(a.centers.ravel()), sorted(b.centers.ravel()))
    assert np.isclose(a.cost, b.cost)


def test_2d_clusters():
    rng = np.random.default_rng(3)
    pts = np.vstack([rng.normal([0, 0], 0.2, (100, 2)), rng.normal([5, 5], 0.2, (100, 2))])
    res = weighted_lloyd(pts, None, k=2, seed=0)
    c = res.centers[np.argsort(res.centers[:, 0])]
    assert np.allclose(c[0], [0, 0], atol=0.5) and np.allclose(c[1], [5, 5], atol=0.5)


def test_deterministic_in_seed():
    rng = np.random.default_rng(4)
    pts = rng.random((100, 3))
    a = weighted_lloyd(pts, None, k=4, seed=7)
    b = weighted_lloyd(pts, None, k=4, seed=7)
    assert np.array_equal(a.centers, b.centers)


def test_cost_decreases_with_k():
    rng = np.random.default_rng(5)
    pts = rng.random(300)
    costs = [weighted_lloyd(pts, None, k=k, seed=0).cost for k in (1, 2, 4, 8)]
    assert all(b <= a + 1e-9 for a, b in zip(costs, costs[1:]))


def test_assignment_is_nearest():
    rng = np.random.default_rng(6)
    pts = rng.random((50, 2))
    res = weighted_lloyd(pts, None, k=3, seed=0)
    d2 = ((pts[:, None, :] - res.centers[None]) ** 2).sum(2)
    assert np.array_equal(res.assign, d2.argmin(1))


def test_cost_of_matches_result():
    rng = np.random.default_rng(8)
    pts = rng.random((80, 2))
    w = rng.random(80) + 0.5
    res = weighted_lloyd(pts, w, k=3, seed=0)
    assert np.isclose(res.cost, cost_of(pts, res.centers, w))


def test_k1_center_is_weighted_mean():
    pts = np.array([0.0, 2.0, 10.0])
    w = np.array([1.0, 1.0, 2.0])
    res = weighted_lloyd(pts, w, k=1)
    assert np.isclose(res.centers[0, 0], (0 + 2 + 20) / 4)


def test_kmeanspp_selects_distinct_points():
    pts = np.arange(10.0)[:, None]
    rng = np.random.default_rng(0)
    centers = kmeanspp_init(pts, np.ones(10), 4, rng)
    assert len(np.unique(centers)) == 4


def test_empty_input_raises():
    with pytest.raises(ValueError):
        weighted_lloyd(np.empty((0, 2)), None, k=2)


def test_zero_weight_points_ignored_in_centroids():
    pts = np.array([0.0, 1.0, 100.0])
    w = np.array([1.0, 1.0, 0.0])
    res = weighted_lloyd(pts, w, k=1)
    assert np.isclose(res.centers[0, 0], 0.5)
