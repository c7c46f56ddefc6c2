"""Weighted k-means (Lloyd's algorithm) — the clustering substrate for
Rk-means steps 2 and 4, and the full-data comparator for Table T4.

Pure NumPy, deterministic in ``seed`` (k-means++ initialization with a
seeded generator). Supports point weights, which is what the grid
coreset requires.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


def _pairwise_sq(points: np.ndarray, centers: np.ndarray) -> np.ndarray:
    """Squared Euclidean distances, (m, k)."""
    return ((points[:, None, :] - centers[None, :, :]) ** 2).sum(axis=2)


def kmeanspp_init(
    points: np.ndarray, weights: np.ndarray, k: int, rng: np.random.Generator
) -> np.ndarray:
    """Weighted k-means++ seeding."""
    m = len(points)
    first = rng.choice(m, p=weights / weights.sum())
    centers = [points[first]]
    for _ in range(1, k):
        d2 = _pairwise_sq(points, np.array(centers)).min(axis=1)
        p = d2 * weights
        tot = p.sum()
        if tot <= 0:  # all mass on existing centers: pick any point
            centers.append(points[rng.integers(m)])
            continue
        centers.append(points[rng.choice(m, p=p / tot)])
    return np.array(centers)


@dataclass
class KmeansResult:
    """Centroids, per-point assignment, and the weighted cost
    Σ w_i ‖x_i − c_{a(i)}‖²."""

    centers: np.ndarray  # (k, d)
    assign: np.ndarray  # (m,)
    cost: float


def weighted_lloyd(
    points: np.ndarray,
    weights: np.ndarray | None = None,
    k: int = 3,
    *,
    iters: int = 100,
    seed: int = 0,
    tol: float = 1e-9,
) -> KmeansResult:
    """Weighted Lloyd's algorithm on (m, d) points.

    1-D inputs may be passed as shape (m,). If k >= #distinct points,
    the distinct points themselves are the optimum (cost contributed
    only by duplicates, which is zero for exact duplicates).
    """
    pts = np.asarray(points, dtype=float)
    if pts.ndim == 1:
        pts = pts[:, None]
    m = len(pts)
    w = np.ones(m) if weights is None else np.asarray(weights, dtype=float)
    if m == 0:
        raise ValueError("no points")
    distinct = np.unique(pts, axis=0)
    if k >= len(distinct):
        centers = distinct
        d2 = _pairwise_sq(pts, centers)
        assign = d2.argmin(axis=1)
        return KmeansResult(centers, assign, float((w * d2.min(axis=1)).sum()))
    rng = np.random.default_rng(seed)
    centers = kmeanspp_init(pts, w, k, rng)
    prev = np.inf
    for _ in range(iters):
        d2 = _pairwise_sq(pts, centers)
        assign = d2.argmin(axis=1)
        cost = float((w * d2[np.arange(m), assign]).sum())
        for j in range(k):
            mask = assign == j
            wj = w[mask].sum()
            if wj > 0:
                centers[j] = (pts[mask] * w[mask, None]).sum(axis=0) / wj
            else:  # empty cluster: respawn at the farthest point
                centers[j] = pts[d2.min(axis=1).argmax()]
        if prev - cost <= tol * max(prev, 1.0):
            break
        prev = cost
    d2 = _pairwise_sq(pts, centers)
    assign = d2.argmin(axis=1)
    cost = float((w * d2[np.arange(m), assign]).sum())
    return KmeansResult(centers, assign, cost)


def best_of(
    points: np.ndarray,
    weights: np.ndarray | None,
    k: int,
    *,
    n_init: int = 5,
    seed: int = 0,
    iters: int = 100,
) -> KmeansResult:
    """Best-cost result over ``n_init`` seeded restarts (k-means++ is
    randomized; restarts are the standard guard against local optima)."""
    best: KmeansResult | None = None
    for s in range(n_init):
        r = weighted_lloyd(points, weights, k, iters=iters, seed=seed + s)
        if best is None or r.cost < best.cost:
            best = r
    return best


def cost_of(points: np.ndarray, centers: np.ndarray, weights: np.ndarray | None = None) -> float:
    """Weighted k-means cost of ``points`` under fixed ``centers``."""
    pts = np.asarray(points, dtype=float)
    if pts.ndim == 1:
        pts = pts[:, None]
    w = np.ones(len(pts)) if weights is None else np.asarray(weights, dtype=float)
    return float((w * _pairwise_sq(pts, centers).min(axis=1)).sum())
