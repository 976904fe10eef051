"""Tests for the sequential-λ helper behind the distributed projection.

The helper must reproduce *exactly* the sequential plane/slab projections of
the numpy one-shot alternating method — that identity is what makes the Spark
and local GD trajectories coincide (verified end-to-end in test_spark_gd).
"""
import numpy as np
import pytest

from repro.core import projection_np as P
from repro.core.projection_spark import sequential_lambdas


def _apply(y, W, lam, free):
    x = y.copy()
    x[free] = y[free] - (W[free] @ lam)
    return x


@pytest.mark.parametrize("d", [1, 2, 3])
@pytest.mark.parametrize("seed", range(4))
def test_matches_sequential_plane_projection(d, seed):
    rng = np.random.default_rng(seed)
    n = 40
    y = rng.normal(0, 1.5, n)
    W = rng.uniform(0.1, 2.0, (n, d))
    b = 0.05 * W.sum(axis=0)
    free = np.ones(n, bool)

    s = W.T @ y
    D = W.T @ W
    lam = sequential_lambdas(s, D, b, target="plane")
    got = _apply(y, W, lam, free)

    want = y.copy()
    for j in range(d):
        want = P.project_plane(want, W[:, j], 0.0)
    assert np.allclose(got, want, atol=1e-10)


@pytest.mark.parametrize("seed", range(4))
def test_matches_sequential_slab_projection(seed):
    rng = np.random.default_rng(100 + seed)
    n = 30
    d = 2
    y = rng.normal(0, 2.0, n)
    W = rng.uniform(0.1, 2.0, (n, d))
    b = 0.05 * W.sum(axis=0)

    s = W.T @ y
    D = W.T @ W
    lam = sequential_lambdas(s, D, b, target="slab")
    got = _apply(y, W, lam, np.ones(n, bool))

    want = y.copy()
    for j in range(d):
        want = P.project_slab(want, W[:, j], float(b[j]))
    assert np.allclose(got, want, atol=1e-10)


def test_plane_targets_reached_in_order():
    """After the sequential pass the LAST dimension's plane is hit exactly."""
    rng = np.random.default_rng(7)
    n, d = 25, 3
    y = rng.normal(0, 1, n)
    W = rng.uniform(0.1, 1.0, (n, d))
    b = np.full(d, 0.01)
    lam = sequential_lambdas(W.T @ y, W.T @ W, b, target="plane")
    x = _apply(y, W, lam, np.ones(n, bool))
    assert abs(np.dot(W[:, d - 1], x)) < 1e-9


def test_fixed_coordinates_via_free_gram():
    """With fixed coords, D is the free-coordinate Gram matrix but s spans
    all coordinates; the result matches the masked numpy projection."""
    rng = np.random.default_rng(8)
    n = 20
    y = rng.normal(0, 1, n)
    w = rng.uniform(0.5, 1.5, n)
    fixed = np.zeros(n, bool)
    fixed[:6] = True
    free = ~fixed
    s = np.array([np.dot(w, y)])
    D = np.array([[np.dot(w[free], w[free])]])
    lam = sequential_lambdas(s, D, np.array([0.0]), target="plane")
    got = y.copy()
    got[free] = y[free] - lam[0] * w[free]
    want = P.project_plane(y, w, 0.0, fixed)
    assert np.allclose(got, want, atol=1e-10)


def test_zero_gram_is_noop():
    lam = sequential_lambdas(np.array([3.0]), np.array([[0.0]]), np.array([1.0]))
    assert lam[0] == 0.0


def test_slab_noop_when_inside():
    rng = np.random.default_rng(9)
    n = 10
    y = rng.normal(0, 0.01, n)
    W = np.ones((n, 1))
    b = np.array([5.0])
    lam = sequential_lambdas(W.T @ y, W.T @ W, b, target="slab")
    assert lam[0] == pytest.approx(0.0, abs=1e-12)
