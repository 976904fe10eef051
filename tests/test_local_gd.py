"""Tests for the numpy reference implementation of Algorithm 1."""
import numpy as np
import pandas as pd
import pytest

from repro.core.local_gd import fractional_locality, gd_bipartition_local, gd_relax_local
from repro.core.params import GDParams
from repro.graphs import generators as gen


def _weights(edges: pd.DataFrame, n: int, dims=("unit", "degree")) -> np.ndarray:
    deg = np.bincount(
        np.concatenate([edges.src.to_numpy(), edges.dst.to_numpy()]), minlength=n
    ).astype(float)
    cols = {"unit": np.ones(n), "degree": deg, "sqrt_degree": np.sqrt(deg), "degree_sq": deg**2}
    return np.column_stack([cols[d] for d in dims])


@pytest.fixture(scope="module")
def community_graph():
    """Two planted communities (levels=1), strong structure."""
    spec = gen.GraphSpec(n=400, avg_degree=12, levels=1, mu_cross=0.08, seed=42)
    edges = gen.generate_edges(spec)
    return edges, _weights(edges, spec.n)


def test_fractional_locality_bounds(community_graph):
    edges, _ = community_graph
    n = 400
    assert fractional_locality(edges, np.ones(n)) == 1.0
    assert fractional_locality(edges, np.zeros(n)) == 0.5


def test_gd_relax_stays_in_box(community_graph):
    edges, W = community_graph
    x, _ = gd_relax_local(edges, W, GDParams(n_iter=15, seed=0))
    assert np.abs(x).max() <= 1 + 1e-9


def test_gd_relax_respects_balance_after_final_projection(community_graph):
    edges, W = community_graph
    p = GDParams(n_iter=20, eps=0.05, seed=0)
    x, _ = gd_relax_local(edges, W, p)
    b = p.eps * W.sum(axis=0)
    assert (np.abs(W.T @ x) <= b * 1.001 + 1e-6).all()


def test_gd_improves_over_random(community_graph):
    edges, W = community_graph
    x, _ = gd_relax_local(edges, W, GDParams(n_iter=25, seed=0))
    assert fractional_locality(edges, x) > 0.65  # random split gives 0.5


def test_gd_finds_planted_communities(community_graph):
    edges, W = community_graph
    parts, _ = gd_bipartition_local(edges, W, GDParams(n_iter=60, seed=0))
    s = edges.src.to_numpy()
    d = edges.dst.to_numpy()
    loc = float(np.mean(parts[s] == parts[d]))
    assert loc > 0.8  # planted structure has ~92% internal edges


def test_gd_bipartition_balanced(community_graph):
    edges, W = community_graph
    p = GDParams(n_iter=25, eps=0.05, seed=0)
    parts, _ = gd_bipartition_local(edges, W, p)
    signs = 2.0 * parts - 1.0
    b = p.eps * W.sum(axis=0)
    assert (np.abs(W.T @ signs) <= b + 1e-9).all()
    assert set(np.unique(parts)) == {0, 1}


def test_gd_deterministic_in_seed(community_graph):
    edges, W = community_graph
    p = GDParams(n_iter=10, seed=7)
    a, _ = gd_relax_local(edges, W, p)
    b_, _ = gd_relax_local(edges, W, p)
    assert np.array_equal(a, b_)


def test_gd_history_recorded(community_graph):
    edges, W = community_graph
    p = GDParams(n_iter=12, seed=0, record_history=True)
    _, hist = gd_relax_local(edges, W, p)
    assert len(hist.locality) == 12
    assert len(hist.step_len) == 12
    assert hist.locality[-1] > hist.locality[0] - 0.05  # non-degrading trend


def test_noise_escapes_saddle(community_graph):
    """Without noise, x=0 is a stationary point of the projected dynamics
    (plane projection of A·0 is 0); with noise GD makes progress."""
    edges, W = community_graph
    p_no = GDParams(n_iter=10, noise_sigma_mult=0.0, seed=0, final_project=False)
    x_no, _ = gd_relax_local(edges, W, p_no)
    assert np.abs(x_no).max() < 1e-9
    p_yes = GDParams(n_iter=10, noise_sigma_mult=1.0, seed=0, final_project=False)
    x_yes, _ = gd_relax_local(edges, W, p_yes)
    assert np.abs(x_yes).max() > 0.1


def test_fixing_produces_integral_coords(community_graph):
    edges, W = community_graph
    p = GDParams(n_iter=30, fixing=True, seed=0)
    x, _ = gd_relax_local(edges, W, p)
    frac_integral = np.mean(np.abs(np.abs(x) - 1.0) < 1e-6)
    assert frac_integral > 0.3


def test_fixing_improves_or_matches_quality(community_graph):
    """§3.2/Fig 9: vertex fixing should not hurt the *rounded* partition."""
    edges, W = community_graph
    s, d = edges.src.to_numpy(), edges.dst.to_numpy()

    def rounded_loc(fixing: bool) -> float:
        p = GDParams(n_iter=60, fixing=fixing, seed=0)
        parts, _ = gd_bipartition_local(edges, W, p)
        return float(np.mean(parts[s] == parts[d]))

    assert rounded_loc(True) >= rounded_loc(False) - 0.06


@pytest.mark.parametrize("method", ["one_shot", "alternating", "dykstra", "exact"])
def test_all_projection_methods_run(method, community_graph):
    edges, W = community_graph
    p = GDParams(n_iter=6, projection=method, seed=0)
    x, _ = gd_relax_local(edges, W, p)
    assert np.isfinite(x).all()
    assert np.abs(x).max() <= 1 + 1e-9


def test_exact_projection_quality_close_to_one_shot(community_graph):
    """Fig 10: one-shot alternating ≈ exact projection in final quality."""
    edges, W = community_graph
    q = {}
    for method in ("one_shot", "exact"):
        p = GDParams(n_iter=15, projection=method, seed=0)
        x, _ = gd_relax_local(edges, W, p)
        q[method] = fractional_locality(edges, x)
    assert abs(q["one_shot"] - q["exact"]) < 0.15


def test_d1_only_balance():
    spec = gen.GraphSpec(n=300, avg_degree=10, levels=1, mu_cross=0.1, seed=5)
    edges = gen.generate_edges(spec)
    W = _weights(edges, spec.n, dims=("unit",))
    p = GDParams(n_iter=20, eps=0.03, seed=1)
    parts, _ = gd_bipartition_local(edges, W, p)
    assert abs((2.0 * parts - 1.0).sum()) <= 0.03 * spec.n + 1e-9


def test_d4_dimensions_run():
    """§4.1: artificial 4-dim balance (1, deg, √deg, deg²)."""
    spec = gen.GraphSpec(n=300, avg_degree=10, levels=1, mu_cross=0.1, seed=6)
    edges = gen.generate_edges(spec)
    W = _weights(edges, spec.n, dims=("unit", "degree", "sqrt_degree", "degree_sq"))
    p = GDParams(n_iter=20, eps=0.05, seed=2)
    parts, _ = gd_bipartition_local(edges, W, p)
    signs = 2.0 * parts - 1.0
    b = p.eps * W.sum(axis=0)
    assert (np.abs(W.T @ signs) <= b + 1e-9).all()


def test_invalid_projection_param():
    with pytest.raises(ValueError):
        GDParams(projection="magic")


def test_invalid_target_param():
    with pytest.raises(ValueError):
        GDParams(projection_target="cube")
