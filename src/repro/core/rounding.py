"""Randomized rounding of the fractional GD solution (§2.1) + balance repair.

Rounding is per-vertex: ``Pr[i ∈ V₁] = (x_i + 1)/2``, which preserves the
expected objective and, for large n, the balance constraints w.h.p. At the
small graph sizes of this reproduction the binomial deviation can exceed
``ε·Σw``, so ``repair_balance`` greedily flips the *least integral* vertices
(smallest |x| — the vertices the relaxation was least certain about) from the
overloaded side until every dimension is within the slab. This is a driver-
side O(n log n) post-pass (DESIGN.md §3).
"""
from __future__ import annotations

import numpy as np


def round_randomized(x: np.ndarray, rng: np.random.Generator) -> np.ndarray:
    """Round fractional x ∈ [-1,1]^n to signs in {-1,+1}^n."""
    return np.where(rng.random(x.size) < (x + 1.0) * 0.5, 1.0, -1.0)


def round_deterministic(x: np.ndarray) -> np.ndarray:
    """Threshold rounding (sign of x; ties to +1)."""
    return np.where(x >= 0.0, 1.0, -1.0)


def repair_balance(
    signs: np.ndarray,
    x: np.ndarray,
    W: np.ndarray,
    eps: float,
    max_flips: int | None = None,
) -> np.ndarray:
    """Greedily flip low-|x| vertices until ``|⟨w_j, signs⟩| ≤ ε·Σw_j`` ∀j.

    Each flip moves a vertex from the currently worst-violating dimension's
    heavy side; vertices are consumed in increasing |x| order. Terminates
    after at most ``max_flips`` (default 2n) flips even if some dimension
    remains violated (returns best effort).
    """
    signs = signs.copy()
    n, d = W.shape
    b = eps * W.sum(axis=0)
    s = W.T @ signs
    order = np.argsort(np.abs(x), kind="stable")
    max_flips = 2 * n if max_flips is None else max_flips
    used = np.zeros(n, dtype=bool)
    flips = 0
    while flips < max_flips:
        viol = np.abs(s) - b
        j = int(np.argmax(viol / np.maximum(b, 1e-12)))
        if viol[j] <= 1e-9:
            break
        heavy = np.sign(s[j])
        flipped = False
        for i in order:
            if used[i] or signs[i] != heavy or W[i, j] <= 0:
                continue
            signs[i] = -heavy
            s -= 2.0 * heavy * W[i]
            used[i] = True
            flips += 1
            flipped = True
            break
        if not flipped:
            break  # no candidate left on the heavy side
    return signs
