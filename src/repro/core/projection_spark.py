"""Distributed projection support for the Spark GD loop.

The one-shot alternating projection (§3.1) needs only *scalars* from the
distributed vector: the inner products ``s_j = ⟨w_j, y⟩`` and the free-
coordinate Gram matrix ``D_jk = Σ_free w_j w_k``. Sequentially projecting on
the d hyperplanes updates these scalars analytically, so the whole projection
costs one aggregation + one map over the vector — this is how the
``O(|E|/m + ...)`` distributed step of Theorem 1.1 is realized.

``sequential_lambdas`` reproduces *exactly* the numpy
``one_shot_alternating`` (sequential plane/slab projections) so the Spark and
local GD trajectories coincide.
"""
from __future__ import annotations

import numpy as np


def sequential_lambdas(
    s: np.ndarray,
    D: np.ndarray,
    b: np.ndarray,
    target: str = "plane",
) -> np.ndarray:
    """Multipliers λ_j of the sequential balance projections.

    After the sequential pass the vector update is
    ``y_free ← y_free − Σ_j λ_j w_j`` (then box clip). ``s`` holds ⟨w_j, y⟩
    over *all* coordinates, ``D`` the free-coordinate Gram matrix, ``b`` the
    slab half-widths. ``target='plane'`` drives each ⟨w_j,·⟩ to 0 (§3.1);
    ``'slab'`` only to the nearest ε-face.
    """
    d = s.size
    lam = np.zeros(d)
    for j in range(d):
        s_cur = float(s[j]) - float(np.dot(lam[:j], D[:j, j]))
        c = 0.0 if target == "plane" else float(np.clip(s_cur, -b[j], b[j]))
        lam[j] = (s_cur - c) / D[j, j] if D[j, j] > 0 else 0.0
    return lam
