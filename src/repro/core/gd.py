"""Distributed GD (Algorithm 1) on Spark DataFrames.

The iterate ``x`` lives as a DataFrame ``[id, w_0.., x, x_prev, fixed]``.
One GD iteration costs:

1. one shuffle join + groupBy-sum computing the gradient
   ``(Az)_i = Σ_{j∈N(i)} z_j`` over the symmetrized edge list,
2. one multi-scalar aggregation producing every quantity the driver needs
   (``⟨w_j, x⟩``, ``⟨w_j, grad⟩_free``, the free Gram matrix ``D``,
   ``‖grad‖²_free`` and the previous step length), and
3. one narrow map applying the gradient step, the sequential balance
   projection ``x ← [x + γ·grad − Σ_j λ_j w_j]`` and vertex fixing.

Lineage is truncated every iteration with ``localCheckpoint(eager=True)``
(the idiomatic Spark pattern for iterative algorithms — without it the plan
grows exponentially). Only O(d²) scalars ever reach the driver per iteration,
matching the paper's distributed model (Theorem 1.1); the final rounding
collects the fractional vector, which is the same O(n) driver pass the paper
performs centrally for the projection's λ-search.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.params import GDParams
from repro.core.projection_spark import sequential_lambdas
from repro.graphs.ops import symmetrize


def _weight_cols(vertices: DataFrame) -> list[str]:
    cols = sorted(c for c in vertices.columns if c.startswith("w_"))
    if not cols:
        raise ValueError("vertex table has no weight columns w_0..w_{d-1}")
    return cols


def gd_relax_spark(
    edges: DataFrame,
    vertices: DataFrame,
    params: GDParams,
    x0: pd.DataFrame | None = None,
) -> DataFrame:
    """Run the GD relaxation; returns ``[id, w_*, x, fixed]`` (fractional).

    ``x0`` (pandas ``[id, x]``) overrides the zero start — used by tests to
    cross-check against the numpy reference without sampling noise twice.
    """
    spark = edges.sparkSession
    wcols = _weight_cols(vertices)
    d = len(wcols)

    sym = symmetrize(edges).cache()
    totals = vertices.agg(*[F.sum(c).alias(c) for c in wcols]).collect()[0]
    b = params.eps * np.array([float(totals[c]) for c in wcols])
    n = vertices.count()
    target_len = params.step_mult * np.sqrt(n) / params.n_iter

    state = vertices.select("id", *wcols)
    if x0 is not None:
        state = state.join(
            spark.createDataFrame(x0[["id", "x"]]), "id", "left"
        ).withColumn("x", F.coalesce(F.col("x"), F.lit(0.0)))
    else:
        # Noise at t=0 only (§3.2): x^(0)=0 plus Gaussian noise.
        sigma = params.noise_sigma_mult / params.n_iter
        state = state.withColumn("x", F.randn(params.seed) * F.lit(sigma))
    state = (
        state.withColumn("x_prev", F.col("x"))
        .withColumn("fixed", F.lit(False))
        .localCheckpoint(eager=True)
    )

    gamma: float | None = None
    free = ~F.col("fixed")
    for t in range(params.n_iter):
        grad = (
            sym.join(state.select(F.col("id").alias("src"), "x"), "src")
            .groupBy(F.col("dst").alias("id"))
            .agg(F.sum("x").alias("grad"))
        )
        cur = (
            state.join(grad, "id", "left")
            .withColumn("grad", F.coalesce(F.col("grad"), F.lit(0.0)))
            .cache()
        )
        aggs = []
        for j, cj in enumerate(wcols):
            aggs.append(F.sum(F.col(cj) * F.col("x")).alias(f"a_{j}"))
            aggs.append(
                F.sum(F.when(free, F.col(cj) * F.col("grad")).otherwise(0.0)).alias(f"g_{j}")
            )
            for l in range(j, d):
                aggs.append(
                    F.sum(F.when(free, F.col(cj) * F.col(wcols[l])).otherwise(0.0)).alias(
                        f"D_{j}_{l}"
                    )
                )
        aggs.append(F.sum(F.when(free, F.col("grad") ** 2).otherwise(0.0)).alias("gn2"))
        aggs.append(F.sum((F.col("x") - F.col("x_prev")) ** 2).alias("prog2"))
        row = cur.agg(*aggs).collect()[0]

        prev_step = float(np.sqrt(max(row["prog2"], 0.0)))
        if not params.adaptive or gamma is None:
            # Fixed step length: renormalize against the current gradient.
            gamma = target_len / max(float(np.sqrt(max(row["gn2"], 0.0))), 1e-12)
        elif prev_step > 1e-12:
            gamma *= float(np.clip(target_len / prev_step, 0.5, 2.0))

        a = np.array([float(row[f"a_{j}"]) for j in range(d)])
        g = np.array([float(row[f"g_{j}"]) for j in range(d)])
        D = np.zeros((d, d))
        for j in range(d):
            for l in range(j, d):
                D[j, l] = D[l, j] = float(row[f"D_{j}_{l}"])
        s = a + gamma * g
        lam = sequential_lambdas(s, D, b, params.projection_target)

        shift = F.lit(gamma) * F.col("grad")
        for j, cj in enumerate(wcols):
            shift = shift - F.lit(float(lam[j])) * F.col(cj)
        x_new = F.when(
            free, F.greatest(F.lit(-1.0), F.least(F.lit(1.0), F.col("x") + shift))
        ).otherwise(F.col("x"))

        upd = cur.withColumn("x_next", x_new)
        if params.fixing and t >= params.fix_start:
            newly = free & (F.abs(F.col("x_next")) >= params.fix_threshold)
            upd = upd.withColumn(
                "x_next",
                F.when(newly, F.signum(F.col("x_next"))).otherwise(F.col("x_next")),
            ).withColumn("fixed", F.col("fixed") | newly)
        new_state = upd.select(
            "id",
            *wcols,
            F.col("x_next").alias("x"),
            F.col("x").alias("x_prev"),
            "fixed",
        ).localCheckpoint(eager=True)
        cur.unpersist()
        state = new_state

    if params.final_project:
        state = _final_alternating(state, wcols, b, params)
    sym.unpersist()
    return state.select("id", *wcols, "x", "fixed")


def _final_alternating(state: DataFrame, wcols: list[str], b: np.ndarray, params: GDParams) -> DataFrame:
    """Alternating projections (slab target) to convergence before rounding —
    repairs the imbalance accumulated by one-shot projections (§3.1, Fig 9)."""
    d = len(wcols)
    free = ~F.col("fixed")
    tol = 1e-7
    for _ in range(params.final_project_iters):
        aggs = []
        for j, cj in enumerate(wcols):
            aggs.append(F.sum(F.col(cj) * F.col("x")).alias(f"a_{j}"))
            for l in range(j, d):
                aggs.append(
                    F.sum(F.when(free, F.col(cj) * F.col(wcols[l])).otherwise(0.0)).alias(
                        f"D_{j}_{l}"
                    )
                )
        row = state.agg(*aggs).collect()[0]
        s = np.array([float(row[f"a_{j}"]) for j in range(d)])
        if (np.abs(s) <= b + 1e-9 * (1 + np.abs(b))).all():
            break
        D = np.zeros((d, d))
        for j in range(d):
            for l in range(j, d):
                D[j, l] = D[l, j] = float(row[f"D_{j}_{l}"])
        lam = sequential_lambdas(s, D, b, "slab")
        if float(np.abs(lam).max(initial=0.0)) < tol:
            break
        shift = F.lit(0.0)
        for j, cj in enumerate(wcols):
            shift = shift - F.lit(float(lam[j])) * F.col(cj)
        x_new = F.when(
            free, F.greatest(F.lit(-1.0), F.least(F.lit(1.0), F.col("x") + shift))
        ).otherwise(F.col("x"))
        state = state.withColumn("x", x_new).localCheckpoint(eager=True)
    return state


def gd_bipartition_spark(
    edges: DataFrame,
    vertices: DataFrame,
    params: GDParams,
    x0: pd.DataFrame | None = None,
) -> DataFrame:
    """Full distributed GD 2-partitioner; returns assignment ``[id, part]``.

    Rounding + repair run on the driver over the collected fractional vector
    (an O(n log n) pass, same as the paper's centralized λ-search; see
    DESIGN.md §3).
    """
    from repro.core.rounding import repair_balance, round_randomized

    spark = edges.sparkSession
    wcols = _weight_cols(vertices)
    frac = gd_relax_spark(edges, vertices, params, x0)
    pdf = frac.select("id", *wcols, "x").toPandas().sort_values("id")
    x = pdf["x"].to_numpy()
    W = pdf[wcols].to_numpy(dtype=float)
    rng = np.random.default_rng(params.seed + 1)
    signs = round_randomized(x, rng)
    signs = repair_balance(signs, x, W, params.eps)
    out = pd.DataFrame({"id": pdf["id"].to_numpy(), "part": ((signs + 1) // 2).astype("int64")})
    return spark.createDataFrame(out)
