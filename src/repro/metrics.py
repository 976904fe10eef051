"""Partition-quality metrics (paper §4.1).

- **Edge locality**: fraction of edges with both endpoints in the same part
  — "the percentage of uncut edges", Figures 5-6.
- **Imbalance** per weight dimension: ``max_i w(V_i) / avg_i w(V_i) - 1``,
  Figure 4. ``avg`` is over all k parts (including possibly-empty ones).

An *assignment* is a DataFrame ``[id, part]`` covering every vertex.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def edge_locality(edges: DataFrame, assignment: DataFrame) -> float:
    """Fraction of canonical edges whose endpoints share a part."""
    a_src = assignment.select(F.col("id").alias("src"), F.col("part").alias("p_src"))
    a_dst = assignment.select(F.col("id").alias("dst"), F.col("part").alias("p_dst"))
    row = (
        edges.join(a_src, "src")
        .join(a_dst, "dst")
        .agg(
            F.avg((F.col("p_src") == F.col("p_dst")).cast("double")).alias("loc"),
            F.count(F.lit(1)).alias("m"),
        )
        .collect()[0]
    )
    if row["m"] != edges.count():
        raise ValueError("assignment does not cover all edge endpoints")
    return float(row["loc"])


def part_loads(vertices: DataFrame, assignment: DataFrame, dims: int) -> pd.DataFrame:
    """Total weight per part per dimension: ``[part, w_0, .., w_{d-1}]``."""
    cols = [F.sum(F.col(f"w_{j}")).alias(f"w_{j}") for j in range(dims)]
    return (
        vertices.join(assignment, "id")
        .groupBy("part")
        .agg(*cols)
        .orderBy("part")
        .toPandas()
    )


def imbalance(vertices: DataFrame, assignment: DataFrame, dims: int, k: int) -> list[float]:
    """Per-dimension ``max/avg - 1`` over the k parts (empty parts count)."""
    loads = part_loads(vertices, assignment, dims)
    out = []
    for j in range(dims):
        col = loads[f"w_{j}"].to_numpy()
        total = float(col.sum())
        avg = total / k
        mx = float(col.max()) if len(col) else 0.0
        out.append(mx / avg - 1.0 if avg > 0 else 0.0)
    return out


def max_imbalance(vertices: DataFrame, assignment: DataFrame, dims: int, k: int) -> float:
    """Worst imbalance over all dimensions (Fig 9's right panel)."""
    return max(imbalance(vertices, assignment, dims, k))


def epsilon_balance(vertices: DataFrame, assignment: DataFrame, dims: int, k: int) -> float:
    """Smallest ε such that the assignment is ε-balanced (Definition 2.1):
    ``max_{i,j} |w_j(V_i) - w_j(V)/k| / (w_j(V)/k)`` — unlike ``imbalance``
    this also penalises *under*-loaded parts."""
    loads = part_loads(vertices, assignment, dims)
    worst = 0.0
    for j in range(dims):
        col = loads[f"w_{j}"].to_numpy()
        target = float(col.sum()) / k
        if target == 0:
            continue
        dev = max(abs(float(col.max()) - target), abs(target - float(col.min() if len(col) == k else 0.0)))
        worst = max(worst, dev / target)
    return worst
