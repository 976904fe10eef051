"""Vertex-centric BSP workload simulator (Giraph substrate, DESIGN.md §4).

The paper evaluates partitioning policies by running Giraph applications on a
production cluster. What determines the measured numbers (Fig 1, Fig 7,
Table 1) is (a) the per-worker distribution of received messages split into
local vs remote, and (b) the per-worker vertex count — the paper's own
analysis reduces worker time to exactly these quantities ("performance is
determined by the slowest worker", ρ=0.79 for edges↔time, ρ=0.62 for
vertices↔time).

This engine computes those quantities **exactly** with Spark aggregations
over the partitioned graph: a vertex sends messages along its edges, so a
message over symmetric edge (u → v) is *received by worker part(v)* and is
*local* iff part(u) = part(v). An analytic cost model (``cost_model``) then
converts loads into worker times and communication volume.

Per-superstep loads are pandas frames ``[part, n_vertices, local_units,
remote_units]`` where *units* weigh each message by the app-specific payload
(1 for PageRank ranks, deg(src) for Mutual Friends neighbour lists, ...).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graphs.ops import degrees, symmetrize

LOAD_COLS = ["part", "n_vertices", "local_units", "remote_units"]


def _vertex_counts(assignment: DataFrame) -> pd.DataFrame:
    return (
        assignment.groupBy("part")
        .agg(F.count(F.lit(1)).alias("n_vertices"))
        .toPandas()
    )


def _with_parts(edges: DataFrame, assignment: DataFrame) -> DataFrame:
    """Symmetric edges annotated with sender/receiver parts and sender degree."""
    a_src = assignment.select(F.col("id").alias("src"), F.col("part").alias("p_src"))
    a_dst = assignment.select(F.col("id").alias("dst"), F.col("part").alias("p_dst"))
    deg = degrees(edges).select(F.col("id").alias("src"), F.col("degree").alias("deg_src"))
    return symmetrize(edges).join(a_src, "src").join(a_dst, "dst").join(deg, "src")


def static_loads(
    edges: DataFrame, assignment: DataFrame, units: str = "one"
) -> pd.DataFrame:
    """Per-worker loads of one superstep in which every vertex messages all
    neighbours. ``units``: ``'one'`` (fixed payload, PageRank-style) or
    ``'deg_src'`` (payload ∝ sender degree, Mutual-Friends-style).
    """
    if units not in {"one", "deg_src"}:
        raise ValueError(f"unknown unit model {units!r}")
    u = F.lit(1.0) if units == "one" else F.col("deg_src").cast("double")
    loads = (
        _with_parts(edges, assignment)
        .groupBy(F.col("p_dst").alias("part"))
        .agg(
            F.sum(F.when(F.col("p_src") == F.col("p_dst"), u).otherwise(0.0)).alias(
                "local_units"
            ),
            F.sum(F.when(F.col("p_src") != F.col("p_dst"), u).otherwise(0.0)).alias(
                "remote_units"
            ),
        )
        .toPandas()
    )
    out = _vertex_counts(assignment).merge(loads, on="part", how="left").fillna(0.0)
    return out[LOAD_COLS].sort_values("part", ignore_index=True)


def propagation_loads(
    edges: DataFrame,
    assignment: DataFrame,
    max_rounds: int = 50,
    return_labels: bool = False,
):
    """Per-superstep loads of min-label Connected Components.

    Superstep 0: every vertex sends its own label. Later supersteps: only
    vertices whose label changed send (Giraph's message-on-update pattern),
    so message volume decays as labels converge. Returns one loads frame per
    superstep, stopping when no vertex is active.
    """
    sym = symmetrize(edges).cache()
    a_src = assignment.select(F.col("id").alias("src"), F.col("part").alias("p_src"))
    a_dst = assignment.select(F.col("id").alias("dst"), F.col("part").alias("p_dst"))
    annotated = sym.join(a_src, "src").join(a_dst, "dst").cache()
    vcounts = _vertex_counts(assignment)

    labels = assignment.select("id", F.col("id").alias("label")).localCheckpoint(eager=True)
    active = labels.select("id")  # everyone sends in superstep 0
    out: list[pd.DataFrame] = []
    for t in range(max_rounds):
        sent = annotated.join(active.withColumnRenamed("id", "src"), "src").cache()
        loads = (
            sent.groupBy(F.col("p_dst").alias("part"))
            .agg(
                F.sum((F.col("p_src") == F.col("p_dst")).cast("double")).alias("local_units"),
                F.sum((F.col("p_src") != F.col("p_dst")).cast("double")).alias("remote_units"),
            )
            .toPandas()
        )
        if t > 0 and (loads.local_units.sum() + loads.remote_units.sum()) == 0:
            sent.unpersist()
            break  # no vertex changed last round — converged
        out.append(
            vcounts.merge(loads, on="part", how="left")
            .fillna(0.0)[LOAD_COLS]
            .sort_values("part", ignore_index=True)
        )
        # Deliver: v's new label = min(own, min over received sender labels).
        recv = (
            sent.join(labels.select(F.col("id").alias("src"), F.col("label").alias("l_src")), "src")
            .groupBy(F.col("dst").alias("id"))
            .agg(F.min("l_src").alias("l_min"))
        )
        new_labels = (
            labels.join(recv, "id", "left")
            .withColumn("new_label", F.least(F.col("label"), F.coalesce(F.col("l_min"), F.col("label"))))
        )
        active = new_labels.filter(F.col("new_label") < F.col("label")).select("id")
        labels = new_labels.select("id", F.col("new_label").alias("label")).localCheckpoint(
            eager=True
        )
        sent.unpersist()
    annotated.unpersist()
    sym.unpersist()
    if return_labels:
        return out, labels
    return out
