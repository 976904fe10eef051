"""Spinner re-implementation (Martella et al., ICDE 2017; paper §4 baseline).

Label-propagation partitioner: each vertex repeatedly adopts the label that
is most frequent among its neighbours, discounted by a load penalty; vertices
migrate probabilistically so that overloaded labels receive fewer migrants.
Spinner balances a *single* dimension — the degree (edge) load — via score

    score(v, l) = cnt(v, l) / deg(v) + c · (1 − load(l) / C)

with capacity ``C = balance_slack · total_load / k``, and migration
probability ``min(1, remaining_capacity(l) / demand(l))``.

As observed in the paper (Fig 4), this penalty structure cannot hold balance
on *multiple* dimensions for skewed graphs: we expose ``vertex_penalty`` to
reproduce their attempted multi-dimensional modification (a weighted second
penalty on vertex-count load), which still fails on skewed instances.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.graphs.ops import degrees, symmetrize


def spinner_partition(
    edges: DataFrame,
    k: int,
    n_rounds: int = 10,
    penalty: float = 1.0,
    balance_slack: float = 1.05,
    vertex_penalty: float = 0.0,
    seed: int = 0,
) -> DataFrame:
    """Run Spinner; returns assignment ``[id, part]``."""
    spark = edges.sparkSession
    sym = symmetrize(edges).cache()
    deg = degrees(edges).cache()
    total_deg = deg.agg(F.sum("degree")).collect()[0][0]
    n = deg.count()
    cap_deg = balance_slack * total_deg / k
    cap_cnt = balance_slack * n / k

    lbl = deg.select(
        "id",
        "degree",
        F.pmod(F.xxhash64("id", F.lit(seed)), F.lit(k)).alias("label"),
    ).localCheckpoint(eager=True)

    for r in range(n_rounds):
        loads = (
            lbl.groupBy("label")
            .agg(F.sum("degree").alias("dload"), F.count(F.lit(1)).alias("vload"))
            .toPandas()
            .set_index("label")
        )
        dload = {int(l): float(loads.dload.get(l, 0.0)) for l in range(k)}
        vload = {int(l): float(loads.vload.get(l, 0.0)) for l in range(k)}
        load_df = spark.createDataFrame(
            pd.DataFrame(
                {
                    "cand": range(k),
                    "dload": [dload[l] for l in range(k)],
                    "vload": [vload[l] for l in range(k)],
                }
            )
        )

        nbr = (
            sym.join(lbl.select(F.col("id").alias("src"), F.col("label").alias("nl")), "src")
            .groupBy(F.col("dst").alias("id"), F.col("nl").alias("cand"))
            .agg(F.count(F.lit(1)).alias("cnt"))
        )
        scored = (
            nbr.join(lbl, "id")
            .join(load_df, "cand")
            .withColumn(
                "score",
                F.col("cnt") / F.col("degree")
                + F.lit(penalty) * (1.0 - F.col("dload") / F.lit(cap_deg))
                + F.lit(vertex_penalty) * (1.0 - F.col("vload") / F.lit(cap_cnt)),
            )
        )
        w = Window.partitionBy("id").orderBy(F.desc("score"), F.asc("cand"))
        best = (
            scored.withColumn("rn", F.row_number().over(w))
            .filter(F.col("rn") == 1)
            .select("id", F.col("cand").alias("best"), F.col("score").alias("best_score"))
        )
        cur_score = scored.filter(F.col("cand") == F.col("label")).select(
            "id", F.col("score").alias("cur_score")
        )
        cand = (
            lbl.join(best, "id")
            .join(cur_score, "id", "left")
            .withColumn("cur_score", F.coalesce(F.col("cur_score"), F.lit(-1e18)))
            .withColumn(
                "wants_move",
                (F.col("best") != F.col("label"))
                & (F.col("best_score") > F.col("cur_score") + 1e-12),
            )
            .cache()
        )
        demand = (
            cand.filter("wants_move")
            .groupBy("best")
            .agg(F.sum("degree").alias("demand"))
            .toPandas()
            .set_index("best")
        )
        # Migration probability: admit at most the remaining capacity.
        probs = {}
        for l in range(k):
            dem = float(demand.demand.get(l, 0.0))
            remaining = max(cap_deg - dload[l], 0.0)
            probs[l] = 1.0 if dem <= 0 else min(1.0, remaining / dem)
        prob_df = spark.createDataFrame(
            pd.DataFrame({"best": range(k), "mig_p": [probs[l] for l in range(k)]})
        )
        lbl = (
            cand.join(prob_df, "best")
            .withColumn(
                "label",
                F.when(
                    F.col("wants_move") & (F.rand(seed + 1000 + r) < F.col("mig_p")),
                    F.col("best"),
                ).otherwise(F.col("label")),
            )
            .select("id", "degree", "label")
            .localCheckpoint(eager=True)
        )
        cand.unpersist()

    sym.unpersist()
    deg.unpersist()
    return lbl.select("id", F.col("label").alias("part"))
