"""Social Hash Partitioner (SHP) re-implementation (paper §4 baseline).

SHP is a distributed local-search partitioner in the Kernighan–Lin family
(Kabiljo et al., VLDB'17): vertices compute the gain of moving to the
partition holding most of their neighbours, and moves are exchanged between
partition pairs so the load stays balanced. SHP balances a single **combined**
dimension; per the paper's §4 configuration we combine edges (high
coefficient) and vertices (low coefficient):

    w_comb(v) = deg(v) + vertex_coeff · avg_deg.

Balance on the combined dimension does NOT imply balance on each component —
the Fig 4 observation this reproduction must preserve.

Move mechanics per round: for every ordered partition pair (a, b), vertices
in ``a`` whose best target is ``b`` are ranked by gain; both directions admit
movers up to the *minimum* combined weight the two directions can exchange,
keeping w_comb balance approximately invariant.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.graphs.ops import degrees, symmetrize


def shp_partition(
    edges: DataFrame,
    k: int,
    n_rounds: int = 10,
    vertex_coeff: float = 0.5,
    seed: int = 0,
) -> DataFrame:
    """Run SHP; returns assignment ``[id, part]``."""
    sym = symmetrize(edges).cache()
    deg = degrees(edges).cache()
    avg_deg = deg.agg(F.avg("degree")).collect()[0][0]

    lbl = deg.select(
        "id",
        "degree",
        (F.col("degree") + F.lit(vertex_coeff * avg_deg)).alias("w_comb"),
        F.pmod(F.xxhash64("id", F.lit(seed)), F.lit(k)).alias("part"),
    ).localCheckpoint(eager=True)

    for r in range(n_rounds):
        nbr = (
            sym.join(lbl.select(F.col("id").alias("src"), F.col("part").alias("np")), "src")
            .groupBy(F.col("dst").alias("id"), F.col("np").alias("cand"))
            .agg(F.count(F.lit(1)).alias("cnt"))
        )
        cur_cnt = nbr.join(
            lbl.select("id", F.col("part").alias("cand")), ["id", "cand"]
        ).select("id", F.col("cnt").alias("cur_cnt"))
        w_best = Window.partitionBy("id").orderBy(F.desc("cnt"), F.asc("cand"))
        movers = (
            nbr.join(lbl, "id")
            .filter(F.col("cand") != F.col("part"))
            .withColumn("rn", F.row_number().over(w_best))
            .filter(F.col("rn") == 1)
            .join(cur_cnt, "id", "left")
            .withColumn("gain", F.col("cnt") - F.coalesce(F.col("cur_cnt"), F.lit(0)))
            .filter(F.col("gain") > 0)
            .select("id", "w_comb", F.col("part").alias("from_p"), F.col("cand").alias("to_p"), "gain")
            .cache()
        )
        # Exchangeable weight per unordered pair = min of the two directions.
        pair_tot = (
            movers.groupBy("from_p", "to_p").agg(F.sum("w_comb").alias("tot"))
        )
        rev = pair_tot.select(
            F.col("from_p").alias("to_p"),
            F.col("to_p").alias("from_p"),
            F.col("tot").alias("rev_tot"),
        )
        allowed = (
            pair_tot.join(rev, ["from_p", "to_p"], "left")
            .withColumn("allowed", F.least(F.col("tot"), F.coalesce(F.col("rev_tot"), F.lit(0.0))))
            .select("from_p", "to_p", "allowed")
        )
        w_pair = Window.partitionBy("from_p", "to_p").orderBy(F.desc("gain"), F.asc("id"))
        moved = (
            movers.join(allowed, ["from_p", "to_p"])
            .withColumn(
                "cum_w",
                F.sum("w_comb").over(w_pair.rowsBetween(Window.unboundedPreceding, 0)),
            )
            .filter(F.col("cum_w") <= F.col("allowed"))
            .select("id", F.col("to_p").alias("new_part"))
        )
        lbl = (
            lbl.join(moved, "id", "left")
            .withColumn("part", F.coalesce(F.col("new_part"), F.col("part")))
            .select("id", "degree", "w_comb", "part")
            .localCheckpoint(eager=True)
        )
        movers.unpersist()

    sym.unpersist()
    deg.unpersist()
    return lbl.select("id", "part")
