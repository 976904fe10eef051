"""Hash partitioning — Giraph's default baseline (§4).

Stateless: ``part = hash(vertex id) mod k``. Balanced in expectation on every
weight dimension, but keeps only ~1/k of the edges local.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def hash_partition(vertices: DataFrame, k: int, seed: int = 0) -> DataFrame:
    """Assignment ``[id, part]`` by hashing vertex ids (salted by ``seed``)."""
    return vertices.select(
        "id",
        F.pmod(F.xxhash64(F.col("id"), F.lit(seed)), F.lit(k)).alias("part"),
    )
