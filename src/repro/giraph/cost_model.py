"""Analytic worker-cost model for the BSP simulator (DESIGN.md §4).

Worker time for one superstep:

    t_w = c_msg · (local_w + remote_w) + c_remote · remote_w + c_vertex · n_w

- ``c_msg``: processing a received message (compute on message payload),
- ``c_remote``: *extra* cost of a remote message (network + deserialization)
  — this is what rewards edge locality,
- ``c_vertex``: per-vertex superstep overhead (rank bookkeeping, message
  serialization buffers ∝ resident vertices) — this is what the paper's
  ρ=0.62 vertex-count↔time correlation captures and what one-dimensional
  edge-partitioning gets wrong.

The superstep takes ``max_w t_w`` (global synchronization barrier);
communication is ``remote_w · bytes_per_unit``. Absolute constants are
scale-free; the Table-1 harness calibrates two global scalars (time and GB)
on the Hash row and reports every policy in the same units, so only the
*relative* structure of the model matters.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass(frozen=True)
class CostModel:
    c_msg: float = 1.0
    c_remote: float = 1.5
    c_vertex: float = 10.0
    bytes_per_unit: float = 8.0

    def worker_times(self, loads: pd.DataFrame) -> pd.DataFrame:
        """Per-worker time and communication for one superstep's loads."""
        t = (
            self.c_msg * (loads.local_units + loads.remote_units)
            + self.c_remote * loads.remote_units
            + self.c_vertex * loads.n_vertices
        )
        comm = loads.remote_units * self.bytes_per_unit
        return pd.DataFrame({"part": loads.part, "time": t, "comm_bytes": comm})

    def superstep_stats(self, loads: pd.DataFrame) -> dict:
        """Across-worker stats of one superstep (Table 1 row structure)."""
        wt = self.worker_times(loads)
        return {
            "time_mean": float(wt.time.mean()),
            "time_max": float(wt.time.max()),
            "time_std": float(wt.time.std(ddof=0)),
            "comm_mean": float(wt.comm_bytes.mean()),
            "comm_max": float(wt.comm_bytes.max()),
            "comm_std": float(wt.comm_bytes.std(ddof=0)),
        }

    def job_runtime(self, supersteps: list[pd.DataFrame]) -> float:
        """Total job time: sum over supersteps of the slowest worker (BSP)."""
        return float(sum(self.worker_times(ld).time.max() for ld in supersteps))

    def averaged_stats(self, supersteps: list[pd.DataFrame]) -> dict:
        """Per-superstep stats averaged over supersteps (Table 1: 'average
        values over 30 iterations')."""
        rows = [self.superstep_stats(ld) for ld in supersteps]
        return {k: float(np.mean([r[k] for r in rows])) for k in rows[0]}


def default_cost_model(avg_degree: float) -> CostModel:
    """Constants scaled to the graph's density.

    ``c_remote`` is small relative to ``c_msg``: the paper's own Table 1
    shows a 4× communication drop (Hash → vertex) moving mean runtime by
    only ~2%, so per-message network overhead is a second-order effect.
    ``c_vertex ≈ 0.8·avg_degree`` makes per-vertex superstep overhead worth
    ~25-30% of a worker's time, matching the moderate ρ=0.62 vertex-count ↔
    runtime correlation the paper reports."""
    return CostModel(c_msg=1.0, c_remote=0.35, c_vertex=0.8 * avg_degree)
