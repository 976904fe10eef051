"""Shared helpers for the per-table benchmarks: each bench runs its harness
once (rounds=1 — these are minutes-scale experiments, not microbenchmarks)
and persists the produced table under ``results/`` for EXPERIMENTS.md."""
from __future__ import annotations

from pathlib import Path

import pandas as pd

RESULTS = Path(__file__).resolve().parent.parent / "results"


def save_result(name: str, df: pd.DataFrame, notes: str = "") -> None:
    RESULTS.mkdir(exist_ok=True)
    with open(RESULTS / f"{name}.txt", "w") as f:
        if notes:
            f.write(notes + "\n\n")
        f.write(df.to_string(index=False) + "\n")
    df.to_csv(RESULTS / f"{name}.csv", index=False)


def run_once(benchmark, fn):
    """Run ``fn`` exactly once under pytest-benchmark timing."""
    return benchmark.pedantic(fn, rounds=1, iterations=1, warmup_rounds=0)
