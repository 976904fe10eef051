"""Benchmark reproducing Fig 9: adaptive step size and vertex fixing —
locality and max-imbalance traces over 100 iterations.

Result table: results/fig9.txt.
"""
from benchmarks.common import run_once, save_result
from repro.experiments.fig9_adaptive import PAPER_FIG9_NOTES, run_fig9


def test_fig9_adaptive(benchmark, spark):
    df = run_once(benchmark, lambda: run_fig9(n=1200, n_iter=100, seed=0))
    save_result("fig9", df, PAPER_FIG9_NOTES)
    final = df[df.iteration == 100].set_index("variant")
    # Fig 9: fixing keeps near-perfect balance under one-shot projection and
    # its final quality is at least comparable to the other variants.
    assert final.loc["adaptive+fixing", "max_imbalance"] <= 0.06
    assert final.loc["adaptive+fixing", "n_fixed"] > 0
    assert (
        final.loc["adaptive+fixing", "locality_pct"]
        >= final.loc["non-adaptive", "locality_pct"] - 6.0
    )
