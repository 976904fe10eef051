"""Hyper-parameters of Algorithm 1 (GD), defaults per paper §4.3."""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass
class GDParams:
    """Parameters of the projected-gradient-descent partitioner.

    - ``n_iter``: iteration budget ``I`` (paper uses 100 at FB scale; quality
      plateaus much earlier at our graph sizes).
    - ``eps``: balance tolerance; slab half-width is ``eps · Σ_i w_i^(j)``.
    - ``step_mult``: target step length is ``step_mult · √n / n_iter``
      (Fig 8: ``2·√n/100`` is a good choice at I=100).
    - ``noise_sigma_mult``: per-coordinate Gaussian σ at t=0 is
      ``noise_sigma_mult / n_iter`` so the expected noise norm matches
      ``√n/n_iter`` (noise is only added at t=0, §3.2).
    - ``projection``: one of ``one_shot`` (default, §3.1), ``alternating``,
      ``dykstra``, ``exact``.
    - ``projection_target``: ``plane`` projects balance constraints to
      ``⟨w,x⟩=0`` (paper §3.1); ``slab`` projects to the ε-face.
    - ``adaptive``: rescale γ_t so realized ‖x_{t+1}−x_t‖ tracks the target
      step length (§3.2).
    - ``fixing``: freeze near-integral coordinates (|x| ≥ ``fix_threshold``)
      after ``fix_start_frac`` of the iterations (§3.2).
    - ``final_project``: run alternating projections to convergence (slab
      target) before rounding, fixing the one-shot drift (§3.1, Fig 9).
    """

    n_iter: int = 60
    eps: float = 0.05
    step_mult: float = 2.0
    noise_sigma_mult: float = 1.0
    projection: str = "one_shot"
    projection_target: str = "plane"
    adaptive: bool = True
    fixing: bool = True
    fix_threshold: float = 0.999
    fix_start_frac: float = 0.7
    final_project: bool = True
    final_project_iters: int = 100
    seed: int = 0
    record_history: bool = False

    def __post_init__(self) -> None:
        if self.projection not in {"one_shot", "alternating", "dykstra", "exact"}:
            raise ValueError(f"unknown projection method {self.projection!r}")
        if self.projection_target not in {"plane", "slab"}:
            raise ValueError(f"unknown projection target {self.projection_target!r}")

    @property
    def fix_start(self) -> int:
        return int(self.fix_start_frac * self.n_iter)


@dataclass
class GDHistory:
    """Per-iteration diagnostics (Fig 9 traces)."""

    locality: list = field(default_factory=list)
    max_imbalance: list = field(default_factory=list)
    step_len: list = field(default_factory=list)
    n_fixed: list = field(default_factory=list)
