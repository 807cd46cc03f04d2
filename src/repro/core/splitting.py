"""Adaptive collection splitting (paper §5).

The optimizer watches two runtime signals per executed view:

- scratch runs: ``(|GV_i|, scratch_time)``;
- differential runs: ``(|δC_i|, diff_time)``;

fits a simple linear model to each, and — per batch of ℓ views (paper
default 10; ours defaults to 4 at reproduction scale, DESIGN.md §6) —
predicts the total cost of running the batch differentially vs from
scratch and picks the cheaper. Running a view from scratch *splits* the
collection. "It consists of running small amounts of arithmetic during
runtime and no data processing" (paper §7.3): everything here is a few
NumPy ops at the driver.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class LinearModel:
    """y ≈ a + b·x least-squares fit; ratio-through-origin with <2 points."""

    xs: list[float] = field(default_factory=list)
    ys: list[float] = field(default_factory=list)

    def observe(self, x: float, y: float) -> None:
        self.xs.append(float(x))
        self.ys.append(float(y))

    @property
    def n(self) -> int:
        return len(self.xs)

    def predict(self, x: float) -> float:
        """With one observation the best estimate is that observation (a
        per-unit ratio would smear the fixed per-view overhead over the
        observed size and explode on extrapolation); from two observations
        the affine fit identifies the intercept (fixed overhead) and the
        per-unit slope separately."""
        if self.n == 0:
            return 0.0
        xs = np.asarray(self.xs)
        ys = np.asarray(self.ys)
        if self.n == 1 or np.allclose(xs, xs[0]):
            return float(ys.mean())
        b, a = np.polyfit(xs, ys, 1)
        # Clamp extrapolation to 1.5× the sampled range: a slope fitted on
        # small overhead-dominated views says nothing reliable about views
        # orders of magnitude larger. A wrong (too low) clamped estimate is
        # self-correcting — the chosen strategy gets observed on the large
        # view, extending the sampled range for the next batch decision.
        x_eff = min(float(x), 1.5 * float(xs.max()))
        return float(max(0.0, a + b * x_eff))


@dataclass
class AdaptiveSplitter:
    """Paper §5's adaptive optimizer: bootstrap with scratch/diff
    observations, then decide per batch of ``ell`` views. (The executor
    bootstraps with GV1 scratch, GV2 diff, GV3 scratch, GV4 diff — two
    observations per model, so both affine fits are identified; the paper
    bootstraps with one observation each, see DESIGN.md §6.)"""

    ell: int = 4
    scratch_model: LinearModel = field(default_factory=LinearModel)
    diff_model: LinearModel = field(default_factory=LinearModel)

    def observe_scratch(self, view_size: int, seconds: float) -> None:
        self.scratch_model.observe(view_size, seconds)

    def observe_diff(self, delta_size: int, seconds: float) -> None:
        self.diff_model.observe(delta_size, seconds)

    def decide_batch(
        self, view_sizes: list[int], delta_sizes: list[int]
    ) -> str:
        """Pick ``"diff"`` or ``"scratch"`` for the next batch of views,
        comparing the summed predicted runtimes."""
        if self.scratch_model.n == 0:
            return "scratch"  # bootstrap: GV_1 from scratch
        if self.diff_model.n == 0:
            return "diff"  # bootstrap: GV_2 differentially
        s = sum(self.scratch_model.predict(v) for v in view_sizes)
        d = sum(self.diff_model.predict(v) for v in delta_sizes)
        return "diff" if d <= s else "scratch"
