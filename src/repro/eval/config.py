"""Experiment parameters — Table 4 of the paper, scaled for this repo.

The paper's grid: ε ∈ [0.1, 0.5] (default 0.1), k ∈ [5, 25] (default
10), z ∈ [50, 250] (default 50), T ∈ [6h, 30h] (default 24h), bucket
L = 15 min, λ = 0.5, η = 20 (AMiner/Reddit) or 200 (Twitter).

Scaling: streams span 3 days of minutes-resolution time at SF-scaled
element counts (benches ~tens of thousands of elements instead of
millions); all ratios/shapes are comparable, absolute times are not
(Python/Spark vs the authors' Java — see EXPERIMENTS.md).
"""
from __future__ import annotations

from dataclasses import dataclass, field

__all__ = ["EvalConfig", "DEFAULTS"]


@dataclass(frozen=True)
class EvalConfig:
    """One experiment configuration (Table 4 defaults)."""

    eps: float = 0.1
    k: int = 10
    z: int = 50
    T: int = 24 * 60  # window length, minutes
    L: int = 15  # bucket length, minutes
    duration: int = 3 * 24 * 60  # stream span, minutes
    eps_grid: tuple[float, ...] = (0.1, 0.2, 0.3, 0.4, 0.5)
    k_grid: tuple[int, ...] = (5, 10, 15, 20, 25)
    z_grid: tuple[int, ...] = (50, 100, 150, 200, 250)
    T_grid: tuple[int, ...] = tuple(h * 60 for h in (6, 12, 18, 24, 30))
    # scaled element counts per dataset profile (benchmark scale)
    bench_n: dict = field(
        default_factory=lambda: {"aminer": 20_000, "reddit": 40_000, "twitter": 40_000}
    )
    test_n: dict = field(
        default_factory=lambda: {"aminer": 1_500, "reddit": 2_500, "twitter": 2_500}
    )


DEFAULTS = EvalConfig()
