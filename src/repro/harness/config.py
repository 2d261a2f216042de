"""Experiment configuration — the reduced-scale analogue of the paper's
default parameters (Section V-A), shared by tests, benches and jobs.

Paper defaults: M = 200,000 (1.2–6.7% of |E|), α = 3,000,000⁻¹, β_m = 0.8,
β_l = 0.2, 100 sampling repetitions. Scaled defaults keep the sampling
*ratio* (M ≈ 5% |E|), the expected number of massive-deletion events (~4),
and the deletion regime; β_m = 0.5 keeps the post-deletion true count
positive at small scale (DESIGN.md substitutions).
"""
from __future__ import annotations

from dataclasses import dataclass, replace

__all__ = ["ExpConfig", "BENCH", "TEST"]


@dataclass(frozen=True)
class ExpConfig:
    scale: float = 0.4          # dataset scale factor (1.0 = full proxy size)
    m_ratio: float = 0.05       # reservoir budget as a fraction of |E|
    n_runs: int = 12            # sampling repetitions (paper: 100)
    alpha: float = 3e-4         # massive-deletion event probability
    beta_m: float = 0.5         # per-edge massive-deletion probability
    beta_l: float = 0.2         # light-deletion probability (paper value)
    n_ckpt: int = 40            # MARE checkpoints per stream
    mare_floor: float = 30.0    # min truth for a checkpoint to count
    stream_seed: int = 3        # stream construction seed (shared by trials)
    wr_ratio: float = 0.1       # WRS waiting-room fraction

    def with_(self, **kw) -> "ExpConfig":
        return replace(self, **kw)

    def reservoir_size(self, n_edges: int) -> int:
        return max(30, int(self.m_ratio * n_edges))

    def ckpt_every(self, n_events: int) -> int:
        return max(1, n_events // self.n_ckpt)


BENCH = ExpConfig()
TEST = ExpConfig(scale=0.08, n_runs=3, n_ckpt=10)
