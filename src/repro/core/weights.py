"""Weight functions W(e, R) for the WSD/GPS frameworks (Sections III–IV).

Three families, matching the paper's experiments:

* ``uniform_weight`` — every edge weight 1 (degenerates weighted sampling to
  uniform; used in tests to validate the framework against ground truth).
* ``heuristic_weight`` — the GPS heuristic ``W(e, R) = 9·|H(e)| + 1`` where
  ``|H(e)|`` is the number of pattern instances completed by ``e`` with
  sampled edges (WSD-H).
* ``make_learned_weight`` — wraps a trained actor (WSD-L); the MDP state of
  Eqs. (19)–(22) is assembled here by ``build_state``.

A weight function receives a ``WeightContext`` and returns a positive float.
"""
from __future__ import annotations

from typing import Callable, NamedTuple

import numpy as np

from .reservoir import Reservoir
from .patterns import PATTERN_EDGES

__all__ = [
    "WeightContext",
    "uniform_weight",
    "heuristic_weight",
    "build_state",
    "make_learned_weight",
]


class WeightContext(NamedTuple):
    u: int
    v: int
    t: int  # current (1-based) event time t_k
    pattern: str
    instances: list[tuple[tuple[int, int], ...]]  # other-edge keys per instance
    reservoir: Reservoir


def uniform_weight(ctx: WeightContext) -> float:
    return 1.0


def heuristic_weight(ctx: WeightContext) -> float:
    """W(e, R) = 9·|H(e)| + 1 [Ahmed et al., adopted by the paper for WSD-H]."""
    return 9.0 * len(ctx.instances) + 1.0


def build_state(ctx: WeightContext, variant: str = "max") -> np.ndarray:
    """MDP state ``s_k = [s_k^g, s_k^v] ∈ R^{|H|+3}`` (Eqs. 19–22).

    Topological part: ``[|H_k|, |N(u)|, |N(v)|]`` over the sampled graph.
    Temporal part: per edge-position ``j`` of the pattern, the max (Eq. 20) or
    mean (Table XIII ablation, ``variant='avg'``) over instances of the j-th
    smallest arrival index — normalised by the current time ``t_k`` so the
    feature is scale-free across streams (the paper handles scale with batch
    normalisation; see DESIGN.md substitutions).
    """
    h = PATTERN_EDGES[ctx.pattern]
    res = ctx.reservoir
    s = np.zeros(h + 3, dtype=np.float64)
    s[0] = len(ctx.instances)
    s[1] = res.degree(ctx.u)
    s[2] = res.degree(ctx.v)
    if ctx.instances:
        recs = res.records
        agg = np.zeros(h) if variant == "avg" else np.full(h, -np.inf)
        for inst in ctx.instances:
            idx = sorted(recs[k].t for k in inst)
            idx.append(ctx.t)  # e itself is always the latest edge of J
            if variant == "avg":
                agg += np.asarray(idx, dtype=np.float64)
            else:
                np.maximum(agg, idx, out=agg)
        if variant == "avg":
            agg /= len(ctx.instances)
        s[3:] = agg / max(1, ctx.t)
    return s


def make_learned_weight(
    actor: Callable[[np.ndarray], float], variant: str = "max"
) -> Callable[[WeightContext], float]:
    """WSD-L weight function: state -> actor -> positive weight."""

    def fn(ctx: WeightContext) -> float:
        return float(actor(build_state(ctx, variant)))

    return fn
