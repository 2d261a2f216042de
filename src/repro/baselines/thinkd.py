"""ThinkD [Shin et al., ECML-PKDD'18] — "Think before you discard": for every
arriving event the estimate is updated from the instances the event forms
with the sampled graph *before* the sampling decision, weighted by the
inverse inclusion probability of the other |H|-1 edges (the ThinkD.fast
closed form). Sample maintenance is random pairing, as in Triest, but the
count-then-sample order yields a lower-variance estimator — the middle ground
the paper's comparison relies on.
"""
from __future__ import annotations

from ..core.patterns import PATTERN_EDGES, count_instances, edge_key
from .random_pairing import RandomPairing

__all__ = ["ThinkD"]


class ThinkD:
    name = "ThinkD"
    supports_deletion = True

    def __init__(self, M: int, pattern: str, seed: int = 0) -> None:
        self.pattern = pattern
        self.h = PATTERN_EDGES[pattern]
        self.rp = RandomPairing(M, seed)
        self.adj: dict[int, set[int]] = {}
        self.estimate = 0.0
        self.t = 0

    def _adj_add(self, key: tuple[int, int]) -> None:
        u, v = key
        self.adj.setdefault(u, set()).add(v)
        self.adj.setdefault(v, set()).add(u)

    def _adj_remove(self, key: tuple[int, int]) -> None:
        u, v = key
        for a, b in ((u, v), (v, u)):
            s = self.adj.get(a)
            if s is not None:
                s.discard(b)
                if not s:
                    del self.adj[a]

    def process(self, op: int, u: int, v: int) -> None:
        self.t += 1
        key = edge_key(u, v)
        if op > 0:
            # Update the estimate first (the "think" step), with the
            # inclusion probability observed before this event's bookkeeping.
            c = count_instances(self.pattern, self.adj, u, v)
            if c:
                self.estimate += c / self.rp.inclusion_prob(self.h - 1)
            decision, evicted = self.rp.on_insert(key)
            if decision == "replace":
                self._adj_remove(evicted)
            if decision in ("add", "replace"):
                self._adj_add(key)
        else:
            was_sampled = key in self.rp
            if was_sampled:
                self._adj_remove(key)
            c = count_instances(self.pattern, self.adj, u, v)
            if c:
                self.estimate -= c / self.rp.inclusion_prob(self.h - 1)
            self.rp.on_delete(key)
