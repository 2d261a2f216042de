"""Fully dynamic edge-event stream constructors (Section V-A of the paper).

A stream is a structured numpy record array with fields ``op`` (+1 insert /
-1 delete), ``u``, ``v``. Feasibility (Definition 1) is guaranteed by
construction: an edge is only deleted while present and only inserted while
absent.

Two deletion scenarios from the paper:

* **massive deletion** [Triest]: edges are inserted in order; after each
  insertion, with probability ``alpha`` a massive-deletion event occurs in
  which every edge currently in the graph is deleted independently with
  probability ``beta_m`` (each deletion is its own stream event).
* **light deletion** [WRS]: each edge has probability ``beta_l`` of being
  deleted, the deletion placed at a uniformly random later position.

Orderings (Section V-B(3)): natural (generator arrival order), UAR (uniform
random permutation), RBFS (random-start BFS order).
"""
from __future__ import annotations

import numpy as np

STREAM_DTYPE = np.dtype([("op", np.int8), ("u", np.int64), ("v", np.int64)])

__all__ = [
    "STREAM_DTYPE",
    "make_stream",
    "massive_deletion_stream",
    "light_deletion_stream",
    "insertion_only_stream",
    "reorder_edges",
]


def _events(ops: list[int], us: list[int], vs: list[int]) -> np.ndarray:
    out = np.empty(len(ops), dtype=STREAM_DTYPE)
    out["op"] = ops
    out["u"] = us
    out["v"] = vs
    return out


def insertion_only_stream(edges: np.ndarray) -> np.ndarray:
    """All edges inserted in the given order; no deletions."""
    n = len(edges)
    out = np.empty(n, dtype=STREAM_DTYPE)
    out["op"] = 1
    out["u"] = edges[:, 0]
    out["v"] = edges[:, 1]
    return out


def massive_deletion_stream(
    edges: np.ndarray,
    *,
    alpha: float,
    beta_m: float,
    seed: int = 0,
    last_del_frac: float = 0.55,
) -> np.ndarray:
    """Insert each edge in order; after each insertion, with prob ``alpha``
    delete each currently-present edge independently with prob ``beta_m``.

    ``last_del_frac`` restricts massive-deletion events to the first fraction
    of insertions. At the paper's scale the expected run of insertions after
    the last deletion event is 1/alpha = 3M edges, so the final graph (on
    which ARE is measured) is always substantial; at our reduced scale an
    unlucky deletion at the stream end would zero out the final count and
    make relative error meaningless, so we enforce the rebuild window
    explicitly (see DESIGN.md substitutions)."""
    rng = np.random.default_rng(seed)
    ops: list[int] = []
    us: list[int] = []
    vs: list[int] = []
    n_edges = len(edges)
    alive: dict[tuple[int, int], None] = {}  # insertion-ordered set
    for i, (u, v) in enumerate(edges):
        key = (int(u), int(v))
        if key in alive:
            continue
        alive[key] = None
        ops.append(1)
        us.append(key[0])
        vs.append(key[1])
        if i < last_del_frac * n_edges and rng.random() < alpha and alive:
            current = list(alive.keys())
            kill = np.nonzero(rng.random(len(current)) < beta_m)[0]
            for ki in kill:
                k = current[ki]
                del alive[k]
                ops.append(-1)
                us.append(k[0])
                vs.append(k[1])
    return _events(ops, us, vs)


def light_deletion_stream(
    edges: np.ndarray, *, beta_l: float, seed: int = 0
) -> np.ndarray:
    """Insert edges in order; each edge independently has prob ``beta_l`` of a
    deletion event at a uniformly random later position in the stream.

    Built by assigning every insertion its natural index and every deletion a
    uniform position in ``(insert_index, n_insertions]``, then stably sorting
    events by position (deletions after insertions at equal position).
    """
    rng = np.random.default_rng(seed)
    n = len(edges)
    del_mask = rng.random(n) < beta_l
    pos = [float(i) for i in range(n)]
    events: list[tuple[float, int, int, int, int]] = [
        (pos[i], 0, 1, int(edges[i, 0]), int(edges[i, 1])) for i in range(n)
    ]
    for i in np.nonzero(del_mask)[0]:
        p = rng.uniform(float(i), float(n))
        events.append((p, 1, -1, int(edges[i, 0]), int(edges[i, 1])))
    events.sort(key=lambda e: (e[0], e[1]))
    return _events([e[2] for e in events], [e[3] for e in events], [e[4] for e in events])


def reorder_edges(edges: np.ndarray, ordering: str, *, seed: int = 0) -> np.ndarray:
    """Return ``edges`` in ``natural`` / ``uar`` / ``rbfs`` arrival order."""
    if ordering == "natural":
        return edges
    rng = np.random.default_rng(seed)
    if ordering == "uar":
        return edges[rng.permutation(len(edges))]
    if ordering == "rbfs":
        adj: dict[int, list[tuple[int, int]]] = {}
        for i, (u, v) in enumerate(edges):
            adj.setdefault(int(u), []).append((int(v), i))
            adj.setdefault(int(v), []).append((int(u), i))
        visited_e = np.zeros(len(edges), dtype=bool)
        order: list[int] = []
        verts = list(adj.keys())
        seen_v: set[int] = set()
        while len(order) < len(edges):
            start = verts[int(rng.integers(0, len(verts)))]
            if start in seen_v:
                start = next((x for x in verts if x not in seen_v), None)
                if start is None:
                    break
            queue = [start]
            seen_v.add(start)
            while queue:
                x = queue.pop(0)
                for y, ei in adj[x]:
                    if not visited_e[ei]:
                        visited_e[ei] = True
                        order.append(ei)
                    if y not in seen_v:
                        seen_v.add(y)
                        queue.append(y)
        return edges[np.asarray(order, dtype=np.int64)]
    raise ValueError(f"unknown ordering {ordering!r}")


def make_stream(
    edges: np.ndarray,
    scenario: str,
    *,
    alpha: float = 1e-4,
    beta_m: float = 0.8,
    beta_l: float = 0.2,
    ordering: str = "natural",
    seed: int = 0,
    last_del_frac: float = 0.55,
) -> np.ndarray:
    """One-stop stream constructor used by the harness and the RL env."""
    edges = reorder_edges(edges, ordering, seed=seed)
    if scenario == "insertion-only":
        return insertion_only_stream(edges)
    if scenario == "massive":
        return massive_deletion_stream(
            edges, alpha=alpha, beta_m=beta_m, seed=seed, last_del_frac=last_del_frac
        )
    if scenario == "light":
        return light_deletion_stream(edges, beta_l=beta_l, seed=seed)
    raise ValueError(f"unknown scenario {scenario!r}")
